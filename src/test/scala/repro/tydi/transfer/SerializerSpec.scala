package repro.tydi.transfer

import repro.SparkSpec
import repro.tydi.physical.{ElementField, PhysicalStream}
import repro.tydi.spec.{DElem, DSeq, DataValue}

object TransferFixtures {
  def ps(lanes: Int, dim: Int, c: Int): PhysicalStream =
    PhysicalStream(
      path = Vector.empty,
      elementFields = Vector(ElementField(Vector.empty, 8)),
      lanes = lanes,
      dimensionality = dim,
      complexity = c,
      reversed = false,
      userFields = Vector.empty)

  /** [[H,e,l,l,o],[W,o,r,l,d]] from Figure 1, as character codes. */
  val helloWorld: DataValue = DSeq(Vector(
    DSeq("Hello".map(ch => DElem(BigInt(ch.toInt))).toVector),
    DSeq("World".map(ch => DElem(BigInt(ch.toInt))).toVector)))
}

class SerializerSpec extends SparkSpec {
  import TransferFixtures._

  // ---- Figure 1: complexity 1 ----

  test("Figure 1 at C1: aligned, consecutive, per-transfer last") {
    val stream = ps(lanes = 3, dim = 2, c = 1)
    val ts = Serializer.serialize(stream, Vector(helloWorld))
    // "Hello" (5 elems over 3 lanes): [H,e,l], [l,o,-] closing dim 0;
    // "World": [W,o,r], [l,d,-] closing dims 0 and 1.
    assert(ts.size == 4)
    assert(ts(0).data.flatten.map(_.toInt.toChar).mkString == "Hel")
    assert(ts(0).last == Vector(false, false))
    assert(ts(1).data.flatten.map(_.toInt.toChar).mkString == "lo")
    assert(ts(1).last == Vector(true, false))
    assert(ts(1).endi == 1)
    assert(ts(3).last == Vector(true, true))
    // All transfers aligned to lane 0.
    assert(ts.forall(_.stai == 0))
    assert(TransferRules.check(stream, ts).isEmpty)
  }

  test("C1 guarantees full transfers except at sequence boundaries") {
    val stream = ps(lanes = 4, dim = 1, c = 1)
    val ts = Serializer.serialize(stream,
      Vector(DSeq((1 to 7).map(i => DElem(BigInt(i))).toVector)))
    assert(ts.size == 2)
    assert(ts(0).data.forall(_.isDefined))
    assert(ts(1).data.count(_.isDefined) == 3)
    assert(TransferRules.check(stream, ts).isEmpty)
  }

  // ---- Figure 1: complexity 8 ----

  test("Figure 1 at C8: sequence boundaries can share a transfer (per-lane last)") {
    val stream = ps(lanes = 3, dim = 2, c = 8)
    val ts = Serializer.serialize(stream, Vector(helloWorld))
    // 10 elements over 3 lanes pack into 4 transfers (greedy), vs 4 at C1
    // with wasted lanes: the C8 packing wastes no lane.
    assert(ts.size == 4)
    assert(ts.flatMap(_.data).flatten.map(_.toInt.toChar).mkString == "HelloWorld")
    // The lane holding 'o' of Hello (transfer 1, lane 1) closes dim 0.
    assert(ts(1).laneLastFlags(1, 2) == Vector(true, false))
    // The lane holding 'd' closes both dims.
    assert(ts(3).laneLastFlags(0, 2) == Vector(true, true))
  }

  test("C8 postponed last: an inactive lane closes a previous lane's sequence") {
    val stream = ps(lanes = 3, dim = 1, c = 8)
    val ts = Serializer.serialize(stream,
      Vector(DSeq(Vector(DElem(1), DElem(2)))),
      SerializeOptions(postponeLast = true))
    val flat = ts.flatMap(t => t.data.indices.map(l => (t.data(l), t.laneLastFlags(l, 1))))
    // Data lanes carry no last; a later inactive lane carries it.
    assert(flat.exists { case (d, fl) => d.isEmpty && fl == Vector(true) })
    assert(flat.filter(_._1.isDefined).forall(_._2 == Vector(false)))
  }

  // ---- option gating by complexity ----

  test("lane offsets are honored only at complexity >= 6") {
    val low  = Serializer.serialize(ps(4, 1, 5), Vector(DSeq(Vector(DElem(1)))),
      SerializeOptions(laneOffset = 2))
    assert(low.head.stai == 0)
    val high = Serializer.serialize(ps(4, 1, 6), Vector(DSeq(Vector(DElem(1)))),
      SerializeOptions(laneOffset = 2))
    assert(high.head.stai == 2)
    assert(high.head.data(2).isDefined)
  }

  test("postponed last on an empty transfer requires complexity >= 4") {
    val vals = Vector[DataValue](DSeq(Vector(DElem(1), DElem(2))))
    val low = Serializer.serialize(ps(2, 1, 3), vals, SerializeOptions(postponeLast = true))
    // Silently not postponed at C3: last rides the final data transfer.
    assert(low.last.data.exists(_.isDefined))
    assert(low.last.last == Vector(true))
    val high = Serializer.serialize(ps(2, 1, 4), vals, SerializeOptions(postponeLast = true))
    assert(high.last.data.forall(_.isEmpty))
    assert(high.last.last == Vector(true))
  }

  test("strobe holes require complexity >= 7") {
    val vals = Vector[DataValue](DSeq(Vector(DElem(1), DElem(2))))
    val low = Serializer.serialize(ps(6, 1, 6), vals, SerializeOptions(strobeHoles = true))
    val active = low.head.activeLanes(ps(6, 1, 6))
    assert(active == Vector(0, 1)) // contiguous
    val high = Serializer.serialize(ps(6, 1, 7), vals, SerializeOptions(strobeHoles = true))
    assert(high.head.activeLanes(ps(6, 1, 7)) == Vector(0, 2)) // scattered
  }

  test("empty sequences require complexity >= 4 (they need an empty transfer)") {
    val withEmpty = Vector[DataValue](DSeq(Vector(DSeq(Vector(DElem(1))), DSeq(Vector.empty))))
    intercept[SerializeError](Serializer.serialize(ps(2, 2, 3), withEmpty))
    val ts = Serializer.serialize(ps(2, 2, 4), withEmpty)
    assert(ts.nonEmpty)
  }

  // ---- dimensionality-0 series ----

  test("a dimensionality-0 stream carries successive independent elements") {
    val stream = ps(lanes = 2, dim = 0, c = 2)
    val ts = Serializer.serialize(stream,
      Vector(DSeq(Vector(DElem(1), DElem(2), DElem(3)))))
    assert(ts.size == 2)
    assert(ts.forall(_.last.isEmpty))
  }

  test("value depth may not exceed the stream dimensionality") {
    intercept[SerializeError](
      Serializer.serialize(ps(1, 1, 4),
        Vector(DSeq(Vector(DSeq(Vector(DElem(1))))))))
    intercept[SerializeError](
      Serializer.serialize(ps(1, 0, 4), Vector(DSeq(Vector(DSeq(Vector(DElem(1))))))))
  }

  test("an element where a sequence is expected is rejected") {
    intercept[SerializeError](
      Serializer.serialize(ps(1, 2, 4), Vector(DSeq(Vector(DElem(1))))))
  }

  // ---- flatten ----

  test("flatten marks per-dimension closes at nested boundaries") {
    val v = DSeq(Vector(DSeq(Vector(DElem(1), DElem(2))), DSeq(Vector(DElem(3)))))
    val entries = Serializer.flatten(ps(1, 2, 4), Vector(v))
    assert(entries == Vector(
      Serializer.Entry(Some(BigInt(1)), Vector(false, false)),
      Serializer.Entry(Some(BigInt(2)), Vector(true, false)),
      Serializer.Entry(Some(BigInt(3)), Vector(true, true))))
  }

  test("an empty inner sequence flattens to a pure boundary entry") {
    val v = DSeq(Vector(DSeq(Vector.empty), DSeq(Vector(DElem(9)))))
    val entries = Serializer.flatten(ps(1, 2, 4), Vector(v))
    assert(entries == Vector(
      Serializer.Entry(None, Vector(true, false)),
      Serializer.Entry(Some(BigInt(9)), Vector(true, true))))
  }

  test("an empty outer sequence closes only the outer dimension") {
    val entries = Serializer.flatten(ps(1, 2, 4), Vector(DSeq(Vector.empty)))
    assert(entries == Vector(Serializer.Entry(None, Vector(false, true))))
  }
}
