package repro.tydi.transfer

import org.scalacheck.{Gen, Prop}
import repro.{PropSupport, SparkSpec}
import repro.tydi.spec.{DElem, DSeq, DataValue}

class DeserializerSpec extends SparkSpec with PropSupport {
  import TransferFixtures._

  // ---- direct deserialization ----

  test("the Figure 1 value survives serialize/deserialize at C1 and C8") {
    for (c <- Seq(1, 8)) {
      val stream = ps(lanes = 3, dim = 2, c = c)
      val ts = Serializer.serialize(stream, Vector(helloWorld))
      assert(Deserializer.deserializeOne(stream, ts) == helloWorld, s"C$c")
    }
  }

  test("§8.1(2b): indices are ignored when the strobe is not fully asserted") {
    val stream = ps(lanes = 4, dim = 1, c = 8)
    // strobe picks lanes 1 and 3; stai/endi deliberately claim 0..1.
    val t = Transfer(
      data = Vector(None, Some(BigInt(10)), None, Some(BigInt(20))),
      last = Vector(false, false, false, true),
      stai = 0, endi = 1)
    assert(Deserializer.deserialize(stream, Vector(t)) ==
      Vector(DSeq(Vector(DElem(10), DElem(20)))))
  }

  test("§8.1(2b): indices ARE significant when all strobe bits are asserted") {
    val stream = ps(lanes = 4, dim = 0, c = 7)
    // All lanes strobed; stai/endi delimit 1..2.
    val t = Transfer(
      data = Vector(Some(BigInt(1)), Some(BigInt(2)), Some(BigInt(3)), Some(BigInt(4))),
      last = Vector.empty, stai = 1, endi = 2)
    assert(Deserializer.deserialize(stream, Vector(t)) == Vector(DElem(2), DElem(3)))
  }

  test("closing an outer dimension while an inner sequence is open is rejected") {
    val stream = ps(lanes = 1, dim = 2, c = 4)
    val t = Transfer(Vector(Some(BigInt(1))), Vector(false, true), 0, 0)
    intercept[DeserializeError](Deserializer.deserialize(stream, Vector(t)))
  }

  test("an outer-only last flag with no pending data closes an empty outer sequence") {
    val stream = ps(lanes = 1, dim = 2, c = 4)
    val t = Transfer(Vector(None), Vector(false, true), 0, 0)
    assert(Deserializer.deserialize(stream, Vector(t)) == Vector(DSeq(Vector.empty)))
  }

  test("empty outer sequences round-trip at complexity >= 4") {
    for (c <- 4 to 8) {
      val stream = ps(lanes = 2, dim = 2, c = c)
      val value: DataValue = DSeq(Vector.empty)
      val ts = Serializer.serialize(stream, Vector(value))
      assert(Deserializer.deserialize(stream, ts) == Vector(value), s"C$c")
    }
  }

  test("unterminated sequences are rejected") {
    val stream = ps(lanes = 1, dim = 1, c = 2)
    val t = Transfer(Vector(Some(BigInt(1))), Vector(false), 0, 0)
    intercept[DeserializeError](Deserializer.deserialize(stream, Vector(t)))
  }

  test("transfer validation: lane count and index ranges") {
    val stream = ps(lanes = 2, dim = 0, c = 2)
    assert(Transfer.validate(stream,
      Transfer(Vector(Some(BigInt(1))), Vector.empty, 0, 0)).isLeft)
    assert(Transfer.validate(stream,
      Transfer(Vector(Some(BigInt(1)), None), Vector.empty, 0, 5)).isLeft)
    assert(Transfer.validate(stream,
      Transfer(Vector(Some(BigInt(1)), None), Vector.empty, 1, 1)).isLeft) // stai at C<6
  }

  // ---- roundtrip properties across all complexities ----

  private def genValue(dim: Int, maxLen: Int = 4): Gen[DataValue] =
    if (dim == 0) Gen.choose(0L, 255L).map(v => DElem(BigInt(v)))
    else Gen.choose(if (dim >= 1) 0 else 1, maxLen)
      .flatMap(n => Gen.listOfN(n, genValue(dim - 1, maxLen)).map(l => DSeq(l.toVector)))

  private def genNonEmptyValue(dim: Int): Gen[DataValue] =
    if (dim == 0) Gen.choose(0L, 255L).map(v => DElem(BigInt(v)))
    else Gen.choose(1, 4)
      .flatMap(n => Gen.listOfN(n, genNonEmptyValue(dim - 1)).map(l => DSeq(l.toVector)))

  test("roundtrip: every complexity 1..8, dims 1..3, default options") {
    val gen = for {
      c     <- Gen.choose(1, 8)
      dim   <- Gen.choose(1, 3)
      lanes <- Gen.oneOf(1, 2, 3, 5)
      // Empty sequences only representable at C >= 4.
      value <- if (c >= 4) genValue(dim) else genNonEmptyValue(dim)
    } yield (c, dim, lanes, value)
    checkProp(Prop.forAll(gen) { case (c, dim, lanes, value) =>
      val stream = ps(lanes, dim, c)
      val ts = Serializer.serialize(stream, Vector(value))
      val vs = Deserializer.deserialize(stream, ts)
      val ok = vs == Vector(value)
      val clean = TransferRules.check(stream, ts).isEmpty
      ok && clean
    }, cases = 200)
  }

  test("roundtrip with exotic options: offsets, postponed last, strobe holes") {
    val gen = for {
      c        <- Gen.choose(4, 8)
      dim      <- Gen.choose(1, 2)
      lanes    <- Gen.oneOf(2, 3, 4)
      offset   <- Gen.choose(0, 2)
      postpone <- Gen.oneOf(true, false)
      holes    <- Gen.oneOf(true, false)
      value    <- genNonEmptyValue(dim)
    } yield (c, dim, lanes, SerializeOptions(offset, postpone, holes), value)
    checkProp(Prop.forAll(gen) { case (c, dim, lanes, opts, value) =>
      val stream = ps(lanes, dim, c)
      val ts = Serializer.serialize(stream, Vector(value), opts)
      Deserializer.deserialize(stream, ts) == Vector(value) &&
        TransferRules.check(stream, ts).isEmpty
    }, cases = 200)
  }

  test("roundtrip: multiple successive values on one stream") {
    val gen = for {
      c      <- Gen.choose(1, 8)
      lanes  <- Gen.oneOf(1, 2, 4)
      values <- Gen.listOfN(3, genNonEmptyValue(1)).map(_.toVector)
    } yield (c, lanes, values)
    checkProp(Prop.forAll(gen) { case (c, lanes, values) =>
      val stream = ps(lanes, 1, c)
      val ts = Serializer.serialize(stream, values)
      Deserializer.deserialize(stream, ts) == values
    })
  }

  test("roundtrip: dimensionality-0 element series") {
    val gen = for {
      c     <- Gen.choose(1, 8)
      lanes <- Gen.oneOf(1, 2, 4)
      elems <- Gen.listOf(Gen.choose(0L, 255L)).map(_.toVector)
    } yield (c, lanes, elems)
    checkProp(Prop.forAll(gen) { case (c, lanes, elems) =>
      val stream = ps(lanes, 0, c)
      val values = elems.map(e => DElem(BigInt(e)): DataValue)
      val ts = Serializer.serialize(stream, values)
      Deserializer.deserialize(stream, ts) == values
    })
  }

  // ---- complexity adapter intrinsic (§5.3) ----

  test("the adapter re-organizes a C8 source for a C1 sink") {
    val src  = ps(lanes = 3, dim = 2, c = 8)
    val sink = ps(lanes = 3, dim = 2, c = 1)
    val loose = Serializer.serialize(src, Vector(helloWorld),
      SerializeOptions(postponeLast = true, strobeHoles = true))
    assert(TransferRules.check(sink, loose).nonEmpty) // C8 output violates C1
    val adapted = Intrinsics.adaptComplexity(src, sink, loose)
    assert(TransferRules.check(sink, adapted).isEmpty)
    assert(Deserializer.deserializeOne(sink, adapted) == helloWorld)
  }

  test("the adapter is the identity composition for equal complexities") {
    val s = ps(lanes = 2, dim = 1, c = 3)
    val ts = Serializer.serialize(s, Vector(DSeq(Vector(DElem(1), DElem(2)))))
    assert(Intrinsics.adaptComplexity(s, s, ts) == ts)
  }

  test("the adapter refuses streams that differ beyond complexity") {
    val a = ps(lanes = 2, dim = 1, c = 3)
    val b = ps(lanes = 4, dim = 1, c = 5)
    intercept[IllegalArgumentException](Intrinsics.adaptComplexity(a, b, Vector.empty))
  }

  test("the slice intrinsic is the identity on transfers") {
    val s = ps(2, 1, 2)
    val ts = Serializer.serialize(s, Vector(DSeq(Vector(DElem(7)))))
    assert(Intrinsics.slice(ts) == ts)
  }

  test("the default driver yields a validly terminated idle stream") {
    assert(Deserializer.deserialize(ps(1, 1, 2), Intrinsics.defaultDriver).isEmpty)
  }
}
