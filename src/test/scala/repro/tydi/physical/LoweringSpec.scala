package repro.tydi.physical

import repro.SparkSpec
import repro.tydi.types._

class LoweringSpec extends SparkSpec {

  private def splitOk(s: TStream): Vector[PhysicalStream] =
    Lowering.split(s).fold(e => fail(e.message), identity)

  // ---- simple streams ----

  test("a flat Bits stream lowers to one physical stream") {
    val ps = splitOk(TStream(TBits(8)))
    assert(ps.size == 1)
    assert(ps.head.path.isEmpty)
    assert(ps.head.elementWidth == 8)
    assert(ps.head.lanes == 1)
    assert(ps.head.dimensionality == 0)
    assert(!ps.head.reversed)
  }

  test("a Null stream still lowers to a physical stream (one-valued transfers)") {
    val ps = splitOk(TStream(TNull))
    assert(ps.size == 1)
    assert(ps.head.elementWidth == 0)
  }

  test("throughput rounds up to the lane count") {
    assert(splitOk(TStream(TBits(4), throughput = Rational(128))).head.lanes == 128)
    assert(splitOk(TStream(TBits(4), throughput = Rational(3, 2))).head.lanes == 2)
  }

  test("Group fields flatten into named element fields in order") {
    val ps = splitOk(TStream(TGroup("a" -> TBits(3), "b" -> TGroup("c" -> TBits(5)))))
    assert(ps.head.elementFields.map(_.path) == Vector(Vector("a"), Vector("b", "c")))
    assert(ps.head.elementWidth == 8)
  }

  test("Union flattens to tag plus shared payload field") {
    val ps = splitOk(TStream(TUnion("data" -> TBits(8), "null" -> TNull)))
    assert(ps.head.elementFields.map(_.path) == Vector(Vector("tag"), Vector("union")))
    assert(ps.head.elementWidth == 9)
  }

  test("a single-variant Union has no tag field") {
    val ps = splitOk(TStream(TUnion("only" -> TBits(8))))
    assert(ps.head.elementFields.map(_.path) == Vector(Vector("union")))
  }

  test("user signal flattens independently of element content") {
    val ps = splitOk(TStream(TBits(8),
      user = Some(TGroup("TID" -> TBits(8), "TDEST" -> TBits(4), "TUSER" -> TBits(1)))))
    assert(ps.head.userWidth == 13)
    assert(ps.head.userFields.map(_.path) ==
      Vector(Vector("TID"), Vector("TDEST"), Vector("TUSER")))
  }

  // ---- nested streams ----

  test("a nested Stream in a Group splits off with its field path as name") {
    val child = TStream(TBits(16), dimensionality = 1, complexity = 2)
    val ps = splitOk(TStream(TGroup("head" -> TBits(8), "body" -> child), complexity = 2))
    assert(ps.map(_.path) == Vector(Vector(), Vector("body")))
    assert(ps(0).elementWidth == 8)
    assert(ps(1).elementWidth == 16)
  }

  test("Sync child inherits the parent's dimensionality on top of its own") {
    val child = TStream(TBits(4), dimensionality = 1, synchronicity = Sync, complexity = 2)
    val ps = splitOk(TStream(TGroup("c" -> child), dimensionality = 2, complexity = 2))
    assert(ps.find(_.path == Vector("c")).get.dimensionality == 3)
  }

  test("Desync child also carries the parent's dimensions (arbitrary sizes, same nesting)") {
    val child = TStream(TBits(4), dimensionality = 1, synchronicity = Desync, complexity = 2)
    val ps = splitOk(TStream(TGroup("c" -> child), dimensionality = 2, complexity = 2))
    assert(ps.find(_.path == Vector("c")).get.dimensionality == 3)
  }

  test("Flat variants omit the parent's redundant last signals") {
    for (sync <- Seq(Flatten, FlatDesync)) {
      val child = TStream(TBits(4), dimensionality = 1, synchronicity = sync, complexity = 2)
      val ps = splitOk(TStream(TGroup("c" -> child), dimensionality = 2, complexity = 2))
      assert(ps.find(_.path == Vector("c")).get.dimensionality == 1, s"sync=$sync")
    }
  }

  test("throughput multiplies along the nesting path") {
    val child = TStream(TBits(4), throughput = Rational(3), complexity = 2, dimensionality = 1)
    val ps = splitOk(TStream(TGroup("c" -> child), throughput = Rational(2), complexity = 2))
    assert(ps.find(_.path == Vector("c")).get.lanes == 6)
  }

  test("Reverse child flows against the port direction") {
    val child = TStream(TBits(4), direction = Reverse, complexity = 2, dimensionality = 1)
    val ps = splitOk(TStream(TGroup("req" -> TBits(8), "resp" -> child), complexity = 2))
    assert(!ps.find(_.path.isEmpty).get.reversed)
    assert(ps.find(_.path == Vector("resp")).get.reversed)
  }

  test("double reversal flows forward again") {
    val inner = TStream(TBits(1), direction = Reverse, complexity = 2, dimensionality = 1)
    val mid   = TStream(TGroup("i" -> inner), direction = Reverse, complexity = 2, dimensionality = 1)
    val ps    = splitOk(TStream(TGroup("m" -> mid), complexity = 2))
    assert(ps.find(_.path == Vector("m")).get.reversed)
    assert(!ps.find(_.path == Vector("m", "i")).get.reversed)
  }

  test("deeply nested streams are named by their full field path") {
    val leaf = TStream(TBits(1), complexity = 3, dimensionality = 1)
    val mid  = TStream(TGroup("l" -> leaf), complexity = 3, dimensionality = 1)
    val top  = TStream(TGroup("head" -> TBits(2), "m" -> mid), complexity = 3)
    assert(splitOk(top).map(_.path) ==
      Vector(Vector(), Vector("m"), Vector("m", "l")))
  }

  // ---- absorption and wrapper elision ----

  test("a trivial child stream is absorbed into its parent (no keep)") {
    val child = TStream(TBits(16)) // Sync, throughput 1, dim 0, C1, Forward
    val ps = splitOk(TStream(TGroup("a" -> TBits(8), "b" -> child)))
    assert(ps.size == 1)
    assert(ps.head.elementWidth == 24)
    assert(ps.head.elementFields.map(_.path) == Vector(Vector("a"), Vector("b")))
  }

  test("keep forces a logical Stream to be synthesized into physical signals") {
    val child = TStream(TBits(16), keep = true)
    val ps = splitOk(TStream(TGroup("a" -> TBits(8), "b" -> child)))
    assert(ps.size == 2)
    assert(ps.map(_.path).contains(Vector("b")))
  }

  test("differing complexity prevents absorption") {
    val child = TStream(TBits(16), complexity = 5)
    val ps = splitOk(TStream(TGroup("a" -> TBits(4), "b" -> child), complexity = 2))
    assert(ps.size == 2)
  }

  test("a wrapper stream carrying only nested Streams is not synthesized") {
    // The Group-of-Streams AXI4 variant must produce identical physical
    // streams to the multi-port variant (paper §8.3).
    val aw = TStream(TBits(32), complexity = 7)
    val b  = TStream(TBits(2), complexity = 7, direction = Reverse)
    val bundle = TStream(TGroup("aw" -> aw, "b" -> b))
    val ps = splitOk(bundle)
    assert(ps.map(_.path) == Vector(Vector("aw"), Vector("b")))
  }

  test("a wrapper with its own dimensionality IS synthesized (it signals lasts)") {
    val child = TStream(TBits(8), complexity = 2, dimensionality = 1)
    val ps = splitOk(TStream(TGroup("c" -> child), dimensionality = 1, complexity = 2))
    assert(ps.map(_.path) == Vector(Vector(), Vector("c")))
  }

  // ---- paper §8.1(1): directly nested streams ----

  test("directly nested Streams which must both be retained are an error (§8.1(1))") {
    val child  = TStream(TBits(8), complexity = 2, user = Some(TBits(1)))
    val parent = TStream(child, keep = true)
    val err = Lowering.split(parent).left.toOption
    assert(err.isDefined)
    assert(err.get.message.contains("uniquely named"))
  }

  test("a directly nested Stream under an unretained parent folds into the child") {
    val child  = TStream(TBits(8), complexity = 2, dimensionality = 1)
    val parent = TStream(child, dimensionality = 1, throughput = Rational(2))
    val ps = splitOk(parent)
    assert(ps.size == 1)
    assert(ps.head.dimensionality == 2) // child Sync: inherits parent's dim
    assert(ps.head.lanes == 2)          // throughput accumulates
    assert(ps.head.complexity == 2)     // child properties win
  }

  test("an absorbable directly nested Stream is simply inlined") {
    val ps = splitOk(TStream(TStream(TBits(8))))
    assert(ps.size == 1)
    assert(ps.head.elementWidth == 8)
  }

  test("a retained parent over a non-absorbable direct child is also an error") {
    val child  = TStream(TBits(8), complexity = 5)
    val parent = TStream(child, complexity = 1, user = Some(TBits(2)))
    assert(Lowering.split(parent).isLeft)
  }

  // ---- unions with stream variants ----

  test("Union stream variants split off as their own physical streams") {
    val v = TStream(TBits(16), complexity = 2)
    val ps = splitOk(TStream(TUnion("a" -> TBits(4), "s" -> v), complexity = 2))
    assert(ps.map(_.path) == Vector(Vector(), Vector("s")))
    assert(ps(0).elementWidth == 1 + 4) // tag + widest element variant
  }

  test("splitOrThrow raises the lowering error directly") {
    val bad = TStream(TStream(TBits(8), complexity = 2, keep = true), user = Some(TBits(1)))
    intercept[LoweringError](Lowering.splitOrThrow(bad))
  }
}
