package repro.tydi.types

import repro.SparkSpec

class LogicalTypeSpec extends SparkSpec {

  // ---- element widths (paper §4.1) ----

  test("Null has zero width — its only valid value is null") {
    assert(TNull.elementWidth == 0)
  }

  test("Bits(N) is a data signal of N bits") {
    assert(TBits(1).elementWidth == 1)
    assert(TBits(54).elementWidth == 54)
    assert(TBits(1024).elementWidth == 1024)
  }

  test("Bits width must be positive") {
    intercept[IllegalArgumentException](TBits(0))
    intercept[IllegalArgumentException](TBits(-3))
  }

  test("Group width is the sum of its field widths — all fields set together") {
    val g = TGroup("a" -> TBits(8), "b" -> TBits(4), "c" -> TNull)
    assert(g.elementWidth == 12)
  }

  test("empty Group has zero width") {
    assert(TGroup(Vector.empty[Field]).elementWidth == 0)
  }

  test("nested Groups accumulate widths recursively") {
    val g = TGroup("x" -> TGroup("a" -> TBits(3), "b" -> TBits(5)), "y" -> TBits(2))
    assert(g.elementWidth == 10)
  }

  test("Union width is tag plus widest variant — exclusive disjunction") {
    val u = TUnion("a" -> TBits(8), "b" -> TBits(3))
    assert(u.tagWidth == 1)
    assert(u.variantDataWidth == 8)
    assert(u.elementWidth == 9)
  }

  test("Union of data and Null models optional data (paper §4.1)") {
    val u = TUnion("data" -> TBits(8), "null" -> TNull)
    assert(u.elementWidth == 9) // 1 tag bit + 8 data bits
  }

  test("Union tag width is ceil(log2 #fields)") {
    assert(TUnion("a" -> TNull).tagWidth == 0)
    assert(TUnion("a" -> TNull, "b" -> TNull).tagWidth == 1)
    assert(TUnion("a" -> TNull, "b" -> TNull, "c" -> TNull).tagWidth == 2)
    assert(TUnion((1 to 4).map(i => s"f$i" -> (TNull: LogicalType)): _*).tagWidth == 2)
    assert(TUnion((1 to 5).map(i => s"f$i" -> (TNull: LogicalType)): _*).tagWidth == 3)
  }

  test("Union must have at least one field") {
    intercept[IllegalArgumentException](TUnion(Vector.empty[Field]))
  }

  test("duplicate field names are rejected in Group and Union") {
    intercept[IllegalArgumentException](TGroup("a" -> TNull, "a" -> TBits(1)))
    intercept[IllegalArgumentException](TUnion("a" -> TNull, "a" -> TBits(1)))
  }

  test("field names must be non-empty") {
    intercept[IllegalArgumentException](Field("", TNull))
  }

  // ---- Stream properties (paper §4.1) ----

  test("Stream defaults: throughput 1, dimensionality 0, Sync, C1, Forward") {
    val s = TStream(TBits(8))
    assert(s.throughput.isOne)
    assert(s.dimensionality == 0)
    assert(s.synchronicity == Sync)
    assert(s.complexity == 1)
    assert(s.direction == Forward)
    assert(s.user.isEmpty)
    assert(!s.keep)
  }

  test("complexity is limited to the specification's 8 levels") {
    intercept[IllegalArgumentException](TStream(TNull, complexity = 0))
    intercept[IllegalArgumentException](TStream(TNull, complexity = 9))
    (1 to 8).foreach(c => TStream(TNull, complexity = c)) // all valid
  }

  test("dimensionality must be non-negative") {
    intercept[IllegalArgumentException](TStream(TNull, dimensionality = -1))
  }

  test("user signal must be element-manipulating — no Streams") {
    intercept[IllegalArgumentException](
      TStream(TNull, user = Some(TStream(TBits(1)))))
    intercept[IllegalArgumentException](
      TStream(TNull, user = Some(TGroup("s" -> TStream(TBits(1))))))
    TStream(TNull, user = Some(TGroup("TID" -> TBits(8)))) // valid
  }

  test("a Stream contributes nothing to the element width of its parent") {
    val g = TGroup("data" -> TBits(8), "child" -> TStream(TBits(16)))
    assert(g.elementWidth == 8)
  }

  test("a Union's Stream variant contributes only to the tag") {
    val u = TUnion("a" -> TBits(4), "s" -> TStream(TBits(64)))
    assert(u.elementWidth == 1 + 4)
  }

  test("isElementOnly distinguishes element types from stream-bearing types") {
    assert(TNull.isElementOnly)
    assert(TBits(5).isElementOnly)
    assert(TGroup("a" -> TBits(1)).isElementOnly)
    assert(!TStream(TNull).isElementOnly)
    assert(!TGroup("a" -> TStream(TNull)).isElementOnly)
    assert(!TUnion("a" -> TNull, "b" -> TStream(TNull)).isElementOnly)
  }

  test("synchronicity and direction parse from their TIL names") {
    assert(Synchronicity.parse("Sync").contains(Sync))
    assert(Synchronicity.parse("Flatten").contains(Flatten))
    assert(Synchronicity.parse("Desync").contains(Desync))
    assert(Synchronicity.parse("FlatDesync").contains(FlatDesync))
    assert(Synchronicity.parse("bogus").isEmpty)
    assert(StreamDirection.parse("Forward").contains(Forward))
    assert(StreamDirection.parse("Reverse").contains(Reverse))
    assert(StreamDirection.parse("Backward").isEmpty)
  }

  test("the AXI4-Stream element type from Listing 3 is 9 bits wide") {
    val u = TUnion("data" -> TBits(8), "null" -> TNull)
    assert(u.elementWidth == 9)
  }
}
