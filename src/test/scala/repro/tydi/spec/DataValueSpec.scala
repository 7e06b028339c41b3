package repro.tydi.spec

import repro.SparkSpec

class DataValueSpec extends SparkSpec {

  test("bit-string literals carry binary values and widths") {
    assert(ElemLit("10").value == BigInt(2))
    assert(ElemLit("0000").value == BigInt(0))
    assert(ElemLit("0001").value == BigInt(1))
    assert(ElemLit("10").width == 2)
    assert(ElemLit("11111111").value == BigInt(255))
  }

  test("only binary digits are allowed in bit strings") {
    intercept[IllegalArgumentException](ElemLit("102"))
    intercept[IllegalArgumentException](ElemLit("abc"))
  }

  test("depth counts nesting levels") {
    assert(DElem(1).depth == 0)
    assert(DSeq(Vector(DElem(1))).depth == 1)
    assert(DSeq(Vector(DSeq(Vector(DElem(1))))).depth == 2)
    assert(DSeq(Vector.empty).depth == 1)
  }

  test("flatten yields elements in stream order") {
    val v = DSeq(Vector(
      DSeq(Vector(DElem(1), DElem(2))),
      DSeq(Vector(DElem(3)))))
    assert(v.flatten == Vector(BigInt(1), BigInt(2), BigInt(3)))
  }

  test("render is readable nested-list notation") {
    assert(DSeq(Vector(DElem(1), DSeq(Vector(DElem(2))))).render == "[1, [2]]")
    assert(DElem(7).render == "7")
  }

  test("literals convert to values: elements, series, dimensions") {
    assert(DataValue.fromLit(ElemLit("11")) == DElem(3))
    assert(DataValue.fromLit(SeriesLit(Vector(ElemLit("01"), ElemLit("10")))) ==
      DSeq(Vector(DElem(1), DElem(2))))
    assert(DataValue.fromLit(DimLit(Vector(
      DimLit(Vector(ElemLit("1"), ElemLit("0"))), DimLit(Vector(ElemLit("0")))))) ==
      DSeq(Vector(DSeq(Vector(DElem(1), DElem(0))), DSeq(Vector(DElem(0))))))
  }

  test("field literals must be resolved per-field before conversion") {
    intercept[IllegalArgumentException](
      DataValue.fromLit(FieldLit(Vector("a" -> ElemLit("1")))))
  }
}
