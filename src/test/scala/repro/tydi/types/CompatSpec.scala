package repro.tydi.types

import repro.SparkSpec

/** Codifies the compatibility rules of paper §4.2.2. */
class CompatSpec extends SparkSpec {

  private val base = TStream(TBits(8), dimensionality = 1, complexity = 4)

  test("structurally identical types are fully compatible (identifiers erased)") {
    // "types with different names but otherwise identical properties are
    // fully compatible" — names never reach the IR, so two constructions
    // of the same structure compare equal.
    val a = TStream(TGroup("x" -> TBits(4)), complexity = 2)
    val b = TStream(TGroup("x" -> TBits(4)), complexity = 2)
    assert(Compat.compatible(a, b))
  }

  test("field identifiers ARE a property of Group: Group(a: Null) != Group(b: Null)") {
    assert(!Compat.compatible(TGroup("a" -> TNull), TGroup("b" -> TNull)))
  }

  test("field identifiers ARE a property of Union") {
    assert(!Compat.compatible(TUnion("a" -> TNull), TUnion("b" -> TNull)))
  }

  test("field order matters — Groups are concatenations of bits") {
    assert(!Compat.compatible(
      TGroup("a" -> TBits(1), "b" -> TBits(2)),
      TGroup("b" -> TBits(2), "a" -> TBits(1))))
  }

  test("Streams with different complexity are incompatible as port types") {
    assert(!Compat.compatible(base, base.copy(complexity = 5)))
    assert(Compat.explainMismatch(base, base.copy(complexity = 5)).exists(_.contains("complexity")))
  }

  test("Streams differing in dimensionality, synchronicity, direction, keep or user are incompatible") {
    assert(!Compat.compatible(base, base.copy(dimensionality = 2)))
    assert(!Compat.compatible(base, base.copy(synchronicity = Desync)))
    assert(!Compat.compatible(base, base.copy(direction = Reverse)))
    assert(!Compat.compatible(base, base.copy(keep = true)))
    assert(!Compat.compatible(base, base.copy(user = Some(TBits(1)))))
  }

  test("throughput compares by value, not representation") {
    assert(Compat.compatible(
      base.copy(throughput = Rational(128, 1)),
      base.copy(throughput = Rational(256, 2))))
    assert(!Compat.compatible(
      base.copy(throughput = Rational(2)),
      base.copy(throughput = Rational(3))))
  }

  test("normalization reaches nested streams and user types") {
    val a = TStream(TGroup("c" -> TStream(TBits(1), throughput = Rational(4, 2))))
    val b = TStream(TGroup("c" -> TStream(TBits(1), throughput = Rational(2, 1))))
    assert(Compat.compatible(a, b))
  }

  test("physical complexity rule: a source may drive an equal-or-higher-complexity sink") {
    assert(Compat.physicallyConnectable(1, 8))
    assert(Compat.physicallyConnectable(4, 4))
    assert(!Compat.physicallyConnectable(8, 1))
  }

  test("explainMismatch pinpoints the differing field path") {
    val a = TStream(TGroup("x" -> TGroup("y" -> TBits(4))))
    val b = TStream(TGroup("x" -> TGroup("y" -> TBits(5))))
    val msg = Compat.explainMismatch(a, b)
    assert(msg.exists(m => m.contains("x") && m.contains("y")))
  }

  test("explainMismatch returns None for compatible types") {
    assert(Compat.explainMismatch(base, base.copy()).isEmpty)
  }

  test("kind mismatches are reported (Group vs Union)") {
    val msg = Compat.explainMismatch(TGroup("a" -> TNull), TUnion("a" -> TNull))
    assert(msg.exists(m => m.contains("Group") && m.contains("Union")))
  }
}
