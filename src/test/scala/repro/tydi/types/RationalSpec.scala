package repro.tydi.types

import org.scalacheck.{Gen, Prop}
import repro.{PropSupport, SparkSpec}

class RationalSpec extends SparkSpec with PropSupport {

  test("integer throughput has ceil equal to itself") {
    assert(Rational(1).ceil == 1)
    assert(Rational(128).ceil == 128)
  }

  test("fractional throughput rounds up to the lane count") {
    assert(Rational(3, 2).ceil == 2)
    assert(Rational(1, 2).ceil == 1)
    assert(Rational(7, 3).ceil == 3)
  }

  test("throughput must be positive") {
    intercept[IllegalArgumentException](Rational(0, 1))
    intercept[IllegalArgumentException](Rational(-1, 2))
    intercept[IllegalArgumentException](Rational(1, 0))
  }

  test("reduced form canonicalizes for structural equality") {
    assert(Rational(256, 2).reduced == Rational(128, 1))
    assert(Rational(6, 4).reduced == Rational(3, 2))
  }

  test("multiplication accumulates throughput along stream nesting") {
    assert(Rational(2) * Rational(3) == Rational(6))
    assert(Rational(1, 2) * Rational(1, 2) == Rational(1, 4))
    assert((Rational(3, 2) * Rational(2, 3)).isOne)
  }

  test("ordering compares cross-multiplied") {
    assert(Rational(1, 2) < Rational(2, 3))
    assert(Rational(128) > Rational(64))
    assert(Rational(2, 4).compare(Rational(1, 2)) == 0)
  }

  test("isOne recognizes unit throughput in any form") {
    assert(Rational.one.isOne)
    assert(Rational(7, 7).isOne)
    assert(!Rational(8, 7).isOne)
  }

  test("parseDecimal handles TIL literals") {
    assert(Rational.parseDecimal("128.0") == Rational(128, 1))
    assert(Rational.parseDecimal("1.5") == Rational(3, 2))
    assert(Rational.parseDecimal("8") == Rational(8))
    assert(Rational.parseDecimal("0.25") == Rational(1, 4))
  }

  test("toString of integral rationals round-trips through parseDecimal") {
    assert(Rational.parseDecimal(Rational(128).toString) == Rational(128))
  }

  test("ceil property: num/den <= ceil < num/den + 1") {
    checkProp(Prop.forAll(Gen.choose(1L, 10000L), Gen.choose(1L, 100L)) { (n: Long, d: Long) =>
      val r = Rational(n, d)
      val c = r.ceil
      c * d >= n && (c - 1) * d < n
    })
  }

  test("reduced is idempotent and preserves value") {
    checkProp(Prop.forAll(Gen.choose(1L, 100000L), Gen.choose(1L, 1000L)) { (n: Long, d: Long) =>
      val r = Rational(n, d).reduced
      r.reduced == r && r.num * d == n * r.den
    })
  }
}
