package repro.tydi.types

/** Positive rational number, used for the Stream `throughput` property.
  *
  * The Tydi specification defines throughput as "a positive, rational number
  * indicating how many elements are expected to be transferred per individual
  * handshake, or relative to its parent Stream"; the number of element lanes
  * is the throughput rounded up to a natural number (paper §4.1).
  */
final case class Rational(num: Long, den: Long) extends Ordered[Rational] {
  require(num > 0 && den > 0, s"throughput must be positive: $num/$den")

  /** Lanes implied by this throughput: ceil(num/den). */
  def ceil: Int = {
    val c = (num + den - 1) / den
    require(c <= Int.MaxValue, s"throughput too large: $this")
    c.toInt
  }

  def *(other: Rational): Rational = Rational.reduced(num * other.num, den * other.den)

  def compare(other: Rational): Int = (num * other.den) compare (other.num * den)

  /** Canonical (reduced) form, so structural equality works for compatibility checks. */
  def reduced: Rational = Rational.reduced(num, den)

  def isOne: Boolean = num == den

  override def toString: String =
    if (den == 1) s"$num.0" else (num.toDouble / den.toDouble).toString
}

object Rational {
  val one: Rational = Rational(1, 1)

  def apply(n: Long): Rational = Rational(n, 1)

  @annotation.tailrec
  private def gcd(a: Long, b: Long): Long = if (b == 0) a else gcd(b, a % b)

  def reduced(num: Long, den: Long): Rational = {
    val g = gcd(num, den)
    new Rational(num / g, den / g)
  }

  /** Parse decimal literals like "128.0" or "1.5" (TIL throughput syntax). */
  def parseDecimal(s: String): Rational = {
    val idx = s.indexOf('.')
    if (idx < 0) Rational(s.toLong)
    else {
      val whole = s.substring(0, idx)
      val frac  = s.substring(idx + 1)
      val den   = math.pow(10, frac.length.toDouble).toLong
      reduced(whole.toLong * den + (if (frac.isEmpty) 0L else frac.toLong), den)
    }
  }
}
