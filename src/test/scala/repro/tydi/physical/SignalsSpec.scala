package repro.tydi.physical

import org.scalacheck.{Gen, Prop}
import repro.{PropSupport, SparkSpec}
import repro.tydi.types._

class SignalsSpec extends SparkSpec with PropSupport {

  private def ps(
      width: Int = 8, lanes: Int = 1, dim: Int = 0, c: Int = 1, user: Int = 0) =
    PhysicalStream(
      path = Vector.empty,
      elementFields =
        if (width == 0) Vector.empty else Vector(ElementField(Vector.empty, width)),
      lanes = lanes,
      dimensionality = dim,
      complexity = c,
      reversed = false,
      userFields =
        if (user == 0) Vector.empty else Vector(ElementField(Vector.empty, user)),
    )

  private def suffixes(s: PhysicalStream): Vector[String] = Signals.of(s).map(_.suffix)

  test("valid and ready are always present — the handshake") {
    for (c <- 1 to 8; d <- 0 to 2) {
      val sigs = suffixes(ps(c = c, dim = d))
      assert(sigs.take(2) == Vector("valid", "ready"), s"C$c D$d")
    }
  }

  test("data width is lanes times element width") {
    val sigs = Signals.of(ps(width = 9, lanes = 128, dim = 1, c = 7))
    assert(sigs.find(_.suffix == "data").get.width == 1152)
  }

  test("zero-width elements omit the data signal") {
    assert(!suffixes(ps(width = 0)).contains("data"))
  }

  test("last is omitted when dimensionality is 0") {
    assert(!suffixes(ps(dim = 0, c = 8)).contains("last"))
  }

  test("last is one flag per dimension per transfer below complexity 8") {
    for (c <- 1 to 7) {
      val s = Signals.of(ps(dim = 3, c = c, lanes = 4)).find(_.suffix == "last").get
      assert(s.width == 3, s"C$c")
    }
  }

  test("last is per lane at complexity 8") {
    val s = Signals.of(ps(dim = 3, c = 8, lanes = 4)).find(_.suffix == "last").get
    assert(s.width == 12)
  }

  test("stai requires complexity >= 6 and more than one lane") {
    assert(!suffixes(ps(lanes = 4, c = 5)).contains("stai"))
    assert(suffixes(ps(lanes = 4, c = 6)).contains("stai"))
    assert(!suffixes(ps(lanes = 1, c = 8)).contains("stai"))
  }

  test("endi is solely contingent on throughput > 1 — paper fix §8.1(3b)") {
    // The unamended spec would make endi contingent on (C >= 5 or D > 0),
    // leaving multi-lane zero-dimensional streams at C < 5 unable to
    // disable element lanes.
    assert(suffixes(ps(lanes = 4, c = 1, dim = 0)).contains("endi"))
    assert(suffixes(ps(lanes = 4, c = 4, dim = 0)).contains("endi"))
    assert(!suffixes(ps(lanes = 1, c = 8, dim = 2)).contains("endi"))
  }

  test("strb requires complexity >= 7 or dimensionality > 0") {
    assert(!suffixes(ps(lanes = 4, c = 6, dim = 0)).contains("strb"))
    assert(suffixes(ps(lanes = 4, c = 7, dim = 0)).contains("strb"))
    assert(suffixes(ps(lanes = 1, c = 1, dim = 1)).contains("strb"))
  }

  test("index signals are ceil(log2 lanes) bits wide") {
    val sigs = Signals.of(ps(lanes = 128, c = 7, dim = 1))
    assert(sigs.find(_.suffix == "stai").get.width == 7)
    assert(sigs.find(_.suffix == "endi").get.width == 7)
    assert(Signals.ceilLog2(2) == 1)
    assert(Signals.ceilLog2(3) == 2)
    assert(Signals.ceilLog2(129) == 8)
  }

  test("user signal appears with its flattened width") {
    val sigs = Signals.of(ps(user = 13))
    assert(sigs.find(_.suffix == "user").get.width == 13)
    assert(!suffixes(ps(user = 0)).contains("user"))
  }

  test("only ready flows upstream") {
    val sigs = Signals.of(ps(width = 8, lanes = 4, dim = 1, c = 8, user = 2))
    assert(sigs.filter(!_.downstream).map(_.suffix) == Vector("ready"))
  }

  test("Listing 4: the AXI4-Stream equivalent lowers to exactly these 8 signals") {
    val stream = TStream(
      data = TUnion("data" -> TBits(8), "null" -> TNull),
      throughput = Rational(128),
      dimensionality = 1,
      synchronicity = Sync,
      complexity = 7,
      user = Some(TGroup("TID" -> TBits(8), "TDEST" -> TBits(4), "TUSER" -> TBits(1))),
    )
    val phys = Lowering.splitOrThrow(stream)
    assert(phys.size == 1)
    val sigs = Signals.of(phys.head)
    assert(sigs.map(s => (s.suffix, s.width)) == Vector(
      ("valid", 1), ("ready", 1), ("data", 1152), ("last", 1),
      ("stai", 7), ("endi", 7), ("strb", 128), ("user", 13)))
  }

  test("Listing 2: a plain 54-bit stream lowers to valid/ready/data only") {
    val phys = Lowering.splitOrThrow(TStream(TBits(54)))
    val sigs = Signals.of(phys.head)
    assert(sigs.map(s => (s.suffix, s.width)) ==
      Vector(("valid", 1), ("ready", 1), ("data", 54)))
  }

  test("signal count is monotone in complexity for fixed shape") {
    // Higher complexity only ever adds signals (stai at 6, strb at 7,
    // wider last at 8) — codifies "lower complexity imposes more
    // restrictions on a source" structurally.
    val gen = for {
      lanes <- Gen.choose(1, 16)
      dim   <- Gen.choose(0, 3)
      c     <- Gen.choose(1, 7)
    } yield (lanes, dim, c)
    checkProp(Prop.forAll(gen) { case (lanes, dim, c) =>
      Signals.of(ps(lanes = lanes, dim = dim, c = c)).size <=
        Signals.of(ps(lanes = lanes, dim = dim, c = c + 1)).size
    })
  }

  test("every signal has positive width") {
    val gen = for {
      lanes <- Gen.choose(1, 256)
      dim   <- Gen.choose(0, 4)
      c     <- Gen.choose(1, 8)
      w     <- Gen.choose(0, 64)
      u     <- Gen.choose(0, 16)
    } yield (lanes, dim, c, w, u)
    checkProp(Prop.forAll(gen) { case (lanes, dim, c, w, u) =>
      Signals.of(ps(width = w, lanes = lanes, dim = dim, c = c, user = u))
        .forall(_.width >= 1)
    })
  }
}
