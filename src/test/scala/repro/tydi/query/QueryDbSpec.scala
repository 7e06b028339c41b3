package repro.tydi.query

import repro.SparkSpec
import repro.tydi.ir._
import repro.tydi.types._

/** The salient Salsa properties the paper relies on (§7.1): on-demand
  * computation, caching, and recompute-only-when-dependencies-change.
  */
class QueryDbSpec extends SparkSpec {

  test("derived queries are computed on demand and cached") {
    val db = new QueryDb
    db.define[Int, Int]("double")(x => x * 2)
    assert(db.evaluations("double") == 0)
    assert(db.get[Int]("double", 21) == 42)
    assert(db.evaluations("double") == 1)
    assert(db.get[Int]("double", 21) == 42)
    assert(db.evaluations("double") == 1) // cached
    assert(db.get[Int]("double", 5) == 10)
    assert(db.evaluations("double") == 2) // different argument
  }

  test("queries read inputs and recompute when the input changes") {
    val db = new QueryDb
    db.setInput("n", (), 10)
    db.define[Unit, Int]("plusOne")(_ => db.input[Int]("n") + 1)
    assert(db.get[Int]("plusOne") == 11)
    db.setInput("n", (), 20)
    assert(db.get[Int]("plusOne") == 21)
    assert(db.evaluations("plusOne") == 2)
  }

  test("setting an input to the same value does not invalidate") {
    val db = new QueryDb
    db.setInput("n", (), 10)
    db.define[Unit, Int]("plusOne")(_ => db.input[Int]("n") + 1)
    db.get[Int]("plusOne")
    db.setInput("n", (), 10) // unchanged
    db.get[Int]("plusOne")
    assert(db.evaluations("plusOne") == 1)
  }

  test("unrelated input changes do not recompute a query") {
    val db = new QueryDb
    db.setInput("a", (), 1)
    db.setInput("b", (), 2)
    db.define[Unit, Int]("usesA")(_ => db.input[Int]("a") * 10)
    db.get[Int]("usesA")
    db.setInput("b", (), 99)
    db.get[Int]("usesA")
    assert(db.evaluations("usesA") == 1)
  }

  test("early cutoff: dependents are not recomputed when a dependency's value is unchanged") {
    val db = new QueryDb
    db.setInput("n", (), 10)
    db.define[Unit, Int]("parity")(_ => db.input[Int]("n") % 2)
    db.define[Unit, String]("label")(_ => s"parity=${db.get[Int]("parity")}")
    assert(db.get[String]("label") == "parity=0")
    db.setInput("n", (), 12) // parity recomputes to the same 0
    assert(db.get[String]("label") == "parity=0")
    assert(db.evaluations("parity") == 2)
    assert(db.evaluations("label") == 1) // early cutoff
  }

  test("transitive dependency changes propagate") {
    val db = new QueryDb
    db.setInput("n", (), 1)
    db.define[Unit, Int]("a")(_ => db.input[Int]("n") + 1)
    db.define[Unit, Int]("b")(_ => db.get[Int]("a") * 10)
    db.define[Unit, Int]("c")(_ => db.get[Int]("b") + 5)
    assert(db.get[Int]("c") == 25)
    db.setInput("n", (), 2)
    assert(db.get[Int]("c") == 35)
    assert(db.evaluations("c") == 2)
  }

  test("the key-set dependency: adding or removing an input key invalidates") {
    val db = new QueryDb
    db.setInput("item", "x", 1)
    db.define[Unit, Int]("count")(_ => db.inputArgs("item").size)
    assert(db.get[Int]("count") == 1)
    db.setInput("item", "y", 2)
    assert(db.get[Int]("count") == 2)
    db.removeInput("item", "x")
    assert(db.get[Int]("count") == 1)
    assert(db.evaluations("count") == 3)
  }

  test("changing an existing key's value does not count as a key-set change") {
    val db = new QueryDb
    db.setInput("item", "x", 1)
    db.define[Unit, Int]("count")(_ => db.inputArgs("item").size)
    db.get[Int]("count")
    db.setInput("item", "x", 42) // same key, new value
    db.get[Int]("count")
    assert(db.evaluations("count") == 1)
  }

  test("reading an unset input raises") {
    val db = new QueryDb
    intercept[NoSuchElementException](db.input[Int]("missing"))
    assert(db.inputOption[Int]("missing").isEmpty)
  }

  test("querying without a registered compute function raises") {
    val db = new QueryDb
    intercept[NoSuchElementException](db.get[Int]("undefined"))
  }

  // ---- the Tydi query schema (Queries) ----

  private def sampleProject: Project = {
    val t  = TStream(TBits(8), complexity = 2)
    val sl = Streamlet("s", Interface.of(Port("p", In, t)))
    Project.of(Namespace(Vector("ns"), streamlets = Map("s" -> sl)))
  }

  test("the primary 'all streamlets' query returns project streamlets (§7.1)") {
    val q = Queries.forProject(sampleProject)
    assert(q.allStreamlets.map(_._2.name) == Vector("s"))
  }

  test("physical stream splitting is memoized per type") {
    val q = Queries.forProject(sampleProject)
    val t = TStream(TBits(8), throughput = Rational(4), complexity = 7)
    q.physicalStreams(t)
    q.physicalStreams(t)
    assert(q.db.evaluations("physicalStreams") == 1)
    q.physicalStreams(t.copy(complexity = 8))
    assert(q.db.evaluations("physicalStreams") == 2)
  }

  test("replacing a namespace recomputes dependent queries only when changed") {
    val q = Queries.forProject(sampleProject)
    assert(q.allStreamlets.size == 1)
    val n1 = q.db.evaluations("allStreamlets")
    // Re-set the same project: values unchanged, no recomputation needed.
    q.setProject(sampleProject)
    q.allStreamlets
    assert(q.db.evaluations("allStreamlets") == n1)
    // Add a streamlet: recompute.
    val t = TStream(TBits(8), complexity = 2)
    val bigger = Project.of(Namespace(Vector("ns"), streamlets = Map(
      "s" -> Streamlet("s", Interface.of(Port("p", In, t))),
      "s2" -> Streamlet("s2", Interface.of(Port("p", In, t))))))
    q.setProject(bigger)
    assert(q.allStreamlets.size == 2)
    assert(q.db.evaluations("allStreamlets") == n1 + 1)
  }

  test("validation errors are exposed as a derived query") {
    val t = TStream(TBits(8), complexity = 2)
    val bad = Project.of(Namespace(Vector("ns"), streamlets = Map(
      "top" -> Streamlet("top", Interface.of(Port("a", In, t)),
        Some(StructuralImpl(Vector.empty, Vector.empty))))))
    val q = Queries.forProject(bad)
    assert(q.validationErrors.exists(_.message.contains("unconnected")))
  }
}
