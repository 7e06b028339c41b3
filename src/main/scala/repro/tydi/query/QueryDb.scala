package repro.tydi.query

import scala.collection.mutable

/** Demand-driven, memoizing query database (paper §7.1), modeled on the Rust
  * compiler's query system and the Salsa framework:
  *
  *  - *inputs* are set explicitly and bump a global revision when changed;
  *  - *derived queries* are computed on demand; their results are cached
  *    together with the dependencies they read;
  *  - on re-query after an input change, a query is recomputed only if one of
  *    its (transitive) dependencies actually changed — and if the recomputed
  *    value equals the cached one, dependents are *not* invalidated ("early
  *    cutoff", the property that makes incremental emission cheap).
  *
  * Not thread-safe: the toolchain drives it from a single thread, like the
  * prototype.
  */
final class QueryDb {
  import QueryDb._

  private var revision: Long = 0
  private val inputs  = mutable.Map.empty[Key, InputCell]
  private val derived = mutable.Map.empty[Key, DerivedCell]
  /** Revision at which the *set of argument keys* of an input query last
    * changed (a key was added or removed) — backs the `/keys` dependency.
    */
  private val keysChangedAt = mutable.Map.empty[String, Long].withDefaultValue(0L)
  private val computeFns = mutable.Map.empty[String, Any => Any]
  private val evalCounts = mutable.Map.empty[String, Long].withDefaultValue(0L)

  /** Stack of dependency-recording frames for queries being computed. */
  private val frames = mutable.Stack.empty[mutable.ArrayBuffer[Key]]

  def currentRevision: Long = revision

  /** Times the compute function of `query` actually ran (for tests proving
    * memoization and minimal recomputation).
    */
  def evaluations(query: String): Long = evalCounts(query)

  /** Register the compute function for a derived query. Reads of other
    * queries/inputs inside `f` are recorded as dependencies automatically.
    */
  def define[A, B](query: String)(f: A => B): Unit =
    computeFns(query) = (a: Any) => f(a.asInstanceOf[A])

  /** Set an input value; bumps the revision only if the value changed. */
  def setInput(query: String, arg: Any, value: Any): Unit = {
    val key = Key(query, arg)
    inputs.get(key) match {
      case Some(cell) if cell.value == value => // unchanged: no new revision
      case existing =>
        revision += 1
        inputs(key) = InputCell(value, revision)
        if (existing.isEmpty) keysChangedAt(query) = revision
    }
  }

  def removeInput(query: String, arg: Any): Unit = {
    val key = Key(query, arg)
    if (inputs.remove(key).isDefined) {
      revision += 1
      keysChangedAt(query) = revision
    }
  }

  /** Read an input, recording the dependency. */
  def input[A](query: String, arg: Any = ()): A = {
    val key = Key(query, arg)
    record(key)
    inputs.getOrElse(key, throw new NoSuchElementException(s"input not set: $key"))
      .value.asInstanceOf[A]
  }

  def inputOption[A](query: String, arg: Any = ()): Option[A] = {
    val key = Key(query, arg)
    record(key)
    inputs.get(key).map(_.value.asInstanceOf[A])
  }

  /** All argument keys currently set for an input query (recorded as a
    * dependency on the key-set via a synthetic key).
    */
  def inputArgs(query: String): Vector[Any] = {
    record(Key(query + "/keys", ()))
    inputs.keys.collect { case Key(q, a) if q == query => a }.toVector
  }

  /** Demand a derived query's value, computing or reusing as needed. */
  def get[A](query: String, arg: Any = ()): A = {
    val key = Key(query, arg)
    record(key)
    fetch(key).asInstanceOf[A]
  }

  private def record(key: Key): Unit =
    if (frames.nonEmpty && !frames.top.contains(key)) frames.top += key

  private def fetch(key: Key): Any = derived.get(key) match {
    case Some(cell) if cell.verifiedAt == revision => cell.value
    case Some(cell) =>
      if (cell.deps.exists(dep => maybeChangedSince(dep, cell.verifiedAt))) recompute(key)
      else { cell.verifiedAt = revision; cell.value }
    case None => recompute(key)
  }

  /** Whether `key`'s value may have changed after revision `rev`. For the
    * synthetic `/keys` dependency, compares the current key-set's change
    * implicitly via input changedAt values.
    */
  private def maybeChangedSince(key: Key, rev: Long): Boolean =
    if (key.query.endsWith("/keys")) {
      keysChangedAt(key.query.stripSuffix("/keys")) > rev
    } else inputs.get(key) match {
      case Some(cell) => cell.changedAt > rev
      case None =>
        derived.get(key) match {
          case None => true // never computed (or an input that was removed)
          case Some(_) =>
            fetch(key) // verify/recompute first
            derived(key).changedAt > rev
        }
    }

  private def recompute(key: Key): Any = {
    val fn = computeFns.getOrElse(key.query,
      throw new NoSuchElementException(s"no compute function defined for query '${key.query}'"))
    val frame = mutable.ArrayBuffer.empty[Key]
    frames.push(frame)
    val value =
      try fn(key.arg)
      finally frames.pop()
    evalCounts(key.query) = evalCounts(key.query) + 1
    val changedAt = derived.get(key) match {
      case Some(old) if old.value == value => old.changedAt // early cutoff
      case _                               => revision
    }
    derived(key) = DerivedCell(value, changedAt, revision, frame.toVector)
    value
  }
}

object QueryDb {
  /** Key of an input or derived query: a query name plus an argument. */
  final case class Key(query: String, arg: Any)

  private final case class InputCell(value: Any, changedAt: Long)
  private final case class DerivedCell(
      value: Any,
      changedAt: Long,
      var verifiedAt: Long,
      deps: Vector[Key],
  )
}
