package repro.tydi.physical

import repro.tydi.types._

/** Logical-to-physical lowering: split a logical Stream into its physical
  * streams (paper §7.1). This codifies:
  *
  *  - element flattening: Group fields concatenate, Unions contribute a tag
  *    plus the widest non-stream variant, Null contributes nothing;
  *  - nested Streams split off into separate physical streams named by their
  *    field path;
  *  - dimension accumulation per synchronicity: Sync/Desync children carry
  *    their parent's dimensions in addition to their own, the Flat variants
  *    omit the redundant parent dimensions;
  *  - throughput accumulation: a child's lane count is the product of
  *    throughputs along its path, rounded up;
  *  - direction accumulation: Reverse children flip the flow;
  *  - child absorption: a nested Stream that adds no transfer-level
  *    information (keep=false, Sync, throughput 1, Forward, dimensionality 0,
  *    same complexity, no user) is combined with its parent rather than
  *    emitted as a separate physical stream — unless `keep` forces retention
  *    (paper §4.1 "keep");
  *  - the paper's spec fix §8.1(1): directly nested Streams which must both
  *    be retained (both have user and/or keep) are an error, because their
  *    physical streams cannot be uniquely named.
  */
object Lowering {

  /** Split the logical stream of a port into physical streams.
    * Returns streams in declaration order, top-level stream first.
    */
  def split(stream: TStream): Either[LoweringError, Vector[PhysicalStream]] =
    try Right(go(Vector.empty, stream, Rational.one, 0, reversed = false))
    catch { case e: LoweringError => Left(e) }

  /** Like [[split]] but throws; for call sites that have already validated. */
  def splitOrThrow(stream: TStream): Vector[PhysicalStream] =
    split(stream).fold(throw _, identity)

  /** Whether a child Stream can be absorbed into its parent (no separate
    * physical stream): it must add no transfer-level information and not be
    * forced to stay with `keep`.
    */
  def absorbable(child: TStream, parentComplexity: Int): Boolean =
    !child.keep &&
      child.user.isEmpty &&
      child.synchronicity == Sync &&
      child.throughput.isOne &&
      child.dimensionality == 0 &&
      child.direction == Forward &&
      child.complexity == parentComplexity

  /** Paper §8.1(1)'s "must be retained" marker: a user signal and/or keep. */
  private def retained(s: TStream): Boolean = s.user.nonEmpty || s.keep

  private def go(
      path: Vector[String],
      s: TStream,
      inheritedThroughput: Rational,
      inheritedDim: Int,
      reversed: Boolean,
  ): Vector[PhysicalStream] = {
    val myThroughput = inheritedThroughput * s.throughput
    val myDim        = inheritedDim + s.dimensionality
    val myReversed   = reversed ^ (s.direction == Reverse)

    s.data match {
      // Directly nested Stream (the Stream IS the data): paper §8.1(1).
      case child: TStream if !absorbable(child, s.complexity) =>
        if (retained(s) && retained(child))
          throw LoweringError(
            s"directly nested Streams at '${pathName(path)}' must both be retained " +
              "(both have a user signal and/or keep) — physical streams cannot be " +
              "uniquely named (spec issue, paper §8.1(1))")
        if (retained(s))
          throw LoweringError(
            s"directly nested Stream at '${pathName(path)}': parent must be retained " +
              "but its non-absorbable child would take the same physical name")
        // Parent adds only dimensions/throughput/direction; fold into child.
        go(path, child,
          myThroughput,
          childInheritedDim(child, myDim),
          myReversed)

      case _ =>
        val (fields, children) = flatten(Vector.empty, s.data, s.complexity)
        val userFields = s.user.map(u => flattenUser(Vector.empty, u)).getOrElse(Vector.empty)
        val mine = PhysicalStream(
          path = path,
          elementFields = fields,
          lanes = myThroughput.ceil,
          dimensionality = myDim,
          complexity = s.complexity,
          reversed = myReversed,
          userFields = userFields,
        )
        val rest = children.flatMap { case (relPath, child) =>
          go(path ++ relPath, child, myThroughput, childInheritedDim(child, myDim), myReversed)
        }
        // A Stream that only wraps nested Streams — no element content, no
        // dimensions of its own to signal, no user, not kept — carries no
        // information and is not synthesized into a physical stream. This is
        // what makes a Group-of-Streams port "result in identical physical
        // streams" to the equivalent multi-port interface (paper §8.3).
        // A Stream of Null data with no children is NOT dropped: transfers
        // of one-valued data still need their handshake.
        val wrapperOnly =
          fields.isEmpty && userFields.isEmpty && myDim == 0 && !s.keep && children.nonEmpty
        val all = if (wrapperOnly) rest else mine +: rest
        val dup = all.groupBy(_.path).collect { case (p, ps) if ps.size > 1 => p }
        if (dup.nonEmpty)
          throw LoweringError(
            s"physical stream name collision at ${dup.map(pathName).mkString(", ")}")
        all
    }
  }

  /** Dimensions a child inherits from its parent, per synchronicity. */
  private def childInheritedDim(child: TStream, parentDim: Int): Int =
    child.synchronicity match {
      case Sync | Desync          => parentDim
      case Flatten | FlatDesync   => 0
    }

  /** Flatten element-manipulating content; collect nested Streams with their
    * field paths. Absorbable nested Streams are replaced by their data.
    */
  private def flatten(
      path: Vector[String],
      t: LogicalType,
      parentComplexity: Int,
  ): (Vector[ElementField], Vector[(Vector[String], TStream)]) = t match {
    case TNull =>
      (Vector.empty, Vector.empty)
    case TBits(n) =>
      (Vector(ElementField(path, n)), Vector.empty)
    case TGroup(fs) =>
      val parts = fs.map(f => flatten(path :+ f.name, f.tpe, parentComplexity))
      (parts.flatMap(_._1), parts.flatMap(_._2))
    case u @ TUnion(fs) =>
      val tag =
        if (u.tagWidth > 0) Vector(ElementField(path :+ "tag", u.tagWidth)) else Vector.empty
      val data =
        if (u.variantDataWidth > 0) Vector(ElementField(path :+ "union", u.variantDataWidth))
        else Vector.empty
      // Stream-typed variants always split off as their own physical streams:
      // even an otherwise-absorbable variant stream is only active when its
      // tag is selected, so it cannot be inlined into the shared payload.
      val children = fs.collect { case Field(n, child: TStream) => (path :+ n, child) }
      (tag ++ data, children)
    case child: TStream if absorbable(child, parentComplexity) =>
      flatten(path, child.data, parentComplexity)
    case child: TStream =>
      (Vector.empty, Vector((path, child)))
  }

  /** Flatten a user-signal type (guaranteed element-only by construction). */
  private def flattenUser(path: Vector[String], t: LogicalType): Vector[ElementField] =
    t match {
      case TNull      => Vector.empty
      case TBits(n)   => Vector(ElementField(path, n))
      case TGroup(fs) => fs.flatMap(f => flattenUser(path :+ f.name, f.tpe))
      case u @ TUnion(fs) =>
        val tag =
          if (u.tagWidth > 0) Vector(ElementField(path :+ "tag", u.tagWidth)) else Vector.empty
        val data =
          if (u.variantDataWidth > 0) Vector(ElementField(path :+ "union", u.variantDataWidth))
          else Vector.empty
        tag ++ data
      case _: TStream =>
        throw LoweringError(s"user signal cannot contain a Stream at ${pathName(path)}")
    }

  private def pathName(p: Vector[String]): String =
    if (p.isEmpty) "<top>" else p.mkString(".")
}
