package repro.tydi.types

/** Port/type compatibility rules from paper §4.2.2.
  *
  *  - Type identifiers are not a property of the type: structurally identical
  *    types with different names are fully compatible ("implicit casting").
  *  - Field identifiers ARE a property of Group/Union: `Group(a: Null)` is
  *    incompatible with `Group(b: Null)`.
  *  - Although the Tydi spec conditionally allows a physical source of lower
  *    complexity to drive a sink of higher complexity, logical Streams may
  *    contain Reversed children (so a port holds both sources and sinks);
  *    the IR therefore considers Streams incompatible when their complexity
  *    differs. Optimistic complexity adaptation is an intrinsic
  *    ([[repro.tydi.transfer.ComplexityAdapter]]), not a connection rule.
  */
object Compat {

  /** Whether two logical types are identical for connection purposes.
    * Because identifiers are erased before types are stored in the IR, this
    * is plain structural equality (with throughput in reduced form).
    */
  def compatible(a: LogicalType, b: LogicalType): Boolean =
    normalize(a) == normalize(b)

  /** Canonicalize throughputs so `128/1` and `256/2` compare equal. */
  def normalize(t: LogicalType): LogicalType = t match {
    case TNull | TBits(_) => t
    case TGroup(fs)       => TGroup(fs.map(f => Field(f.name, normalize(f.tpe))))
    case TUnion(fs)       => TUnion(fs.map(f => Field(f.name, normalize(f.tpe))))
    case s: TStream =>
      s.copy(
        data = normalize(s.data),
        throughput = s.throughput.reduced,
        user = s.user.map(normalize),
      )
  }

  /** Physical-stream complexity rule (Tydi spec): a physical *source* may
    * drive a *sink* whose complexity is greater than or equal to its own.
    * Used by the optimistic-connection intrinsic, not by plain connections.
    */
  def physicallyConnectable(sourceComplexity: Int, sinkComplexity: Int): Boolean =
    sourceComplexity <= sinkComplexity

  /** First structural difference between two types, for error reporting. */
  def explainMismatch(a: LogicalType, b: LogicalType, path: String = "$"): Option[String] =
    (normalize(a), normalize(b)) match {
      case (x, y) if x == y => None
      case (TGroup(fa), TGroup(fb)) if fa.size == fb.size =>
        fa.zip(fb).flatMap { case (x, y) =>
          if (x.name != y.name) Some(s"$path: field name ${x.name} vs ${y.name}")
          else explainMismatch(x.tpe, y.tpe, s"$path.${x.name}")
        }.headOption.orElse(Some(s"$path: group mismatch"))
      case (TUnion(fa), TUnion(fb)) if fa.size == fb.size =>
        fa.zip(fb).flatMap { case (x, y) =>
          if (x.name != y.name) Some(s"$path: field name ${x.name} vs ${y.name}")
          else explainMismatch(x.tpe, y.tpe, s"$path.${x.name}")
        }.headOption.orElse(Some(s"$path: union mismatch"))
      case (sa: TStream, sb: TStream) =>
        if (sa.complexity != sb.complexity)
          Some(s"$path: complexity ${sa.complexity} vs ${sb.complexity}")
        else if (sa.throughput != sb.throughput)
          Some(s"$path: throughput ${sa.throughput} vs ${sb.throughput}")
        else if (sa.dimensionality != sb.dimensionality)
          Some(s"$path: dimensionality ${sa.dimensionality} vs ${sb.dimensionality}")
        else if (sa.synchronicity != sb.synchronicity)
          Some(s"$path: synchronicity ${sa.synchronicity.name} vs ${sb.synchronicity.name}")
        else if (sa.direction != sb.direction)
          Some(s"$path: direction ${sa.direction.name} vs ${sb.direction.name}")
        else if (sa.keep != sb.keep)
          Some(s"$path: keep ${sa.keep} vs ${sb.keep}")
        else if (sa.user != sb.user)
          Some(s"$path: user ${sa.user} vs ${sb.user}")
        else explainMismatch(sa.data, sb.data, s"$path.data")
      case (x, y) =>
        Some(s"$path: ${kindOf(x)} vs ${kindOf(y)}")
    }

  private def kindOf(t: LogicalType): String = t match {
    case TNull      => "Null"
    case TBits(n)   => s"Bits($n)"
    case TGroup(fs) => s"Group(${fs.size} fields)"
    case TUnion(fs) => s"Union(${fs.size} fields)"
    case _: TStream => "Stream"
  }
}
