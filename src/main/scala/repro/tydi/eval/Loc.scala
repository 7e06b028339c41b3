package repro.tydi.eval

/** Lines-of-code counting for Table 1 (paper §8.3). The paper measures the
  * effort to *express interfaces*: how many lines the type declarations take
  * (paid once, reusable for any number of ports) versus how many lines a
  * port/interface declaration takes, compared against the signal lines of
  * the equivalent VHDL and the signal count of the native standard.
  */
object Loc {

  private def significant(line: String): Boolean = {
    val t = line.trim
    t.nonEmpty && !t.startsWith("//")
  }

  /** Lines belonging to `type` declarations: from each line starting with
    * `type` through the line containing its terminating `;` (tracking
    * parenthesis depth), counting non-blank, non-comment lines.
    */
  def typeDeclLines(til: String): Int = {
    var count   = 0
    var inDecl  = false
    var depth   = 0
    for (line <- til.linesIterator) {
      val t = line.trim
      if (!inDecl && t.startsWith("type ")) inDecl = true
      if (inDecl && significant(line)) count += 1
      if (inDecl) {
        depth += t.count(_ == '(') - t.count(_ == ')')
        if (depth == 0 && t.contains(";")) inDecl = false
      }
    }
    count
  }

  /** Port lines of `streamlet`/`interface` declarations: the lines strictly
    * between the opening `(` and the closing `);` that declare a port. Each
    * port needs exactly one line of TIL, which is what the paper's
    * "Interface" column counts for TIL.
    */
  def interfacePortLines(til: String): Int = {
    var count  = 0
    var inDecl = false
    for (line <- til.linesIterator) {
      val t = line.trim
      if (!inDecl && (t.startsWith("streamlet ") || t.startsWith("interface "))) inDecl = true
      else if (inDecl && t.startsWith(")")) inDecl = false
      else if (inDecl && significant(line) && !t.startsWith("#") && t.contains(":")) count += 1
    }
    count
  }

  /** All significant (non-blank, non-comment) lines — general LoC. */
  def total(src: String): Int = src.linesIterator.count(significant)
}
