package repro.jobs

import repro.tydi.eval.Table1

/** Entrypoint reproducing Table 1 of the paper (§8.3): lines of code to
  * represent an interface in TIL vs. the resulting VHDL signals vs. the
  * native interface standard. Prints paper and measured numbers side by
  * side. Pure toolchain work — no SparkSession needed.
  */
object Table1Job {
  def main(args: Array[String]): Unit = {
    println("Table 1 — Lines of code to represent an interface (paper vs measured)")
    println(Table1.render)
  }
}
