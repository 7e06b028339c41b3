package repro.jobs

import java.nio.file.{Files, Paths}
import repro.tydi.backend.vhdl.VhdlBackend
import repro.tydi.eval.TilSamples
import repro.tydi.til.Parser

/** Entrypoint running the full prototype toolchain of paper §7 on the TIL
  * samples: parse, store in the query system, emit VHDL. Writes the emitted
  * files to the output directory (default `target/vhdl-out`).
  */
object EmitVhdlJob {
  def main(args: Array[String]): Unit = {
    val outDir = Paths.get(args.headOption.getOrElse("target/vhdl-out"))
    Files.createDirectories(outDir)
    val parsed = Parser.parseAll(Vector(
      TilSamples.paperExample, TilSamples.axi4Stream, TilSamples.axi4))
    val backend = new VhdlBackend("repro", parsed.project)
    val files   = backend.emit(linkRoot = Some(outDir))
    for ((name, content) <- files.toVector.sortBy(_._1)) {
      Files.write(outDir.resolve(name), content.getBytes("UTF-8"))
      println(s"wrote $outDir/$name (${content.linesIterator.size} lines)")
    }
  }
}
