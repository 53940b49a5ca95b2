package repro.bench

import java.nio.file.{Files, Paths, StandardOpenOption}
import org.scalatest.funsuite.AnyFunSuite

/** Base for the table benches: prints the rendered table and appends it to
  * bench/results/tables.txt so EXPERIMENTS.md can be diffed against a run.
  */
trait BenchBase extends AnyFunSuite {

  def report(name: String, content: String): Unit = {
    println(content)
    val dir = Paths.get("results")
    Files.createDirectories(dir)
    Files.write(dir.resolve(s"$name.txt"), (content + "\n").getBytes,
      StandardOpenOption.CREATE, StandardOpenOption.TRUNCATE_EXISTING)
  }
}
