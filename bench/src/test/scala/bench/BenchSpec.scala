package bench

import repro.SparkSpec
import repro.tables.TableOutput

/** Base for benchmark suites: render the table to stdout (captured in
  * bench_output.txt) and turn every shape check into an assertion.
  */
abstract class BenchSpec extends SparkSpec {
  protected def verify(out: TableOutput): Unit = {
    println()
    println(out.render)
    println()
    val failed = out.checks.filterNot(_._2)
    assert(failed.isEmpty,
      s"shape checks failed:\n${failed.map("  - " + _._1).mkString("\n")}")
  }
}
