package repro.bench

import repro.SparkSpec
import repro.experiments.Fixture

/** Base for bench suites: shares the SF=0.1 fixture (override with
  * -Drepro.sf) across all benches in the run and prints each table so
  * bench_output.txt carries the reproduced numbers.
  */
trait BenchSpec extends SparkSpec {
  lazy val fx: Fixture = Fixture.forSpark(spark, Fixture.benchSf)

  def report(table: String): Unit = {
    println()
    println(table)
    println()
  }
}
