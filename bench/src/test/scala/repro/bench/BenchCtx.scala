package repro.bench

import repro.SparkSpec
import repro.exp.Experiments

/** One shared experiment context for all bench suites (the suites run
  * sequentially in one JVM, so FeatAug(Full) runs and Featuretools pools
  * are computed once and reused across tables, like the paper's shared
  * main runs). SF defaults to 0.1 (~100 MB-scale relevant tables per
  * DESIGN.md); override with BENCH_SF.
  */
object BenchCtx {
  lazy val sf: Double = sys.env.getOrElse("BENCH_SF", "0.1").toDouble
  lazy val exp: Experiments = new Experiments(SparkSpec.shared, sf, Experiments.benchBudget)
}

/** Helpers for shape assertions over rendered tables. */
trait BenchSuite extends SparkSpec {
  def exp: Experiments = BenchCtx.exp

  /** Parse a rendered cell ("-" → None). */
  def cell(s: String): Option[Double] = if (s == "-") None else Some(s.toDouble)

  def show(t: repro.exp.ResultTable): Unit = {
    println()
    println(t.render)
    println()
  }
}
