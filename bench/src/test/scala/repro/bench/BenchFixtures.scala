package repro.bench

import org.apache.spark.sql.SparkSession
import repro.SparkSpec
import repro.providers.ProviderContext
import repro.study.SimulatedStudy

/** Shared bench fixtures. Benches run sequentially in one JVM, so the
  * SF=0.1 catalog (~10k artifacts) is built once. Each bench prints the
  * table it reproduces with the paper's numbers alongside; assertions
  * guard the *shape* (who wins, what completes), not absolute values.
  */
object BenchFixtures {
  def spark: SparkSession = SparkSpec.shared

  /** Bench-scale context: SF=0.1 catalog plus real extraction. */
  lazy val ctx01: ProviderContext = SimulatedStudy.context(spark, sf = 0.1, seed = 42)

  def banner(title: String): Unit = {
    println()
    println("=" * 78)
    println(title)
    println("=" * 78)
  }

  /** Milliseconds for `body`, result discarded; median of `reps` runs after
    * one warm-up.
    */
  def timedMedianMs(reps: Int = 3)(body: => Unit): Double = {
    body // warm-up: plan + code-gen
    val times = (1 to reps).map { _ =>
      val t0 = System.nanoTime()
      body
      (System.nanoTime() - t0) / 1e6
    }
    times.sorted.apply(reps / 2)
  }
}
