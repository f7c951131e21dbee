package repro

import org.apache.spark.sql.SparkSession
import repro.providers.ProviderContext
import repro.study.SimulatedStudy

/** Shared, lazily built expensive fixtures. Tests run sequentially in one
  * JVM (build.sbt), so a single catalog + extraction context at SF=0.01 is
  * computed once and reused by every suite that needs it.
  */
object TestFixtures {
  lazy val ctx: ProviderContext = {
    val spark: SparkSession = SparkSpec.shared
    SimulatedStudy.context(spark, sf = 0.01, seed = 42)
  }
}
