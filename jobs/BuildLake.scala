package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.catalog.{CatalogSynth, LakeSynth}

/** spark-submit entrypoint: materialize the synthetic lake and catalog.
  *
  * {{{
  * spark-submit --class repro.jobs.BuildLake repro.jar <outDir> [sf] [seed]
  * }}}
  *
  * Writes `<outDir>/lake/<DATASET>/` parquet datasets (extractable by the
  * `humboldt-catalog` V2 source) and `<outDir>/catalog/<table>/` parquet
  * dumps of the metadata catalog.
  */
object BuildLake {
  def main(args: Array[String]): Unit = {
    val out  = args.headOption.getOrElse(sys.error("usage: BuildLake <outDir> [sf] [seed]"))
    val sf   = args.lift(1).map(_.toDouble).getOrElse(0.1)
    val seed = args.lift(2).map(_.toLong).getOrElse(42L)

    val spark = JobSession("humboldt-build-lake")
    try {
      LakeSynth.writeLake(spark, s"$out/lake")
      val cat = CatalogSynth(spark, sf, seed)
      cat.byName.foreach { case (name, df) =>
        df.write.mode("overwrite").parquet(s"$out/catalog/$name")
      }
      println(s"[BuildLake] sf=$sf seed=$seed -> $out")
      println(s"[BuildLake] artifacts=${cat.artifacts.count()} users=${cat.users.count()}")
    } finally spark.stop()
  }
}
