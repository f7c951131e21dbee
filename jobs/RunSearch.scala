package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.providers.Registry
import repro.search.QueryCompiler
import repro.spec.{HumboldtSpec, UseCaseSpec}
import repro.study.SimulatedStudy

/** spark-submit entrypoint: compile and run a Humboldt query.
  *
  * {{{
  * spark-submit --class repro.jobs.RunSearch repro.jar "<query>" [sf] [specFile]
  * }}}
  *
  * Builds the synthetic catalog at `sf`, generates the query language from
  * the spec (the default use-case spec, or one loaded from `specFile`),
  * runs the query and prints the top 20 ranked hits.
  */
object RunSearch {
  def main(args: Array[String]): Unit = {
    val query = args.headOption.getOrElse(UseCaseSpec.flagshipQuery)
    val sf    = args.lift(1).map(_.toDouble).getOrElse(0.01)
    val spec  = args.lift(2) match {
      case Some(path) =>
        HumboldtSpec.fromJsonString(
          new String(java.nio.file.Files.readAllBytes(java.nio.file.Paths.get(path))))
          .fold(e => sys.error(s"bad spec $path: $e"), identity)
      case None => UseCaseSpec.default
    }

    val spark = JobSession("humboldt-search")
    try {
      val ctx = SimulatedStudy.context(spark, sf, seed = 42)
      val compiler = new QueryCompiler(spec, Registry.standard, ctx)
      println(s"[RunSearch] query: $query")
      compiler.search(query) match {
        case Left(err) => println(s"[RunSearch] parse error: $err"); sys.exit(2)
        case Right(df) =>
          df.select("artifact_id", "name", "artifact_type", "score")
            .show(20, truncate = false)
      }
    } finally spark.stop()
  }
}
