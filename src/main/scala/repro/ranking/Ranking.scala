package repro.ranking

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.functions._
import repro.spec.RankingWeight

/** Numeric, spec-driven ranking (paper §4.2, Listing 1).
  *
  * "Values of metadata fields are multiplied with the ranking factor, which
  * results in an overall ranking score that can be combined between metadata
  * providers." The score is a Catalyst column expression, so ranking
  * executes inside the same optimized plan as the provider's fetch — no
  * collect-and-sort in the app layer, and changing weights never touches
  * code, only the spec.
  */
object Ranking {
  val ScoreColumn = "score"

  /** `Σ coalesce(field, 0) * weight` over the weights whose field exists in
    * `df`. Fields a provider does not produce contribute zero — that is what
    * makes one global weight list reusable across providers with different
    * metadata fields (the paper's global-fallback semantics).
    */
  def scoreExpr(weights: Seq[RankingWeight], df: DataFrame): Column = {
    val present = df.columns.map(_.toLowerCase).toSet
    val terms = weights.collect {
      case RankingWeight(field, w) if present.contains(field.toLowerCase) =>
        coalesce(col(field).cast("double"), lit(0.0)) * w
    }
    if (terms.isEmpty) lit(0.0) else terms.reduce(_ + _)
  }

  /** Attach the score column (idempotent on column name). */
  def scored(df: DataFrame, weights: Seq[RankingWeight]): DataFrame =
    df.withColumn(ScoreColumn, scoreExpr(weights, df))

  /** Score and order, breaking ties on artifact id for determinism. */
  def ranked(df: DataFrame, weights: Seq[RankingWeight]): DataFrame = {
    val s = scored(df, weights)
    if (s.columns.contains("artifact_id")) s.orderBy(col(ScoreColumn).desc, col("artifact_id"))
    else s.orderBy(col(ScoreColumn).desc)
  }

  /** Combine per-provider scored id lists: union, summing scores per
    * artifact — the cross-provider combination the paper requires when
    * "multiple metadata providers are combined e.g., for advanced search
    * queries". Inputs must carry (artifact_id, score).
    */
  def combine(scoredIds: Seq[DataFrame]): DataFrame = {
    require(scoredIds.nonEmpty, "combine needs at least one input")
    scoredIds
      .map(_.select(col("artifact_id").cast("long"), col(ScoreColumn).cast("double")))
      .reduce(_ unionByName _)
      .groupBy("artifact_id")
      .agg(sum(ScoreColumn).as(ScoreColumn))
  }
}
