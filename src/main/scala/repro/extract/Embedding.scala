package repro.extract

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.functions._
import repro.catalog.CatalogTables

/** 2-D artifact embedding via principal components over usage/metadata
  * features.
  *
  * The paper's embedding view (§6.2) "expects the x and y coordinates to be
  * included in the data artifacts metadata", anticipating learned
  * representations. We build a real positional-encoding provider: each
  * artifact gets a feature vector (popularity, favorites, age, type one-hot,
  * endorsement), standardized, projected onto the top-2 principal components.
  * The covariance is accumulated with a single DataFrame aggregation (d is
  * tiny), eigenvectors come from driver-side power iteration, and the
  * projection itself is again a column expression — no data leaves the
  * cluster except the d×d covariance.
  */
object Embedding {

  /** Feature columns derived from the catalog, in a fixed order. */
  private def featureCols(catalog: CatalogTables): (DataFrame, Seq[String]) = {
    val a = catalog.artifacts
    val endorsed = catalog.badges
      .where(col("badge") === "endorsed")
      .groupBy(col("artifact_id").as("b_aid"))
      .agg(count(lit(1)).as("endorsements"))
    val df = a.join(endorsed, a("artifact_id") === endorsed("b_aid"), "left")
      .select(
        a("artifact_id"),
        log1p(a("views")).as("f_views"),
        log1p(a("favorites")).as("f_favorites"),
        datediff(lit("2024-01-01").cast("date"), a("created_at"))
          .cast("double").as("f_age"),
        when(a("artifact_type") === "table", 1.0).otherwise(0.0).as("f_is_table"),
        when(a("artifact_type") === "visualization", 1.0).otherwise(0.0).as("f_is_viz"),
        when(a("artifact_type") === "workbook", 1.0).otherwise(0.0).as("f_is_wb"),
        when(a("artifact_type") === "dashboard", 1.0).otherwise(0.0).as("f_is_dash"),
        coalesce(col("endorsements"), lit(0L)).cast("double").as("f_endorsed"),
      )
    (df, df.columns.filter(_.startsWith("f_")).toSeq)
  }

  /** Top-`top` eigenvectors of symmetric matrix `m` by power iteration with
    * deflation. Deterministic: starts from fixed unit vectors.
    */
  private[extract] def topEigenvectors(m: Array[Array[Double]], top: Int): Seq[Array[Double]] = {
    val d = m.length
    var work = m.map(_.clone())
    (0 until math.min(top, d)).map { comp =>
      var v = Array.tabulate(d)(i => if (i == comp % d) 1.0 else 0.1)
      var lambda = 0.0
      for (_ <- 0 until 200) {
        val next = Array.tabulate(d)(i => work(i).iterator.zip(v.iterator).map { case (a, b) => a * b }.sum)
        val norm = math.sqrt(next.map(x => x * x).sum)
        if (norm > 1e-12) {
          v = next.map(_ / norm)
          lambda = norm
        }
      }
      // Deflate: work -= lambda * v v^T
      work = Array.tabulate(d, d)((i, j) => work(i)(j) - lambda * v(i) * v(j))
      v
    }
  }

  /** Compute `(artifact_id, x, y)` for every artifact in the catalog. */
  def coordinates(catalog: CatalogTables): DataFrame = {
    val (feats, names) = featureCols(catalog)
    val d = names.size

    // Pass 1: means and stds for standardization.
    val statAggs = names.map(n => avg(col(n)).as(s"m_$n")) ++
      names.map(n => stddev_pop(col(n)).as(s"s_$n"))
    val statsRow = feats.agg(statAggs.head, statAggs.tail: _*).collect()(0)
    val means = names.indices.map(i => statsRow.getDouble(i)).toArray
    val stds  = names.indices.map { i =>
      val s = statsRow.getDouble(d + i); if (s < 1e-12) 1.0 else s
    }.toArray

    def std(i: Int): Column = (col(names(i)) - means(i)) / stds(i)

    // Pass 2: covariance upper triangle in one aggregation.
    val covAggs = for { i <- 0 until d; j <- i until d }
      yield avg(std(i) * std(j)).as(s"c_${i}_$j")
    val covRow = feats.agg(covAggs.head, covAggs.tail: _*).collect()(0)
    val cov = Array.ofDim[Double](d, d)
    var idx = 0
    for { i <- 0 until d; j <- i until d } {
      cov(i)(j) = covRow.getDouble(idx); cov(j)(i) = cov(i)(j); idx += 1
    }

    val Seq(pc1, pc2) = topEigenvectors(cov, 2)
    def project(v: Array[Double]): Column =
      (0 until d).map(i => std(i) * v(i)).reduce(_ + _)

    feats.select(
      col("artifact_id"),
      round(project(pc1), 6).as("x"),
      round(project(pc2), 6).as("y"),
    )
  }
}
