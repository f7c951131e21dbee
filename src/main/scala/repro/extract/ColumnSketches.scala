package repro.extract

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.functions._

/** A k-minwise hash signature of one column, plus its profile.
  *
  * This is the descriptor layer of the relationship-metadata substrate
  * (paper §2: "Most similarity computations operate on descriptors or
  * signatures of table columns (e.g., MinHash sketches ...)"). Signatures
  * are tiny (k ints) so downstream pairwise comparison is driver-side.
  *
  * @param table    dataset name the column belongs to
  * @param column   column name
  * @param distinct exact distinct count of non-null values
  * @param sig      k minimum hash values, position i under seed i
  */
final case class ColumnSketch(table: String, column: String, distinct: Long, sig: Array[Int]) {
  def k: Int = sig.length

  /** Jaccard similarity estimate: fraction of agreeing signature slots. */
  def jaccard(other: ColumnSketch): Double = {
    require(k == other.k, s"sketch width mismatch: $k vs ${other.k}")
    if (k == 0) 0.0
    else sig.iterator.zip(other.sig.iterator).count { case (a, b) => a == b }.toDouble / k
  }

  /** Estimated |this ∩ other| from the Jaccard estimate and set sizes. */
  def intersectionEstimate(other: ColumnSketch): Double = {
    val j = jaccard(other)
    j / (1.0 + j) * (distinct + other.distinct)
  }

  /** Estimated containment of `this` in `other`: |∩| / |this|. */
  def containmentIn(other: ColumnSketch): Double =
    if (distinct == 0) 0.0
    else math.min(1.0, intersectionEstimate(other) / distinct)
}

/** MinHash sketch construction via DataFrame scans.
  *
  * One aggregation pass per column computes all k slots: slot i is
  * `min(hash(i, value))` over distinct non-null values. Deterministic —
  * Spark's `hash` is Murmur3 with the slot index as a leading mixing term.
  */
object ColumnSketches {
  val DefaultK = 64

  private def slot(i: Int, c: Column): Column = min(hash(lit(i), c)).as(s"h$i")

  /** Sketch a single column of `df`. */
  def sketch(df: DataFrame, table: String, column: String, k: Int = DefaultK): ColumnSketch = {
    val values = df.select(col(column).cast("string").as("v")).na.drop().distinct()
    val aggs   = count(lit(1)).as("n") +: (0 until k).map(i => slot(i, col("v")))
    val row    = values.agg(aggs.head, aggs.tail: _*).collect()(0)
    val n      = row.getLong(0)
    val sig    =
      if (n == 0) Array.fill(k)(Int.MaxValue)
      else Array.tabulate(k)(i => row.getInt(i + 1))
    ColumnSketch(table, column, n, sig)
  }

  /** Sketch every column of every named dataset. */
  def sketchAll(tables: Seq[(String, DataFrame)], k: Int = DefaultK): Seq[ColumnSketch] =
    for {
      (name, df) <- tables
      column     <- df.columns.toSeq
    } yield sketch(df, name, column, k)

  /** Exact containment |a ∩ b| / |a| over distinct values — the ground
    * truth the sketch estimates (used by the T4 quality bench and tests).
    */
  def exactContainment(dfA: DataFrame, colA: String, dfB: DataFrame, colB: String): Double = {
    val a = dfA.select(col(colA).cast("string").as("v")).na.drop().distinct()
    val b = dfB.select(col(colB).cast("string").as("v")).na.drop().distinct()
    val na = a.count()
    if (na == 0) 0.0
    else a.intersect(b).count().toDouble / na
  }
}
