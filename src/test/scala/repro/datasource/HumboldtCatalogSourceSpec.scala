package repro.datasource

import java.nio.file.Files
import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.SparkSpec
import repro.catalog.LakeSynth

class HumboldtCatalogSourceSpec extends SparkSpec {

  private lazy val lakeRoot: String = {
    val dir = Files.createTempDirectory("humboldt-lake").toString
    LakeSynth.writeLake(spark, dir, rows = 150, seed = 3)
    dir
  }

  private def catalogDf: DataFrame =
    spark.read.format("humboldt-catalog").load(lakeRoot)

  test("one row per dataset directory") {
    val names = catalogDf.select("name").collect().map(_.getString(0)).toSet
    assert(names == LakeSynth.tables(spark).map(_._1).toSet)
  }

  test("schema matches the documented contract") {
    assert(catalogDf.schema.fieldNames.toSeq == Seq(
      "name", "path", "num_files", "size_bytes", "modified_at",
      "row_count", "num_columns", "columns"))
  }

  test("row counts come from parquet footers, matching the data") {
    val counted = catalogDf.select("name", "row_count").collect()
      .map(r => r.getString(0) -> r.getLong(1)).toMap
    LakeSynth.tables(spark, rows = 150, seed = 3).foreach { case (name, df) =>
      assert(counted(name) == df.count(), s"row_count mismatch for $name")
    }
  }

  test("column metadata matches the written schema") {
    val cols = catalogDf.where(col("name") === "AIRLINES")
      .select("columns", "num_columns").collect()(0)
    assert(cols.getString(0).split(",").toSet ==
      Set("airline_id", "region_id", "flights", "carrier"))
    assert(cols.getInt(1) == 4)
  }

  test("size and mtime are positive for non-empty datasets") {
    val bad = catalogDf.where(col("size_bytes") <= 0 || col("modified_at") <= 0).count()
    assert(bad == 0)
  }

  test("num_files counts parquet parts only") {
    // _SUCCESS markers and CRCs must not count.
    val r = catalogDf.where(col("name") === "REGIONAL_SALES")
      .select("num_files").collect()(0).getInt(0)
    assert(r >= 1)
    val actualParts = new java.io.File(s"$lakeRoot/REGIONAL_SALES")
      .listFiles().count(f => f.isFile && f.getName.endsWith(".parquet"))
    assert(r == actualParts)
  }

  test("column pruning skips footer reads but keeps values right") {
    val pruned = spark.read.format("humboldt-catalog").load(lakeRoot)
      .select("name", "num_files")
    val rows = pruned.collect()
    assert(rows.length == 5)
    assert(rows.forall(_.getInt(1) >= 1))
    // The physical scan schema must have been narrowed to the projection.
    val scanSchema = pruned.queryExecution.executedPlan.collectLeaves()
      .head.schema.fieldNames.toSet
    assert(scanSchema == Set("name", "num_files"))
  }

  test("filters on extracted metadata work downstream") {
    val big = catalogDf.where(col("row_count") >= 150).select("name")
      .collect().map(_.getString(0)).toSet
    assert(big == Set("AIRLINES", "SALES_PIPELINE", "SALES_FORECAST"))
  }

  test("catalog integrates with SQL") {
    catalogDf.createOrReplaceTempView("lake_catalog")
    val n = spark.sql("SELECT COUNT(*) AS n FROM lake_catalog WHERE num_columns >= 3")
      .collect()(0).getLong(0)
    assert(n == 4) // REGIONAL_SALES has 2 columns
  }

  test("loading a missing path fails cleanly") {
    assertThrows[Exception] {
      spark.read.format("humboldt-catalog").load("/nonexistent/nowhere").collect()
    }
  }

  test("empty lake yields empty catalog") {
    val empty = Files.createTempDirectory("empty-lake").toString
    assert(spark.read.format("humboldt-catalog").load(empty).count() == 0)
  }

  test("multi-file datasets sum footer row counts across parts") {
    val dir = Files.createTempDirectory("multi-lake").toString
    import spark.implicits._
    (1L to 999L).toDF("v").repartition(4).write.parquet(s"$dir/parts")
    val row = spark.read.format("humboldt-catalog").load(dir)
      .select("num_files", "row_count").collect()(0)
    assert(row.getInt(0) == 4)
    assert(row.getLong(1) == 999L)
  }

  test("extraction is a real scan: rewriting a dataset changes the row") {
    val dir = Files.createTempDirectory("rewrite-lake").toString
    import spark.implicits._
    (1L to 10L).toDF("v").write.mode("overwrite").parquet(s"$dir/ds")
    val before = spark.read.format("humboldt-catalog").load(dir)
      .select("row_count").collect()(0).getLong(0)
    (1L to 25L).toDF("v").write.mode("overwrite").parquet(s"$dir/ds")
    val after = spark.read.format("humboldt-catalog").load(dir)
      .select("row_count").collect()(0).getLong(0)
    assert(before == 10 && after == 25)
  }
}
