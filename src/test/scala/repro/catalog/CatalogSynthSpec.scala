package repro.catalog

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}

class CatalogSynthSpec extends SparkSpec {

  private lazy val cat = CatalogSynth(spark, sf = 0.01, seed = 42).cached()

  // ---- pinned entities (the paper's named examples) ------------------------

  test("AIRLINES exists as a table") {
    val r = cat.artifacts.where(col("name") === "AIRLINES").collect()
    assert(r.length == 1)
    assert(r(0).getAs[String]("artifact_type") == "table")
  }
  test("AIRLINES carries the endorsed badge (Task 1)") {
    val b = cat.badges.where(col("artifact_id") === 1L && col("badge") === "endorsed")
    assert(b.count() == 1)
  }
  test("Alex, Mike and John Doe exist") {
    val names = cat.users.select("user_name").collect().map(_.getString(0)).toSet
    assert(Set("Alex", "Mike", "John Doe").subsetOf(names))
  }
  test("A Team exists (Task 4)") {
    assert(cat.teams.where(col("team_name") === "A Team").count() == 1)
  }
  test("John Doe owns exactly three workbooks (Task 3 ground truth)") {
    val n = cat.artifacts
      .where(col("owner_id") === 3L && col("artifact_type") === "workbook").count()
    assert(n == 3)
  }
  test("flagship query ground truth: Alex's endorsed Mike-badged sales tables") {
    val ids = cat.artifacts.alias("a")
      .join(cat.badges.alias("b"), col("a.artifact_id") === col("b.artifact_id"))
      .where(col("a.artifact_type") === "table" && col("a.owner_id") === 1L &&
        col("b.badge") === "endorsed" && col("b.badged_by") === 2L &&
        (lower(col("a.name")).contains("sales") ||
          lower(col("a.description")).contains("sales")))
      .select(col("a.artifact_id")).collect().map(_.getLong(0)).toSet
    assert(ids == Set(2L, 3L))
  }
  test("generated owners never collide with pinned users") {
    val n = cat.artifacts
      .where(col("artifact_id") >= CatalogSynth.GeneratedBase && col("owner_id") <= 3L)
      .count()
    assert(n == 0)
  }

  // ---- shape and integrity -------------------------------------------------

  test("scale factor controls artifact count") {
    assert(cat.artifacts.count() == 12 + CatalogSynth.nGenerated(0.01))
    val tiny = CatalogSynth(spark, sf = 0.0001, seed = 1)
    assert(tiny.artifacts.count() == 12 + 40) // floor of 40 generated
  }
  test("artifact ids are unique") {
    assert(cat.artifacts.select("artifact_id").distinct().count() == cat.artifacts.count())
  }
  test("user ids are unique") {
    assert(cat.users.select("user_id").distinct().count() == cat.users.count())
  }
  test("all four artifact types occur") {
    val types = cat.artifacts.select("artifact_type").distinct()
      .collect().map(_.getString(0)).toSet
    assert(types == CatalogSchema.ArtifactTypes.toSet)
  }
  test("tables are the most common type") {
    val counts = cat.artifacts.groupBy("artifact_type").count()
      .collect().map(r => r.getString(0) -> r.getLong(1)).toMap
    assert(counts("table") > counts("visualization"))
    assert(counts("table") > counts("dashboard"))
  }
  test("every artifact owner exists in users") {
    val orphans = cat.artifacts.join(cat.users,
      cat.artifacts("owner_id") === cat.users("user_id"), "left_anti")
    assert(orphans.count() == 0)
  }
  test("every badge points at an existing artifact") {
    val orphans = cat.badges.join(cat.artifacts, Seq("artifact_id"), "left_anti")
    assert(orphans.count() == 0)
  }
  test("every lineage endpoint exists") {
    val a = cat.artifacts.select(col("artifact_id"))
    assert(cat.lineage.join(a, cat.lineage("parent_id") === a("artifact_id"), "left_anti")
      .count() == 0)
    assert(cat.lineage.join(a, cat.lineage("child_id") === a("artifact_id"), "left_anti")
      .count() == 0)
  }
  test("lineage children derive from parents of the right kind") {
    // A visualization's parent must be a table; a dashboard's a visualization.
    val typed = cat.lineage
      .join(cat.artifacts.select(col("artifact_id").as("parent_id"),
        col("artifact_type").as("parent_type")), "parent_id")
      .join(cat.artifacts.select(col("artifact_id").as("child_id"),
        col("artifact_type").as("child_type")), "child_id")
    val bad = typed.where(
      (col("child_type") === "visualization" && col("parent_type") =!= "table") ||
      (col("child_type") === "dashboard" && col("parent_type") =!= "visualization") ||
      (col("child_type") === "workbook" && col("parent_type") =!= "table"))
    assert(bad.count() == 0)
  }
  test("badge kinds are the declared ones") {
    val kinds = cat.badges.select("badge").distinct().collect().map(_.getString(0)).toSet
    assert(kinds.subsetOf(CatalogSchema.BadgeTypes.toSet))
  }
  test("usage events reference existing artifacts") {
    val orphans = cat.usage.join(cat.artifacts, Seq("artifact_id"), "left_anti")
    assert(orphans.count() == 0)
  }
  test("usage is skewed: top decile of artifacts gets most events") {
    val counts = cat.usage.groupBy("artifact_id").count()
    val total = cat.usage.count().toDouble
    val topDecile = counts.orderBy(col("count").desc)
      .limit((counts.count() / 10).toInt.max(1))
      .agg(sum("count")).collect()(0).getLong(0).toDouble
    assert(topDecile / total > 0.4, s"top decile only ${topDecile / total}")
  }
  test("generation is deterministic in (sf, seed)") {
    val a = CatalogSynth(spark, 0.003, seed = 9).artifacts.orderBy("artifact_id").collect()
    val b = CatalogSynth(spark, 0.003, seed = 9).artifacts.orderBy("artifact_id").collect()
    assert(a.sameElements(b))
  }
  test("different seeds give different catalogs") {
    val a = CatalogSynth(spark, 0.003, seed = 1).artifacts
      .agg(sum("views")).collect()(0).getLong(0)
    val b = CatalogSynth(spark, 0.003, seed = 2).artifacts
      .agg(sum("views")).collect()(0).getLong(0)
    assert(a != b)
  }

  // ---- oracle checks -------------------------------------------------------

  test("oracle: per-type artifact counts match DuckDB") {
    val sparkDf = cat.artifacts.groupBy("artifact_type")
      .agg(count(lit(1)).as("n"))
      .select(col("artifact_type"), col("n").cast("long"))
    Oracle.assertEquivalent(sparkDf,
      "SELECT artifact_type, COUNT(*) AS n FROM artifacts GROUP BY artifact_type",
      "artifacts" -> cat.artifacts)
  }
  test("oracle: endorsed-badge join matches DuckDB") {
    val sparkDf = cat.artifacts.alias("a")
      .join(cat.badges.where(col("badge") === "endorsed").alias("b"),
        col("a.artifact_id") === col("b.artifact_id"))
      .select(col("a.artifact_id").cast("long").as("artifact_id"),
        col("a.name").as("name"))
      .distinct()
    Oracle.assertEquivalent(sparkDf,
      """SELECT DISTINCT CAST(a.artifact_id AS BIGINT) AS artifact_id, a.name AS name
        |FROM artifacts a JOIN badges b ON a.artifact_id = b.artifact_id
        |WHERE b.badge = 'endorsed'""".stripMargin,
      "artifacts" -> cat.artifacts, "badges" -> cat.badges)
  }
}
