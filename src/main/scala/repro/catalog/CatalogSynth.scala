package repro.catalog

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types._

/** Deterministic synthetic metadata catalog.
  *
  * Substitutes for the production metadata services of the paper's host
  * system (Sigma Workbook): artifacts, users, teams, badges, lineage, and
  * usage events at a configurable scale factor. SF=1.0 is ~100k artifacts /
  * 2k users / 200 teams; tests run SF=0.01, benches SF=0.1.
  *
  * A small set of *pinned* entities reproduces every named entity in the
  * paper so its example queries and study tasks are well-defined at any SF:
  *
  *   - table `AIRLINES` carrying the `endorsed` badge (Task 1)
  *   - tables owned by Alex, endorsed by Mike, containing "sales"
  *     (the abstract's flagship query)
  *   - workbooks created by user `John Doe` (Task 3)
  *   - `A Team`, whose home page Task 4 reconfigures
  *
  * Pinned artifact ids are 1..12; generated ids start at [[GeneratedBase]].
  * Generation is pure column arithmetic over `spark.range`, so the catalog
  * is deterministic in (sf, seed) and cheap at bench scale.
  */
object CatalogSynth {
  val GeneratedBase = 100L

  private val NArtifactsPerSf = 100_000L
  private val NUsersPerSf     =   2_000L
  private val NTeamsPerSf     =     200L
  private val UsageEventsPerArtifact = 20L

  /** Number of generated (non-pinned) artifacts at a scale factor. */
  def nGenerated(sf: Double): Long = math.max(40L, (NArtifactsPerSf * sf).toLong)
  def nUsers(sf: Double): Long     = math.max(6L, (NUsersPerSf * sf).toLong)
  def nTeams(sf: Double): Long     = math.max(2L, (NTeamsPerSf * sf).toLong)

  /** Artifact type from a generated id: decades of five tables, two
    * visualizations, two workbooks, one dashboard — mirroring that derived
    * artifacts (paper §1) are fewer than base tables.
    */
  private def typeOf(idCol: org.apache.spark.sql.Column): org.apache.spark.sql.Column = {
    val d = idCol % 10
    when(d <= 4, "table")
      .when(d <= 6, "visualization")
      .when(d <= 8, "workbook")
      .otherwise("dashboard")
  }

  def apply(spark: SparkSession, sf: Double = 0.01, seed: Long = 42): CatalogTables = {
    val nGen   = nGenerated(sf)
    val nUsr   = nUsers(sf)
    val nTm    = nTeams(sf)
    val maxId  = GeneratedBase + nGen - 1

    val pinnedUsers = Seq(
      (1L, "Alex", 1L), (2L, "Mike", 1L), (3L, "John Doe", 2L))
    val pinnedTeams = Seq((1L, "A Team"), (2L, "B Team"))

    // (id, name, type, owner, team, created, views, favorites, description)
    val pinnedArtifacts = Seq(
      (1L, "AIRLINES", "table", 1L, 1L, "2023-02-01", 5000L, 40L,
        "Flight operations fact table"),
      (2L, "SALES_PIPELINE", "table", 1L, 1L, "2023-03-10", 3200L, 25L,
        "Quarterly sales numbers by region"),
      (3L, "SALES_FORECAST", "table", 1L, 1L, "2023-04-02", 1800L, 12L,
        "Projected sales numbers"),
      (4L, "REGIONAL_SALES", "table", 2L, 1L, "2023-01-20", 900L, 4L,
        "Regional sales rollup"),
      (5L, "AIRLINES_OVERVIEW", "visualization", 1L, 1L, "2023-02-15", 2100L, 18L,
        "Airline on-time chart"),
      (6L, "AIRLINES_DASHBOARD", "dashboard", 1L, 1L, "2023-02-20", 4100L, 33L,
        "Operations dashboard"),
      (7L, "Q3_PLANNING", "workbook", 3L, 2L, "2023-07-01", 600L, 3L,
        "Planning workbook"),
      (8L, "CHURN_ANALYSIS", "workbook", 3L, 2L, "2023-06-12", 450L, 2L,
        "Churn analysis workbook"),
      (9L, "SALES_REVIEW", "workbook", 3L, 2L, "2023-05-30", 700L, 6L,
        "Sales review workbook"),
      (10L, "MARKETING_ATTRIBUTION", "dashboard", 2L, 1L, "2023-03-25", 3900L, 29L,
        "Attribution dashboard endorsed by the manager"),
      (11L, "CUSTOMER_BASE", "table", 3L, 2L, "2023-01-05", 1500L, 9L,
        "Customer master data"),
      (12L, "SALES_NOTES", "visualization", 1L, 1L, "2023-04-18", 300L, 1L,
        "Ad-hoc sales notes chart"),
    )

    // (artifact, badge, badgedBy, badgedAt)
    val pinnedBadges = Seq(
      (1L, "endorsed", 2L, "2023-02-05"),
      (2L, "endorsed", 2L, "2023-03-15"),
      (3L, "endorsed", 2L, "2023-04-10"),
      (4L, "endorsed", 1L, "2023-02-01"),
      (10L, "endorsed", 2L, "2023-04-01"),
      (8L, "warning", 1L, "2023-06-20"),
    )

    val pinnedLineage = Seq(
      (1L, 5L), (5L, 6L),     // AIRLINES -> overview viz -> dashboard
      (2L, 12L), (12L, 10L),  // SALES_PIPELINE -> notes viz -> attribution dash
      (2L, 9L),               // SALES_PIPELINE -> sales review workbook
      (11L, 7L),              // CUSTOMER_BASE -> Q3 planning workbook
    )

    import spark.implicits._

    val users = pinnedUsers.toDF("user_id", "user_name", "team_id").unionByName(
      spark.range(4, nUsr + 1).select(
        $"id" as "user_id",
        concat(lit("user_"), $"id") as "user_name",
        ($"id" % nTm + 1).cast(LongType) as "team_id",
      ))

    val teams = pinnedTeams.toDF("team_id", "team_name").unionByName(
      spark.range(3, nTm + 1).select(
        $"id" as "team_id",
        concat(lit("team_"), $"id") as "team_name",
      ))

    val adjs  = array(Seq("daily", "weekly", "regional", "global", "internal",
      "legacy", "customer").map(lit): _*)
    val nouns = array(Seq("revenue", "orders", "traffic", "inventory", "signups",
      "accounts", "tickets", "shipments", "sales", "sessions", "budget").map(lit): _*)

    val pinnedArtifactsDf = pinnedArtifacts
      .toDF("artifact_id", "name", "artifact_type", "owner_id", "team_id",
        "created_at", "views", "favorites", "description")
      .withColumn("created_at", $"created_at".cast(DateType))

    val genArtifacts = spark.range(GeneratedBase, maxId + 1).select(
      $"id" as "artifact_id",
      upper(concat(
        element_at(adjs, ($"id" % 7 + 1).cast(IntegerType)), lit("_"),
        element_at(nouns, ($"id" % 11 + 1).cast(IntegerType)), lit("_"), $"id",
      )) as "name",
      typeOf($"id") as "artifact_type",
      // Generated owners avoid the pinned users (nUsers >= 6 always) so the
      // flagship query's answer set stays exactly the pinned one at every SF.
      (rand(seed) * (nUsr - 3) + 4).cast(LongType) as "owner_id",
      ((rand(seed) * (nUsr - 3) + 4).cast(LongType) % nTm + 1) as "team_id",
      date_add(lit("2023-01-01").cast(DateType),
        (rand(seed + 1) * 500).cast(IntegerType)) as "created_at",
      // Heavy-tailed popularity: 10^U(0,4) views.
      (pow(lit(10.0), rand(seed + 2) * 4) - 1).cast(LongType) as "views",
      (rand(seed + 3) * rand(seed + 4) * 50).cast(LongType) as "favorites",
      concat(lit("Auto-generated "), typeOf($"id")) as "description",
    )
    val artifacts = pinnedArtifactsDf.unionByName(genArtifacts)

    val pinnedBadgesDf = pinnedBadges
      .toDF("artifact_id", "badge", "badged_by", "badged_at")
      .withColumn("badged_at", $"badged_at".cast(DateType))

    val genBadges = spark.range(GeneratedBase, maxId + 1)
      .withColumn("r", rand(seed + 5))
      .where($"r" < 0.15)
      .select(
        $"id" as "artifact_id",
        when($"r" < 0.10, "endorsed").when($"r" < 0.13, "warning")
          .otherwise("deprecated") as "badge",
        (rand(seed + 6) * (nUsr - 3) + 4).cast(LongType) as "badged_by",
        date_add(lit("2023-02-01").cast(DateType),
          (rand(seed + 7) * 400).cast(IntegerType)) as "badged_at",
      )
    val badges = pinnedBadgesDf.unionByName(genBadges)

    // Derived-artifact lineage by id arithmetic within each decade:
    // viz d5/d6 <- table d0/d1, workbook d7/d8 <- table d2/d3, dash d9 <- viz d5.
    val decade = ($"id" - $"id" % 10)
    val genLineage = spark.range(GeneratedBase, maxId + 1)
      .withColumn("parent_id",
        when($"id" % 10 === 5, decade)
          .when($"id" % 10 === 6, decade + 1)
          .when($"id" % 10 === 7, decade + 2)
          .when($"id" % 10 === 8, decade + 3)
          .when($"id" % 10 === 9, decade + 5))
      .where($"parent_id".isNotNull && $"parent_id" >= GeneratedBase && $"parent_id" <= maxId)
      .select($"parent_id", $"id" as "child_id")
    val lineage = pinnedLineage.toDF("parent_id", "child_id").unionByName(genLineage)

    // Usage events, zipf-skewed toward popular artifacts; the rank maps onto
    // pinned ids first (1..12), then the generated range.
    val nAll  = 12L + nGen
    val alpha = 1.1
    val norm  = (1L to math.min(nAll, 10000L)).map(k => 1.0 / math.pow(k.toDouble, alpha)).sum
    val usage = spark.range(nAll * UsageEventsPerArtifact)
      .withColumn("rank",
        least(lit(nAll), greatest(lit(1L),
          pow(lit(1.0) / (rand(seed + 8) * norm + 1e-9), lit(1.0 / alpha)).cast(LongType))))
      .select(
        when($"rank" <= 12, $"rank").otherwise($"rank" + GeneratedBase - 13) as "artifact_id",
        (rand(seed + 9) * nUsr + 1).cast(LongType) as "user_id",
        (rand(seed + 10) * 365).cast(IntegerType) as "day",
      )

    CatalogTables(artifacts, users, teams, badges, lineage, usage)
  }
}
