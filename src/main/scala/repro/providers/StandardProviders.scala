package repro.providers

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.functions._
import repro.spec.Representation
import repro.spec.Representation._

/** The standard provider implementations wired into the use case (paper §6.1,
  * Figure 2). Each is a small DataFrame program over the catalog; none knows
  * anything about views, search, or ranking weights — those are applied by
  * the layers above, driven by the spec.
  */
object StandardProviders {

  /** Columns every artifact-shaped provider result carries. */
  private val artifactCols: Seq[String] = Seq(
    "artifact_id", "name", "artifact_type", "owner_id", "team_id",
    "created_at", "views", "favorites", "description", "endorsements", "age_days")

  private def base(ctx: ProviderContext): DataFrame =
    ctx.enrichedArtifacts.select(artifactCols.map(col): _*)

  /** Join a user-name input down to artifact rows via an id column. */
  private def byUserName(ctx: ProviderContext, userName: String, fk: Column,
                         from: DataFrame): DataFrame = {
    val u = ctx.catalog.users.where(col("user_name") === userName)
      .select(col("user_id").as("match_user_id"))
    from.join(u, fk === col("match_user_id"), "inner").drop("match_user_id")
  }

  /** Most recently created artifacts (Figure 2 "Recents"). */
  object Recents extends Provider {
    val endpoint = "recents"
    val representation: Representation = ListRep
    def fetch(ctx: ProviderContext, inputs: Map[String, String]): DataFrame =
      base(ctx).orderBy(col("created_at").desc, col("artifact_id"))
  }

  /** Most viewed artifacts (Figure 2 "Popular"). */
  object Frequent extends Provider {
    val endpoint = "frequent"
    val representation: Representation = Tiles
    def fetch(ctx: ProviderContext, inputs: Map[String, String]): DataFrame =
      base(ctx).orderBy(col("views").desc, col("artifact_id"))
  }

  /** Artifacts owned/created by a named user (Figure 2 "Owned By"). */
  object OwnedBy extends Provider {
    val endpoint = "owned_by"
    val representation: Representation = ListRep
    def fetch(ctx: ProviderContext, inputs: Map[String, String]): DataFrame =
      byUserName(ctx, need(inputs, "user"), col("owner_id"), base(ctx))
  }

  /** Artifacts carrying a badge; optional `badge` input narrows the kind,
    * optional `user` input narrows to a badger (Figure 2 "Badged";
    * flagship query's `badged: endorsed badged by: 'Mike'`).
    */
  object Badged extends Provider {
    val endpoint = "badged"
    val representation: Representation = Categories
    def fetch(ctx: ProviderContext, inputs: Map[String, String]): DataFrame = {
      var b = ctx.catalog.badges
      inputs.get("badge").foreach(v => b = b.where(col("badge") === v))
      inputs.get("user").foreach { name =>
        b = byUserName(ctx, name, col("badged_by"), b)
      }
      val badged = b.select(col("artifact_id").as("badged_aid"), col("badge").as("category"))
        .distinct()
      base(ctx).join(badged, col("artifact_id") === col("badged_aid"), "inner")
        .drop("badged_aid")
    }
  }

  /** Artifacts badged *by* a named user — exposed separately so the query
    * language gets a `badged by:` field.
    */
  object BadgedBy extends Provider {
    val endpoint = "badged_by"
    val representation: Representation = ListRep
    def fetch(ctx: ProviderContext, inputs: Map[String, String]): DataFrame = {
      val name = need(inputs, "user")
      val b = byUserName(ctx, name, col("badged_by"), ctx.catalog.badges)
        .select(col("artifact_id").as("badged_aid")).distinct()
      base(ctx).join(b, col("artifact_id") === col("badged_aid"), "inner").drop("badged_aid")
    }
  }

  /** Artifacts of one type — `type: table` in the query language. */
  object OfType extends Provider {
    val endpoint = "of_type"
    val representation: Representation = Categories
    def fetch(ctx: ProviderContext, inputs: Map[String, String]): DataFrame = {
      val df = inputs.get("artifact_type") match {
        case Some(t) => base(ctx).where(col("artifact_type") === t)
        case None    => base(ctx)
      }
      df.withColumn("category", col("artifact_type"))
    }
  }

  /** Artifacts belonging to a named team (team home pages, Listing 2). */
  object TeamDocs extends Provider {
    val endpoint = "team_docs"
    val representation: Representation = Tiles
    def fetch(ctx: ProviderContext, inputs: Map[String, String]): DataFrame = {
      val team = need(inputs, "team")
      val t = ctx.catalog.teams.where(col("team_name") === team)
        .select(col("team_id").as("match_team_id"))
      base(ctx).join(t, col("team_id") === col("match_team_id"), "inner")
        .drop("match_team_id")
    }
  }

  /** Most-used artifacts among a team's members — "which dashboards are my
    * teammates working on?" (paper §1). Usage events joined through team
    * membership, counted, top-k by the window.
    */
  object TeamFrequent extends Provider {
    val endpoint = "team_frequent"
    val representation: Representation = Tiles
    def fetch(ctx: ProviderContext, inputs: Map[String, String]): DataFrame = {
      val team = need(inputs, "team")
      val members = ctx.catalog.users
        .join(ctx.catalog.teams.where(col("team_name") === team).select("team_id"), "team_id")
        .select(col("user_id").as("member_id"))
      val counts = ctx.catalog.usage
        .join(members, col("user_id") === col("member_id"))
        .groupBy(col("artifact_id").as("u_aid"))
        .agg(count(lit(1)).as("team_uses"))
      base(ctx).join(counts, col("artifact_id") === col("u_aid"), "inner")
        .drop("u_aid")
        .orderBy(col("team_uses").desc, col("artifact_id"))
    }
  }

  /** Downstream lineage of a selected artifact as a hierarchy (Figure 6
    * "hierarchy": table -> visualization -> dashboard). Expansion is an
    * iterative frontier join, bounded by `maxDepth`, and is exercised
    * against a DuckDB recursive CTE in tests.
    */
  object LineageChildren extends Provider {
    val endpoint = "lineage_children"
    val representation: Representation = Hierarchy
    val maxDepth = 8

    def fetch(ctx: ProviderContext, inputs: Map[String, String]): DataFrame = {
      val rootId = need(inputs, "artifact").toLong
      val lineage = ctx.catalog.lineage
      val arts = base(ctx)

      val root = arts.where(col("artifact_id") === rootId)
        .withColumn("parent_id", lit(null).cast("long"))
        .withColumn("depth", lit(0))
      var frontier = root.select("artifact_id")
      var result   = root
      var depth    = 0
      var growing  = true
      while (growing && depth < maxDepth) {
        depth += 1
        val next = lineage
          .join(frontier.withColumnRenamed("artifact_id", "parent_id"), "parent_id")
          .select(col("parent_id").as("l_parent"), col("child_id"))
        val level = arts.join(next, col("artifact_id") === col("child_id"), "inner")
          .withColumn("parent_id", col("l_parent"))
          .withColumn("depth", lit(depth))
          .drop("l_parent", "child_id")
        val levelIds = level.select("artifact_id")
        if (level.isEmpty) growing = false
        else {
          result = result.unionByName(level)
          frontier = levelIds
        }
      }
      result
    }
  }

  /** Joinability graph around an input table (Figure 3). Requires the
    * extraction substrate's edges; the node ids are artifact ids resolved
    * from table names so graph results compose with search.
    */
  object Joinable extends Provider {
    val endpoint = "joinable"
    val representation: Representation = Graph
    def fetch(ctx: ProviderContext, inputs: Map[String, String]): DataFrame = {
      val table = need(inputs, "table")
      val edges = ctx.joinEdges.getOrElse(
        throw new IllegalStateException(
          "joinable provider needs extracted join edges in ProviderContext"))
      val names = ctx.catalog.artifacts.select(col("artifact_id"), col("name"))
      val incident = edges.where(lower(col("src_table")) === table.toLowerCase ||
        lower(col("dst_table")) === table.toLowerCase)
      incident
        .join(names.select(col("artifact_id").as("src"), upper(col("name")).as("src_name")),
          upper(col("src_table")) === col("src_name"), "inner")
        .join(names.select(col("artifact_id").as("dst"), upper(col("name")).as("dst_name")),
          upper(col("dst_table")) === col("dst_name"), "inner")
        .select(col("src"), col("dst"), col("score").as("weight"),
          col("src_table"), col("src_column"), col("dst_table"), col("dst_column"))
    }
  }

  /** Embedding scatter of all artifacts (Figure 6 "embedding"). */
  object EmbeddingView extends Provider {
    val endpoint = "embedding"
    val representation: Representation = Embedding
    def fetch(ctx: ProviderContext, inputs: Map[String, String]): DataFrame = {
      val coords = ctx.coordinates.getOrElse(
        throw new IllegalStateException(
          "embedding provider needs extracted coordinates in ProviderContext"))
      base(ctx).join(coords.withColumnRenamed("artifact_id", "c_aid"),
        col("artifact_id") === col("c_aid"), "inner").drop("c_aid")
    }
  }

  /** Case-insensitive substring match over name and description — the
    * conventional text search the query language composes with metadata
    * elements (paper §5.3).
    */
  object TextMatch extends Provider {
    val endpoint = "text_match"
    val representation: Representation = ListRep
    def fetch(ctx: ProviderContext, inputs: Map[String, String]): DataFrame = {
      val q = need(inputs, "q").toLowerCase
      base(ctx).where(
        lower(col("name")).contains(q) || lower(col("description")).contains(q))
    }
  }

  /** All standard implementations, in registry order. */
  val all: Seq[Provider] = Seq(
    Recents, Frequent, OwnedBy, Badged, BadgedBy, OfType, TeamDocs,
    TeamFrequent, LineageChildren, Joinable, EmbeddingView, TextMatch)
}
