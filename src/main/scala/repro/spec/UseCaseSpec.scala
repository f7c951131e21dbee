package repro.spec

import scala.collection.immutable.ListMap

/** The specification of the paper's use case (§6): the provider set of
  * Figure 2 wired to the standard endpoints, the global ranking fallback of
  * Listing 1, and a team home page as in Listing 2.
  *
  * This is data, not code — the whole §6 interface (views, exploration,
  * search grammar, ranking) is generated from this value, and the benches
  * derive their workloads from it.
  */
object UseCaseSpec {
  import Representation._
  import Surface._

  val default: HumboldtSpec = HumboldtSpec(
    providers = Seq(
      MetadataProviderSpec(
        name = "Recent Documents", category = "interaction",
        description = "Most recently created data artifacts",
        representation = ListRep, endpoint = "recents",
        visibility = Seq(Overview, Search)),
      MetadataProviderSpec(
        name = "Popular", category = "interaction",
        description = "Most viewed data artifacts",
        representation = Tiles, endpoint = "frequent",
        visibility = Seq(Overview),
        ranking = Seq(RankingWeight("views", 2.0))),
      MetadataProviderSpec(
        name = "Owned By", category = "annotations",
        description = "Artifacts owned by a user",
        representation = ListRep, endpoint = "owned_by",
        inputs = Seq(InputSpec("user", "user", required = true)),
        visibility = Seq(Exploration, Search),
        searchKey = Some("owned by")),
      MetadataProviderSpec(
        name = "Created By", category = "annotations",
        description = "Artifacts created by a user",
        representation = ListRep, endpoint = "owned_by",
        inputs = Seq(InputSpec("user", "user", required = true)),
        visibility = Seq(Search),
        searchKey = Some("created by")),
      MetadataProviderSpec(
        name = "Badged", category = "annotations",
        description = "Artifacts carrying quality badges, grouped by badge",
        representation = Categories, endpoint = "badged",
        inputs = Seq(InputSpec("badge", "badge", required = false)),
        visibility = Seq(Overview, Exploration, Search),
        searchKey = Some("badged")),
      MetadataProviderSpec(
        name = "Badged By", category = "annotations",
        description = "Artifacts badged by a user",
        representation = ListRep, endpoint = "badged_by",
        inputs = Seq(InputSpec("user", "user", required = true)),
        visibility = Seq(Search),
        searchKey = Some("badged by")),
      MetadataProviderSpec(
        name = "Type", category = "annotations",
        description = "Artifacts grouped by artifact type",
        representation = Categories, endpoint = "of_type",
        inputs = Seq(InputSpec("artifact_type", "artifact_type", required = false)),
        visibility = Seq(Overview, Exploration, Search),
        searchKey = Some("type")),
      MetadataProviderSpec(
        name = "Team Documents", category = "interaction",
        description = "Artifacts belonging to a team",
        representation = Tiles, endpoint = "team_docs",
        inputs = Seq(InputSpec("team", "team", required = true)),
        visibility = Seq(Exploration)),
      MetadataProviderSpec(
        name = "Team Activity", category = "interaction",
        description = "Artifacts your teammates use the most",
        representation = Tiles, endpoint = "team_frequent",
        inputs = Seq(InputSpec("team", "team", required = true)),
        visibility = Seq(Exploration)),
      MetadataProviderSpec(
        name = "Lineage", category = "relatedness",
        description = "Downstream artifacts derived from a selected artifact",
        representation = Hierarchy, endpoint = "lineage_children",
        inputs = Seq(InputSpec("artifact", "artifact", required = true)),
        visibility = Seq(Exploration)),
      MetadataProviderSpec(
        name = "Joinable", category = "relatedness",
        description = "Graph of tables joinable with a selected table",
        representation = Graph, endpoint = "joinable",
        inputs = Seq(InputSpec("table", "table", required = true)),
        visibility = Seq(Exploration)),
      MetadataProviderSpec(
        name = "Usage Map", category = "relatedness",
        description = "2-D embedding of artifacts by usage and metadata",
        representation = Embedding, endpoint = "embedding",
        visibility = Seq(Overview)),
      MetadataProviderSpec(
        name = "Text", category = "search",
        description = "Keyword match over names and descriptions",
        representation = ListRep, endpoint = "text_match",
        inputs = Seq(InputSpec("q", "text", required = true)),
        visibility = Seq(Search)),
    ),
    // Listing 1's weights, over our enriched metadata fields.
    globalRanking = Seq(
      RankingWeight("favorites", 4.3),
      RankingWeight("views", 1.5),
      RankingWeight("endorsements", 10.0),
    ),
    custom = ListMap(
      "team_home_pages" -> Json.arr(
        Json.obj(
          "team" -> Json.str("A Team"),
          "providers" -> Json.arr(
            Json.str("Popular"), Json.str("Badged"), Json.str("Team Activity")),
        )
      )
    ),
  )

  /** The abstract's flagship query, in the pill syntax the parser accepts. */
  val flagshipQuery: String =
    "type: table owned by: 'Alex' badged: endorsed badged by: 'Mike' & 'sales'"
}
