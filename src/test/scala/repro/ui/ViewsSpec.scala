package repro.ui

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec, TestFixtures}
import repro.providers.StandardProviders._
import repro.spec.{RankingWeight, Representation, UseCaseSpec}

class ViewsSpec extends SparkSpec {

  private lazy val ctx = TestFixtures.ctx
  private val spec = UseCaseSpec.default
  private def p(name: String) = spec.provider(name).get
  private def weights(name: String) = spec.effectiveRanking(p(name))

  test("tiles view is built for tiles providers and ranked") {
    val v = Views.build(p("Popular"), Frequent.fetch(ctx, Map.empty), weights("Popular"))
    val tiles = v.asInstanceOf[TilesView]
    val scores = tiles.data.select("score").collect().map(_.getDouble(0))
    assert(scores.zip(scores.tail).forall { case (a, b) => a >= b })
  }

  test("tiles ranking uses the provider-local weights (views * 2)") {
    val v = Views.build(p("Popular"), Frequent.fetch(ctx, Map.empty), weights("Popular"))
      .asInstanceOf[TilesView]
    val row = v.data.where(col("artifact_id") === 1L)
      .select("score", "views").collect()(0)
    assert(math.abs(row.getDouble(0) - row.getLong(1) * 2.0) < 1e-9)
  }

  test("list view supports re-sorting by any column") {
    val v = Views.build(p("Recent Documents"), Recents.fetch(ctx, Map.empty),
      weights("Recent Documents")).asInstanceOf[ListView]
    val byViews = v.sortedBy("views", ascending = false)
      .select("views").collect().map(_.getLong(0))
    assert(byViews.zip(byViews.tail).forall { case (a, b) => a >= b })
    val byName = v.sortedBy("name").select("name").collect().map(_.getString(0))
    assert(byName.zip(byName.tail).forall { case (a, b) => a <= b })
  }

  test("hierarchy view orders depth-major and exposes maxDepth") {
    val df = LineageChildren.fetch(ctx, Map("artifact" -> "1"))
    val v = Views.build(p("Lineage"), df, weights("Lineage")).asInstanceOf[HierarchyView]
    val depths = v.data.select("depth").collect().map(_.getInt(0))
    assert(depths.zip(depths.tail).forall { case (a, b) => a <= b })
    assert(v.maxDepth == 2)
    assert(v.childrenOf(1L).select("artifact_id").collect().map(_.getLong(0)).toSet ==
      Set(5L))
  }

  test("graph view splits nodes and edges") {
    val df = Joinable.fetch(ctx, Map("table" -> "AIRLINES"))
    val v = Views.build(p("Joinable"), df, weights("Joinable")).asInstanceOf[GraphView]
    val nodes = v.nodes.collect().map(_.getLong(0)).toSet
    assert(nodes.contains(1L))
    assert(v.edges.count() > 0)
    val ws = v.edges.select("weight").collect().map(_.getDouble(0))
    assert(ws.zip(ws.tail).forall { case (a, b) => a >= b })
  }

  test("categories view rollup matches DuckDB GROUP BY") {
    val df = OfType.fetch(ctx, Map.empty)
    val v = Views.build(p("Type"), df, weights("Type")).asInstanceOf[CategoriesView]
    Oracle.assertEquivalent(
      v.rollup.select(col("category"), col("n").cast("long").as("n")),
      "SELECT artifact_type AS category, COUNT(*) AS n FROM artifacts GROUP BY artifact_type",
      "artifacts" -> ctx.catalog.artifacts)
  }

  test("categories view drill-down returns only that category") {
    val df = Badged.fetch(ctx, Map.empty)
    val v = Views.build(p("Badged"), df, weights("Badged")).asInstanceOf[CategoriesView]
    val kinds = v.membersOf("endorsed").select("category").distinct()
      .collect().map(_.getString(0)).toSet
    assert(kinds == Set("endorsed"))
  }

  test("embedding view brushes a rectangle") {
    val df = EmbeddingView.fetch(ctx, Map.empty)
    val v = Views.build(p("Usage Map"), df, weights("Usage Map"))
      .asInstanceOf[EmbeddingViewModel]
    val all = v.points.count()
    val brushed = v.brush(-0.5, -0.5, 0.5, 0.5).count()
    assert(brushed < all)
    assert(brushed ==
      v.points.where(col("x").between(-0.5, 0.5) && col("y").between(-0.5, 0.5)).count())
  }

  test("view construction validates the representation contract") {
    import spark.implicits._
    val bad = Seq((1L, "x")).toDF("artifact_id", "name") // missing artifact_type
    assertThrows[IllegalArgumentException] {
      Views.build(p("Popular"), bad, Seq.empty)
    }
  }

  test("artifactIds covers graph endpoints") {
    val df = Joinable.fetch(ctx, Map("table" -> "AIRLINES"))
    val v = Views.build(p("Joinable"), df, weights("Joinable"))
    val ids = v.artifactIds.collect().map(_.getLong(0)).toSet
    assert(ids.contains(1L) && ids.size >= 2)
  }

  test("every representation constructs its dedicated view type") {
    import Representation._
    val reps = Map[Representation, ViewModel => Boolean](
      Tiles -> (_.isInstanceOf[TilesView]),
      ListRep -> (_.isInstanceOf[ListView]),
      Hierarchy -> (_.isInstanceOf[HierarchyView]),
      Graph -> (_.isInstanceOf[GraphView]),
      Categories -> (_.isInstanceOf[CategoriesView]),
      Embedding -> (_.isInstanceOf[EmbeddingViewModel]),
    )
    val built = Seq(
      Views.build(p("Popular"), Frequent.fetch(ctx, Map.empty), Seq.empty),
      Views.build(p("Recent Documents"), Recents.fetch(ctx, Map.empty), Seq.empty),
      Views.build(p("Lineage"), LineageChildren.fetch(ctx, Map("artifact" -> "1")), Seq.empty),
      Views.build(p("Joinable"), Joinable.fetch(ctx, Map("table" -> "AIRLINES")), Seq.empty),
      Views.build(p("Type"), OfType.fetch(ctx, Map.empty), Seq.empty),
      Views.build(p("Usage Map"), EmbeddingView.fetch(ctx, Map.empty), Seq.empty),
    )
    built.foreach(v => assert(reps(v.representation)(v), s"wrong view for ${v.representation}"))
  }

  test("ranking weights of zero keep all rows (weights affect order only)") {
    val df = Recents.fetch(ctx, Map.empty)
    val v1 = Views.build(p("Recent Documents"), df, Seq.empty).asInstanceOf[ListView]
    val v2 = Views.build(p("Recent Documents"), df,
      Seq(RankingWeight("views", 9.9))).asInstanceOf[ListView]
    assert(v1.data.count() == v2.data.count())
  }
}
