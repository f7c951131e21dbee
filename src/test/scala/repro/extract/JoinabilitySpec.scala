package repro.extract

import repro.SparkSpec
import repro.catalog.LakeSynth

class JoinabilitySpec extends SparkSpec {

  private lazy val lake = LakeSynth.tables(spark, rows = 200, seed = 7)
  private lazy val sketches = ColumnSketches.sketchAll(lake, k = 64)
  private lazy val edges = Joinability.edges(sketches, threshold = 0.5)

  test("planted region_id clique is discovered") {
    // Every pair among the five region-carrying tables should be connected.
    val connected = edges.map(e => (e.srcTable, e.dstTable)).toSet
    val tablesWithRegion = Seq("AIRLINES", "SALES_PIPELINE", "SALES_FORECAST",
      "REGIONAL_SALES", "CUSTOMER_BASE")
    for (a <- tablesWithRegion; b <- tablesWithRegion if a != b)
      assert(connected.contains((a, b)), s"missing edge $a -> $b")
  }

  test("discovered column pairs are the planted join keys") {
    val airlinesToRegional = edges
      .find(e => e.srcTable == "AIRLINES" && e.dstTable == "REGIONAL_SALES").get
    assert(airlinesToRegional.srcColumn == "region_id")
    assert(airlinesToRegional.dstColumn == "region_id")
  }

  test("customer link between pipeline and base is found") {
    val e = edges.find(e =>
      e.srcTable == "SALES_PIPELINE" && e.dstTable == "CUSTOMER_BASE").get
    // Both region_id and customer_id qualify; the best pair must score ~1.
    assert(e.score > 0.8)
  }

  test("edges never connect a table to itself") {
    assert(edges.forall(e => e.srcTable != e.dstTable))
  }

  test("edge scores are valid containments") {
    assert(edges.forall(e => e.score >= 0.0 && e.score <= 1.0))
  }

  test("threshold prunes edges") {
    val loose = Joinability.edges(sketches, threshold = 0.1)
    val strict = Joinability.edges(sketches, threshold = 0.9)
    assert(strict.size <= edges.size)
    assert(edges.size <= loose.size)
  }

  test("sketch edges agree with exact edges on the lake") {
    val exact = Joinability.exactEdges(lake, threshold = 0.5)
    val exactPairs = exact.map(e => (e.srcTable, e.dstTable)).toSet
    val estPairs = edges.map(e => (e.srcTable, e.dstTable)).toSet
    // At k=64 on planted keys with containment ~1.0 the tails are far from
    // the 0.5 threshold, so the edge sets must match exactly.
    assert(estPairs == exactPairs,
      s"missing=${exactPairs -- estPairs} spurious=${estPairs -- exactPairs}")
  }

  test("edgesDf has the graph-provider contract columns") {
    val df = Joinability.edgesDf(spark, edges)
    assert(df.columns.toSet ==
      Set("src_table", "src_column", "dst_table", "dst_column", "score"))
    assert(df.count() == edges.size)
  }

  test("fast exact containments agree with the per-pair oracle") {
    val small = lake.map { case (n, df) => n -> df.limit(60) }
    val fast = Joinability.exactContainmentsAll(spark, small)
      .map(e => (e.srcTable, e.srcColumn, e.dstTable, e.dstColumn) -> e.score).toMap
    // Spot-check a handful of pairs against the slow per-pair computation.
    val pairs = Seq(
      ("AIRLINES", "region_id", "REGIONAL_SALES", "region_id"),
      ("SALES_PIPELINE", "customer_id", "CUSTOMER_BASE", "customer_id"),
      ("AIRLINES", "carrier", "CUSTOMER_BASE", "customer_name"),
      ("REGIONAL_SALES", "region_id", "AIRLINES", "region_id"))
    val byName = small.toMap
    pairs.foreach { case (ta, ca, tb, cb) =>
      val slow = ColumnSketches.exactContainment(byName(ta), ca, byName(tb), cb)
      val got = fast.getOrElse((ta, ca, tb, cb), 0.0)
      assert(math.abs(got - slow) < 1e-9, s"$ta.$ca -> $tb.$cb: fast=$got slow=$slow")
    }
  }

  test("fast exact edges match the slow exact edges") {
    val small = lake.map { case (n, df) => n -> df.limit(60) }
    val slow = Joinability.exactEdges(small, threshold = 0.5)
      .map(e => (e.srcTable, e.dstTable) -> e.score).toMap
    val fast = Joinability.exactEdgesFast(spark, small, threshold = 0.5)
      .map(e => (e.srcTable, e.dstTable) -> e.score).toMap
    assert(fast.keySet == slow.keySet)
    fast.foreach { case (k, v) => assert(math.abs(v - slow(k)) < 1e-9, s"$k") }
  }

  test("edgesDf of empty edge list is empty but well-formed") {
    val df = Joinability.edgesDf(spark, Seq.empty)
    assert(df.count() == 0)
    assert(df.columns.length == 5)
  }
}
