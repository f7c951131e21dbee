package repro.search

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec, TestFixtures}
import repro.providers.Registry
import repro.spec.UseCaseSpec

class QueryCompilerSpec extends SparkSpec {

  private lazy val ctx = TestFixtures.ctx
  private lazy val compiler = new QueryCompiler(UseCaseSpec.default, Registry.standard, ctx)
  private def cat = ctx.catalog

  private def ids(input: String, scope: Option[DataFrame] = None): DataFrame =
    compiler.search(input, scope)
      .fold(e => fail(s"'$input' failed: $e"), identity)
      .select(col("artifact_id").cast("long")).distinct()

  private def idSet(input: String): Set[Long] =
    ids(input).collect().map(_.getLong(0)).toSet

  // ---- single elements, oracle-checked ------------------------------------

  test("oracle: free text query") {
    Oracle.assertEquivalent(ids("sales"),
      """SELECT DISTINCT CAST(artifact_id AS BIGINT) AS artifact_id FROM artifacts
        |WHERE lower(name) LIKE '%sales%' OR lower(description) LIKE '%sales%'
        |""".stripMargin,
      "artifacts" -> cat.artifacts)
  }

  test("oracle: field predicate owned by") {
    Oracle.assertEquivalent(ids("owned by: 'Alex'"),
      """SELECT DISTINCT CAST(a.artifact_id AS BIGINT) AS artifact_id
        |FROM artifacts a JOIN users u ON a.owner_id = u.user_id
        |WHERE u.user_name = 'Alex'""".stripMargin,
      "artifacts" -> cat.artifacts, "users" -> cat.users)
  }

  test("oracle: field predicate type") {
    Oracle.assertEquivalent(ids("type: dashboard"),
      """SELECT DISTINCT CAST(artifact_id AS BIGINT) AS artifact_id
        |FROM artifacts WHERE artifact_type = 'dashboard'""".stripMargin,
      "artifacts" -> cat.artifacts)
  }

  test("oracle: conjunction compiles to intersection") {
    Oracle.assertEquivalent(ids("type: table & badged: endorsed"),
      """SELECT DISTINCT CAST(a.artifact_id AS BIGINT) AS artifact_id
        |FROM artifacts a JOIN badges b ON a.artifact_id = b.artifact_id
        |WHERE a.artifact_type = 'table' AND b.badge = 'endorsed'""".stripMargin,
      "artifacts" -> cat.artifacts, "badges" -> cat.badges)
  }

  test("oracle: disjunction compiles to union") {
    Oracle.assertEquivalent(ids("type: dashboard | badged: warning"),
      """SELECT DISTINCT CAST(a.artifact_id AS BIGINT) AS artifact_id
        |FROM artifacts a
        |WHERE a.artifact_type = 'dashboard'
        |   OR EXISTS (SELECT 1 FROM badges b
        |              WHERE b.artifact_id = a.artifact_id AND b.badge = 'warning')
        |""".stripMargin,
      "artifacts" -> cat.artifacts, "badges" -> cat.badges)
  }

  test("oracle: negation compiles to anti-join against the universe") {
    Oracle.assertEquivalent(ids("! badged: endorsed"),
      """SELECT DISTINCT CAST(a.artifact_id AS BIGINT) AS artifact_id
        |FROM artifacts a
        |WHERE NOT EXISTS (SELECT 1 FROM badges b
        |                  WHERE b.artifact_id = a.artifact_id AND b.badge = 'endorsed')
        |""".stripMargin,
      "artifacts" -> cat.artifacts, "badges" -> cat.badges)
  }

  test("oracle: bracketed composition with and/or/not") {
    Oracle.assertEquivalent(ids("type: table & (badged: warning | ! owned by: 'Alex')"),
      """SELECT DISTINCT CAST(a.artifact_id AS BIGINT) AS artifact_id
        |FROM artifacts a
        |WHERE a.artifact_type = 'table' AND (
        |  EXISTS (SELECT 1 FROM badges b
        |          WHERE b.artifact_id = a.artifact_id AND b.badge = 'warning')
        |  OR NOT EXISTS (SELECT 1 FROM users u
        |                 WHERE a.owner_id = u.user_id AND u.user_name = 'Alex'))
        |""".stripMargin,
      "artifacts" -> cat.artifacts, "badges" -> cat.badges, "users" -> cat.users)
  }

  test("oracle: the abstract's flagship query") {
    Oracle.assertEquivalent(ids(UseCaseSpec.flagshipQuery),
      """SELECT DISTINCT CAST(a.artifact_id AS BIGINT) AS artifact_id
        |FROM artifacts a
        |JOIN users o ON a.owner_id = o.user_id
        |WHERE a.artifact_type = 'table'
        |  AND o.user_name = 'Alex'
        |  AND EXISTS (SELECT 1 FROM badges b
        |              WHERE b.artifact_id = a.artifact_id AND b.badge = 'endorsed')
        |  AND EXISTS (SELECT 1 FROM badges b JOIN users m ON b.badged_by = m.user_id
        |              WHERE b.artifact_id = a.artifact_id AND m.user_name = 'Mike')
        |  AND (lower(a.name) LIKE '%sales%' OR lower(a.description) LIKE '%sales%')
        |""".stripMargin,
      "artifacts" -> cat.artifacts, "badges" -> cat.badges, "users" -> cat.users)
  }

  test("flagship query returns exactly the pinned sales tables") {
    assert(idSet(UseCaseSpec.flagshipQuery) == Set(2L, 3L))
  }

  test("task 3 query returns exactly John Doe's workbooks") {
    assert(idSet("type: workbook created by: 'John Doe'") == Set(7L, 8L, 9L))
  }

  // ---- provider calls and scoring -----------------------------------------

  test("prefix provider call works like the paper's example") {
    val df = compiler.search(":recent_documents() & airlines")
      .fold(e => fail(e), identity)
    val names = df.select("name").collect().map(_.getString(0))
    assert(names.exists(_.contains("AIRLINES")))
  }

  test("provider call with positional args binds declared inputs") {
    assert(idSet(":owned_by('John Doe')") ==
      idSet("created by: 'John Doe'"))
  }

  test("scores combine additively under conjunction") {
    val single = compiler.search("badged: endorsed").fold(e => fail(e), identity)
      .where(col("artifact_id") === 1L).select("score").collect()(0).getDouble(0)
    val double = compiler.search("badged: endorsed & type: table")
      .fold(e => fail(e), identity)
      .where(col("artifact_id") === 1L).select("score").collect()(0).getDouble(0)
    assert(math.abs(double - 2 * single) < 1e-6)
  }

  test("results are ordered by score descending") {
    val scores = compiler.search("type: table").fold(e => fail(e), identity)
      .select("score").collect().map(_.getDouble(0))
    assert(scores.zip(scores.tail).forall { case (a, b) => a >= b })
  }

  test("per-provider ranking weights are honored in scoring") {
    // The 'Popular' provider has local weight views*2.0; 'Recent Documents'
    // falls back to global. Same artifact, different provider, different score.
    val viaGlobal = compiler.search(":recent_documents()").fold(e => fail(e), identity)
      .where(col("artifact_id") === 1L).select("score").collect()(0).getDouble(0)
    val expectGlobal = 40 * 4.3 + 5000 * 1.5 + 1 * 10.0 // favorites, views, endorsements
    assert(math.abs(viaGlobal - expectGlobal) < 1e-6)
  }

  // ---- filter vs search scope ----------------------------------------------

  test("filter scope narrows results to the view (§5.3)") {
    import spark.implicits._
    val scope = Seq(2L, 7L).toDF("artifact_id")
    val global = idSet("owned by: 'Alex'")
    val filtered = ids("owned by: 'Alex'", Some(scope)).collect().map(_.getLong(0)).toSet
    assert(global.contains(2L) && global.size > 1)
    assert(filtered == Set(2L))
  }

  test("negation universe respects the filter scope") {
    import spark.implicits._
    val scope = Seq(1L, 2L, 7L).toDF("artifact_id")
    val got = ids("! owned by: 'Alex'", Some(scope)).collect().map(_.getLong(0)).toSet
    assert(got == Set(7L)) // 1 and 2 are Alex's
  }

  test("empty result is fine (no match, no error)") {
    assert(idSet("type: table owned by: 'John Doe' badged: endorsed").isEmpty)
  }

  test("parse errors surface as Left") {
    assert(compiler.search("type:").isLeft)
  }

  test("unknown field inside compilation throws informatively") {
    val q = Query.FieldPred("bogus key", "x")
    val e = intercept[IllegalArgumentException](compiler.compile(q))
    assert(e.getMessage.contains("bogus key"))
  }

  test("or across text and metadata composes") {
    val got = idSet("'airlines' | badged: warning")
    assert(got.contains(1L)) // AIRLINES by text
    assert(got.contains(8L)) // CHURN_ANALYSIS has warning badge
  }
}
