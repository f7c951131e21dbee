package repro.search

import repro.{SparkSpec, TestFixtures}
import repro.spec.UseCaseSpec

class SuggestSpec extends SparkSpec {

  private lazy val suggest = new Suggest(UseCaseSpec.default, TestFixtures.ctx)

  test("admissible keys mirror the spec's search-visible providers") {
    val keys = suggest.admissibleKeys.map(_.completion).toSet
    assert(keys == Set("owned by:", "created by:", "badged:", "badged by:", "type:"))
  }

  test("key completion by prefix") {
    assert(suggest.completeKey("own").map(_.completion) == Seq("owned by:"))
    assert(suggest.completeKey("badged").map(_.completion).toSet ==
      Set("badged:", "badged by:"))
  }

  test("key completion is case-insensitive") {
    assert(suggest.completeKey("TY").map(_.completion) == Seq("type:"))
  }

  test("key completion with no match is empty") {
    assert(suggest.completeKey("zzz").isEmpty)
  }

  test("suggestions carry the provider name and description") {
    val s = suggest.completeKey("type").head
    assert(s.provider == "Type")
    assert(s.detail.nonEmpty)
  }

  test("provider call completion") {
    val got = suggest.completeProviderCall(":recent")
    assert(got.map(_.completion) == Seq(":recent_documents()"))
  }

  test("provider call completion shows declared inputs") {
    val got = suggest.completeProviderCall(":owned")
    assert(got.map(_.completion) == Seq(":owned_by(user)"))
  }

  test("user-typed field recommends user names (paper §5.3 example)") {
    val vals = suggest.valuesFor("owned by")
    assert(vals.contains("Alex"))
    assert(vals.contains("Mike"))
  }

  test("value completion narrows by prefix") {
    assert(suggest.valuesFor("owned by", "Jo") == Seq("John Doe"))
  }

  test("badge field recommends badge kinds") {
    assert(suggest.valuesFor("badged").toSet.subsetOf(
      Set("endorsed", "warning", "deprecated")))
    assert(suggest.valuesFor("badged").contains("endorsed"))
  }

  test("type field recommends the four artifact types") {
    assert(suggest.valuesFor("type").toSet ==
      Set("table", "visualization", "workbook", "dashboard"))
  }

  test("unknown key recommends nothing") {
    assert(suggest.valuesFor("bogus").isEmpty)
  }

  test("table input type recommends only tables") {
    val vals = suggest.valuesForType("table", "AIR")
    assert(vals == Seq("AIRLINES"))
  }

  test("free-text inputs have no recommendations") {
    assert(suggest.valuesForType("text").isEmpty)
  }

  test("value lists respect the limit") {
    assert(suggest.valuesForType("artifact").size <= 20)
  }
}
