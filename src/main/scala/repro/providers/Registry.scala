package repro.providers

/** Endpoint-name -> implementation lookup.
  *
  * This is Humboldt's extensibility surface (paper §1: adding a new metadata
  * source "is just a matter of adding a few lines of specification"): a new
  * provider is (a) one [[Provider]] implementation registered here and (b)
  * a spec entry referencing its endpoint — zero changes to view generation,
  * search, or ranking code. Bench T5 measures exactly that.
  */
final class Registry private (impls: Map[String, Provider]) {
  def get(endpoint: String): Option[Provider] = impls.get(endpoint)
  def endpoints: Seq[String] = impls.keys.toSeq.sorted
  def size: Int = impls.size

  /** A new registry with `p` added (or replaced, last-write-wins — matching
    * the paper's "developers ... might add newly implemented metadata
    * providers ... while removing ones that are not supported anymore").
    */
  def register(p: Provider): Registry = new Registry(impls + (p.endpoint -> p))

  def deregister(endpoint: String): Registry = new Registry(impls - endpoint)
}

object Registry {
  val empty: Registry = new Registry(Map.empty)

  def apply(providers: Provider*): Registry =
    providers.foldLeft(empty)(_.register(_))

  /** Registry with all standard providers (paper §6.1's set). */
  def standard: Registry = apply(StandardProviders.all: _*)
}
