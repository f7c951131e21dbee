package repro.providers

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.catalog.CatalogTables
import repro.spec.{MetadataProviderSpec, Representation}

/** Everything a provider implementation may read from.
  *
  * The catalog plays the role of the paper's metadata services; `joinEdges`
  * and `coordinates` are outputs of the relationship-extraction substrate
  * (`repro.extract`) when the deployment has computed them. Providers fetch
  * *through* this context only — they never see the UI, which is exactly the
  * decoupling the paper's framework is about.
  *
  * @param joinEdges   joinability edges (src_table, src_column, dst_table,
  *                    dst_column, score), if extracted
  * @param coordinates 2-D artifact embedding (artifact_id, x, y), if extracted
  */
final case class ProviderContext(
    spark: SparkSession,
    catalog: CatalogTables,
    joinEdges: Option[DataFrame] = None,
    coordinates: Option[DataFrame] = None,
) {
  /** Artifacts enriched with ranking-relevant derived metadata fields:
    * `endorsements` (badge count) and `age_days`. Ranking weights in specs
    * reference these by name (paper §4.2, Listing 1 uses `favorite`/`views`).
    */
  lazy val enrichedArtifacts: DataFrame = {
    val a = catalog.artifacts
    val endorsed = catalog.badges
      .where(col("badge") === "endorsed")
      .groupBy(col("artifact_id").as("b_aid"))
      .agg(count(lit(1)).as("endorsements"))
    a.join(endorsed, a("artifact_id") === endorsed("b_aid"), "left")
      .drop("b_aid")
      .withColumn("endorsements", coalesce(col("endorsements"), lit(0L)))
      .withColumn("age_days",
        datediff(lit("2024-01-01").cast("date"), col("created_at")).cast("long"))
      // Every provider and every query element reads through this relation;
      // caching it keeps a multi-element search from recomputing the badge
      // aggregation once per element.
      .cache()
  }
}

/** Raised when a provider is invoked without a declared required input
  * (paper §4.1: required inputs gate whether a provider "has all the
  * information needed for fetching data").
  */
final case class MissingInputException(endpoint: String, input: String)
    extends RuntimeException(s"provider endpoint '$endpoint' requires input '$input'")

/** A metadata provider implementation.
  *
  * The Humboldt spec references implementations by [[endpoint]]; *how* data
  * is fetched (here: DataFrame transformations over the catalog) is opaque
  * to the spec and the generated UI (paper §4.1). The [[representation]] is
  * the shape contract the returned DataFrame must satisfy — checked by
  * [[Contracts.validate]] in tests and at view-construction time.
  */
trait Provider {
  def endpoint: String

  /** The representation this implementation produces. A spec entry whose
    * declared representation differs is a validation error (Registry).
    */
  def representation: Representation

  /** Fetch metadata given string-typed inputs (the UI binds these from user
    * entry or from a selected artifact's metadata during exploration).
    */
  def fetch(ctx: ProviderContext, inputs: Map[String, String] = Map.empty): DataFrame

  /** Convenience: throw unless a required input is present. */
  protected def need(inputs: Map[String, String], key: String): String =
    inputs.getOrElse(key, throw MissingInputException(endpoint, key))
}

/** Shape contracts per representation: which columns a provider's output
  * must contain for the corresponding view to be constructible.
  */
object Contracts {
  import Representation._

  /** Required column names for each representation. */
  def requiredColumns(rep: Representation): Set[String] = rep match {
    case Tiles | ListRep => Set("artifact_id", "name", "artifact_type")
    case Hierarchy       => Set("artifact_id", "parent_id", "depth", "name")
    case Graph           => Set("src", "dst", "weight")
    case Categories      => Set("artifact_id", "name", "category")
    case Embedding       => Set("artifact_id", "name", "x", "y")
  }

  /** Columns of `df` missing from the contract of `rep` (empty = valid). */
  def missing(rep: Representation, df: DataFrame): Set[String] =
    requiredColumns(rep) -- df.columns.map(_.toLowerCase).toSet

  def validate(rep: Representation, df: DataFrame): Unit = {
    val m = missing(rep, df)
    require(m.isEmpty,
      s"provider output violates '${rep.name}' contract: missing columns ${m.toSeq.sorted.mkString(", ")}")
  }

  /** The artifact ids present in a provider result, regardless of shape —
    * this is what makes every provider usable as a *search* query element
    * (paper §5.3: "Each query element returns a list of data artifacts").
    */
  def artifactIds(rep: Representation, df: DataFrame): DataFrame = rep match {
    case Graph =>
      df.select(col("src").cast("long").as("artifact_id"))
        .unionByName(df.select(col("dst").cast("long").as("artifact_id")))
        .distinct()
    case _ =>
      df.select(col("artifact_id").cast("long")).distinct()
  }
}

/** Validation of a spec against a registry of implementations — the seam
  * where "does the spec make sense" meets "is it implemented".
  */
object ProviderBinding {
  def validate(spec: repro.spec.HumboldtSpec, registry: Registry): Seq[String] = {
    val structural = spec.validate
    val binding = spec.providers.flatMap { p =>
      registry.get(p.endpoint) match {
        case None => Seq(s"provider '${p.name}': endpoint '${p.endpoint}' is not registered")
        case Some(impl) if impl.representation != p.representation =>
          Seq(s"provider '${p.name}': spec declares representation " +
            s"'${p.representation.name}' but endpoint '${p.endpoint}' produces " +
            s"'${impl.representation.name}'")
        case _ => Seq.empty
      }
    }
    structural ++ binding
  }

  /** Resolve a spec entry to its implementation, or fail loudly. */
  def resolve(p: MetadataProviderSpec, registry: Registry): Provider =
    registry.get(p.endpoint).getOrElse(
      throw new IllegalArgumentException(s"unregistered endpoint '${p.endpoint}'"))
}
