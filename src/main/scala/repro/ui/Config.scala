package repro.ui

import scala.collection.immutable.ListMap
import repro.spec._

/** Customization operations (paper §4.4): pure spec-to-spec transforms.
  *
  * "Administrators ... can configure which metadata providers they want to
  * use and where these providers are available ... individuals ... can hide
  * and reorder the metadata providers ... a team manager ... might even
  * configure the recommendations ... for their team members." Every op here
  * returns a new spec; regenerating the interface from it is how the UI
  * updates — no UI code changes, which is the point of the framework.
  */
object Config {

  /** Make a provider visible on a surface. No-op if unknown name. */
  def showOn(spec: HumboldtSpec, providerName: String, surface: Surface): HumboldtSpec =
    mapProvider(spec, providerName) { p =>
      if (p.visibility.contains(surface)) p
      else p.copy(visibility = p.visibility :+ surface)
    }

  /** Hide a provider from a surface (the end-user "hide" op). */
  def hideOn(spec: HumboldtSpec, providerName: String, surface: Surface): HumboldtSpec =
    mapProvider(spec, providerName)(p => p.copy(visibility = p.visibility.filterNot(_ == surface)))

  /** Reorder providers; names not mentioned keep their relative order after
    * the mentioned ones (the end-user "reorder" op).
    */
  def reorder(spec: HumboldtSpec, order: Seq[String]): HumboldtSpec = {
    val byName = spec.providers.map(p => p.name -> p).toMap
    val front  = order.flatMap(byName.get)
    val rest   = spec.providers.filterNot(p => order.contains(p.name))
    spec.copy(providers = front ++ rest)
  }

  /** Add a provider entry (the developer op for a newly implemented
    * endpoint). Fails if the name already exists.
    */
  def addProvider(spec: HumboldtSpec, p: MetadataProviderSpec): HumboldtSpec = {
    require(spec.provider(p.name).isEmpty, s"provider '${p.name}' already exists")
    spec.copy(providers = spec.providers :+ p)
  }

  /** Remove a provider and any home-page references to it. */
  def removeProvider(spec: HumboldtSpec, name: String): HumboldtSpec = {
    val cleaned = spec.custom.map {
      case (k, v) if k == "team_home_pages" => k -> removeRefs(v, name)
      case kv                               => kv
    }
    spec.copy(providers = spec.providers.filterNot(_.name == name),
      custom = ListMap(cleaned.toSeq: _*))
  }

  /** Set a team's home page providers (Task 4 of the study; Listing 2).
    * Unknown provider names are rejected so the page can always render.
    */
  def setTeamHomePage(spec: HumboldtSpec, team: String,
                      providerNames: Seq[String]): HumboldtSpec = {
    val unknown = providerNames.filterNot(n => spec.provider(n).isDefined)
    require(unknown.isEmpty, s"unknown providers for home page: ${unknown.mkString(", ")}")
    val entry = Json.obj(
      "team" -> Json.str(team),
      "providers" -> Json.JArray(providerNames.map(Json.str).toVector),
    )
    val existing = spec.custom.get("team_home_pages").flatMap(_.arr).getOrElse(Vector.empty)
    val updated  = existing.filterNot(_.apply("team").flatMap(_.str).contains(team)) :+ entry
    spec.copy(custom = spec.custom.updated("team_home_pages", Json.JArray(updated)))
  }

  /** The providers currently on a team's home page, in order. */
  def teamHomePage(spec: HumboldtSpec, team: String): Seq[String] =
    spec.custom.get("team_home_pages").flatMap(_.arr).getOrElse(Vector.empty)
      .find(_.apply("team").flatMap(_.str).contains(team))
      .flatMap(_.apply("providers")).flatMap(_.arr)
      .getOrElse(Vector.empty).flatMap(_.str)

  private def mapProvider(spec: HumboldtSpec, name: String)(
      f: MetadataProviderSpec => MetadataProviderSpec): HumboldtSpec =
    spec.copy(providers = spec.providers.map(p => if (p.name == name) f(p) else p))

  private def removeRefs(pages: Json, name: String): Json = pages match {
    case Json.JArray(entries) =>
      Json.JArray(entries.map {
        case o @ Json.JObject(fields) =>
          fields.get("providers") match {
            case Some(Json.JArray(ps)) =>
              Json.JObject(fields.updated("providers",
                Json.JArray(ps.filterNot(_.str.contains(name)))))
            case _ => o
          }
        case other => other
      })
    case other => other
  }
}
