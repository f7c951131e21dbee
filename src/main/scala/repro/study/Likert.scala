package repro.study

import scala.util.Random

/** The post-study questionnaire model (paper §7.2, Figure 8).
  *
  * 12 statements in 4 categories on a 5-point Likert scale. Human ratings
  * cannot be recomputed; the response model maps each agent's *measured*
  * task friction (assists consumed, interaction steps above the minimum)
  * onto ratings, plus seeded statement-level noise. The paper's Figure 8
  * values are kept alongside as constants so the bench prints both.
  */
object Likert {

  /** The four Figure 8 categories mapped to the tasks that exercise them. */
  final case class Category(name: String, task: Int, statements: Seq[String])

  val categories: Seq[Category] = Seq(
    Category("entry_points", 1, Seq(
      "The data views helped me find data",
      "The layout made the views easy to locate",
      "The overviews were useful entry points")),
    Category("exploration_previews", 2, Seq(
      "Selecting an artifact surfaced useful related data",
      "The preview of selected data was helpful",
      "I could navigate from one artifact to related ones")),
    Category("search", 3, Seq(
      "The metadata-based search supported my task",
      "Composing query conditions was easy",
      "Value suggestions helped me enter queries")),
    Category("customization", 4, Seq(
      "Customizing the team page was straightforward",
      "The configuration options match my needs",
      "Extending the interface with providers seems useful")),
  )

  /** Paper's Figure 8 aggregates (category -> (mean, std)), for the diff
    * printed by bench T2. "finding data views" and "layout design" are the
    * low scorers inside entry_points; search and previews the high ones.
    */
  val paperCategoryStats: Map[String, (Double, Double)] = Map(
    "entry_points"         -> (3.42, 0.86), // mean of 3.33 (views) and 3.50 (layout)
    "exploration_previews" -> (4.33, 1.11),
    "search"               -> (4.33, 0.75),
    "customization"        -> (4.17, 0.69),
  )
  val paperOverall: (Double, Double) = (3.97, 0.85)

  /** One agent's rating for one statement: base 4.5, −1 per assist consumed
    * in the category's task, −2 if the task took noticeably many steps
    * (layout friction — the paper's entry-point complaints were about
    * layout and finding the views), plus slightly negative-skewed noise
    * {−1, 0, +1} at (0.35, 0.55, 0.10), clamped to 1..5. The skew reflects
    * that first-use feedback is critical at the margin; penalties are the
    * *measured* frictions from the task run.
    */
  def rating(result: TaskResult, statementIdx: Int, rng: Random): Int = {
    val base = 4.5
    val assistPenalty = result.assists.toDouble
    val stepPenalty = if (result.steps > 4) 2.0 else 0.0
    val noise = rng.nextDouble() match {
      case d if d < 0.35 => -1.0
      case d if d < 0.90 => 0.0
      case _             => 1.0
    }
    val successPenalty = if (result.success) 0.0 else 2.0
    math.max(1, math.min(5, math.round(
      base - assistPenalty - stepPenalty - successPenalty + noise).toInt))
  }

  final case class CategoryStats(category: String, mean: Double, std: Double,
                                 paperMean: Double, paperStd: Double)

  final case class Report(perCategory: Seq[CategoryStats],
                          overallMean: Double, overallStd: Double)

  /** Score the questionnaire for all agents given their task results. */
  def score(results: Seq[TaskResult], seed: Long): Report = {
    val rng = new Random(seed)
    val byAgentTask = results.map(r => (r.agent, r.task) -> r).toMap
    val perStatement: Seq[(String, Int)] = for {
      agent <- results.map(_.agent).distinct.sorted
      cat   <- categories
      idx   <- cat.statements.indices
      r     <- byAgentTask.get((agent, cat.task)).toSeq
    } yield cat.name -> rating(r, idx, rng)

    def stats(xs: Seq[Int]): (Double, Double) = {
      val m = xs.sum.toDouble / xs.size
      val v = xs.map(x => (x - m) * (x - m)).sum / xs.size
      (m, math.sqrt(v))
    }

    val perCat = categories.map { c =>
      val xs = perStatement.collect { case (n, x) if n == c.name => x }
      val (m, s) = stats(xs)
      val (pm, ps) = paperCategoryStats(c.name)
      CategoryStats(c.name, m, s, pm, ps)
    }
    val (om, os) = stats(perStatement.map(_._2))
    Report(perCat, om, os)
  }
}
