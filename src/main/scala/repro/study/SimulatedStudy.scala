package repro.study

import org.apache.spark.sql.SparkSession
import repro.catalog.{CatalogSynth, LakeSynth}
import repro.extract.{ColumnSketches, Embedding, Joinability}
import repro.providers.{ProviderContext, Registry}
import repro.spec.UseCaseSpec

/** Full simulated first-use study (paper §7): builds the catalog and the
  * extraction substrate, generates the §6 interface from the use-case spec,
  * runs the agent cohort through Tasks 1–4 (plus the keyword-only
  * baseline), and scores the Figure 8 questionnaire.
  */
object SimulatedStudy {

  final case class StudyRun(
      harness: StudyHarness,
      agents: Seq[AgentProfile],
      results: Seq[TaskResult],
      baseline: Seq[TaskResult],
      likert: Likert.Report,
  )

  /** Assemble a ProviderContext at a scale factor: synthetic catalog plus
    * real extraction (joinability from MinHash over the pinned lake,
    * embedding from PCA over the catalog).
    */
  def context(spark: SparkSession, sf: Double, seed: Long): ProviderContext = {
    val catalog = CatalogSynth(spark, sf, seed).cached()
    val lake = LakeSynth.tables(spark)
    val sketches = ColumnSketches.sketchAll(lake, k = 32)
    val edges = Joinability.edges(sketches, threshold = 0.5)
    ProviderContext(
      spark = spark,
      catalog = catalog,
      joinEdges = Some(Joinability.edgesDf(spark, edges)),
      coordinates = Some(Embedding.coordinates(catalog)),
    )
  }

  def run(spark: SparkSession, sf: Double = 0.01, seed: Long = 42,
          nAgents: Int = 6): StudyRun = {
    val ctx = context(spark, sf, seed)
    val harness = new StudyHarness(UseCaseSpec.default, Registry.standard, ctx)
    val agents = Agents.generate(nAgents, seed)
    val results = agents.flatMap(harness.runAll)
    val baseline = agents.flatMap(a => (1 to 4).map(t => harness.baselineTask(t, a)))
    StudyRun(harness, agents, results, baseline, Likert.score(results, seed))
  }

  /** §7.2-style per-task aggregates. */
  final case class TaskStats(task: Int, completed: Int, total: Int,
                             unassisted: Int, meanSteps: Double)

  def taskStats(results: Seq[TaskResult]): Seq[TaskStats] =
    results.groupBy(_.task).toSeq.sortBy(_._1).map { case (t, rs) =>
      TaskStats(t,
        completed = rs.count(_.success),
        total = rs.size,
        unassisted = rs.count(r => r.success && r.assists == 0),
        meanSteps = rs.map(_.steps).sum.toDouble / rs.size)
    }
}
