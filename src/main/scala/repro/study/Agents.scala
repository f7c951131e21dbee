package repro.study

import scala.util.Random

/** A simulated first-use participant (substitutes the paper's six sales
  * engineers — see DESIGN.md for the substitution argument).
  *
  * Each trait drives a behavioral branch the paper observed in §7.2:
  *
  * @param searchFirst      T1: jump-starts with keyword search vs. starting
  *                         from the discovery views ("Three participants
  *                         jump-started with the keyword search")
  * @param awareExploration T2: knows that selecting an artifact populates
  *                         new views ("we reminded three participants ...")
  * @param careful          T3: includes the artifact-type condition on the
  *                         first query ("half of the participants missed
  *                         the first condition")
  * @param findsConfig      T4: locates the team-configuration setting
  *                         unaided ("two participants needed help finding
  *                         the team configuration setting")
  */
final case class AgentProfile(
    id: Int,
    searchFirst: Boolean,
    awareExploration: Boolean,
    careful: Boolean,
    findsConfig: Boolean,
)

object Agents {
  /** Trait probabilities. Calibrated to the frequencies §7.2 reports for
    * first-use business users (3/6, 3/6, 3/6, 4/6) — the calibration is an
    * input to the simulation and is documented as such in EXPERIMENTS.md;
    * task outcomes are still *executed* against the real generated
    * interface, not asserted.
    */
  val PSearchFirst = 0.5
  val PAware       = 0.5
  val PCareful     = 0.5
  val PFindsConfig = 2.0 / 3.0

  /** Stratified cohort: each trait is assigned to exactly `round(p*n)`
    * agents (reproducing the paper's marginal counts at n=6), with the
    * seed shuffling *which* agent carries which trait. This removes the
    * small-n sampling noise a Bernoulli draw would add on top of a
    * six-person cohort.
    */
  def generate(n: Int, seed: Long): Seq[AgentProfile] = {
    val rng = new Random(seed)
    def strat(p: Double): Seq[Boolean] = {
      val k = math.round(p * n).toInt
      rng.shuffle(Seq.fill(k)(true) ++ Seq.fill(n - k)(false))
    }
    val sf = strat(PSearchFirst); val aw = strat(PAware)
    val cf = strat(PCareful);     val fc = strat(PFindsConfig)
    (1 to n).map(id => AgentProfile(id, sf(id - 1), aw(id - 1), cf(id - 1), fc(id - 1)))
  }
}
