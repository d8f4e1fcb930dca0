package repro.baselines

import repro.core.{Nominee, ProblemInstance, Seed}
import repro.diffusion.LocalDiffusion

/** HAG, after "when social influence meets item inference" [10]
  * (Sec. VI-A): greedily selects the most influential user-item '''pair'''
  * combination by marginal influence per cost. It is item-association
  * aware (its spread evaluation includes the extra-adoption channel) but
  * its perceptions are static — it evaluates the full single-shot
  * diffusion with frozen perception/preference/influence dynamics.
  *
  * Faithful cost profile: HAG re-simulates the whole diffusion for each
  * candidate pair (CELF-pruned), so its runtime blows up with the budget
  * and the network size — the paper's Fig. 6(c) omits HAG because it could
  * not finish within 12 hours; [[run]] takes a `timeoutMs` reproducing
  * that behaviour (returns None on timeout).
  */
object HAG {

  def selectPairs(
      inst: ProblemInstance,
      maxCandidates: Int = 400,
      timeoutMs: Long = Long.MaxValue): Option[Vector[Nominee]] = {
    val pool = repro.core.CandidatePool.pairs(inst, maxCandidates)
    val deadline = if (timeoutMs == Long.MaxValue) Long.MaxValue else System.nanoTime() + timeoutMs * 1000000L
    // full-length frozen diffusion (not hop-limited): associations included,
    // dynamics frozen — the expensive part HAG is known for
    val frozenInst = inst.withParams(inst.params.frozen).withT(1)
    def f(set: Set[Nominee]): Double = {
      if (System.nanoTime() > deadline) throw new HagTimeout
      LocalDiffusion.sigma(frozenInst, set.iterator.map(n => Seed(n.user, n.item, 1)).toSeq)
    }
    // raw marginal gain among affordable pairs (Sec. VI-A extension), not
    // gain per cost — cost-effectiveness is Dysim's MCP, not HAG's
    try Some(Celf.select[Nominee](pool, n => inst.cost(n.user)(n.item), inst.budget, f, useRatio = false))
    catch { case _: HagTimeout => None }
  }

  /** None = timed out (the paper reports HAG as absent in that case). */
  def run(
      inst: ProblemInstance,
      maxCandidates: Int = 400,
      timeoutMs: Long = Long.MaxValue): Option[Vector[Seed]] =
    selectPairs(inst, maxCandidates, timeoutMs).map(CRGreedy.schedule(inst, _))

  private final class HagTimeout extends RuntimeException("HAG timeout")
}
