package repro.baselines

import repro.core.{Nominee, ProblemInstance, Seed}
import repro.diffusion.LocalDiffusion

/** CR-Greedy [5] round assignment, used to extend the single-promotion
  * baselines to T promotions (Sec. VI-A): for each selected user-item pair
  * in selection order, evaluate the marginal dynamic influence of placing
  * it at every round t ∈ [1, T] given the pairs already scheduled, and
  * keep the best round.
  */
object CRGreedy {

  def schedule(inst: ProblemInstance, pairs: Seq[Nominee]): Vector[Seed] = {
    val scheduled = scala.collection.mutable.ArrayBuffer.empty[Seed]
    var sigmaSoFar = 0.0
    pairs.foreach { n =>
      var bestT = 1
      var bestSigma = Double.NegativeInfinity
      var t = 1
      while (t <= inst.T) {
        val sig = LocalDiffusion.sigma(inst, (scheduled :+ Seed(n.user, n.item, t)).toSeq)
        if (sig > bestSigma + 1e-12) { bestSigma = sig; bestT = t }
        t += 1
      }
      if (bestSigma > sigmaSoFar - 1e-12) {
        scheduled += Seed(n.user, n.item, bestT)
        sigmaSoFar = bestSigma
      }
    }
    scheduled.toVector
  }
}
