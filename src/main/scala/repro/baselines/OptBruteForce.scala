package repro.baselines

import repro.core.{Nominee, ProblemInstance, Seed}
import repro.diffusion.LocalDiffusion

/** OPT: exhaustive search over seed groups (Sec. VI-B compares against a
  * brute-force optimum on 100-user samples). Exponential, so the search
  * space is a restricted candidate pool of user-item pairs crossed with
  * all rounds, subsets up to `maxSeeds`, subject to the budget — the same
  * restriction any brute force on this problem needs (documented in
  * DESIGN.md / EXPERIMENTS.md).
  */
object OptBruteForce {

  /** Default pool: the affordable pairs with the best individual frozen
    * spread — half taken by spread per cost (the cost-effective picks),
    * half by raw spread (the expensive-hub picks), so the exhaustive
    * search sees both regimes.
    */
  def defaultPool(inst: ProblemInstance, poolSize: Int, frozenHops: Int = 3): Vector[Nominee] = {
    val frozenInst = FrozenSpread.instance(inst, frozenHops)
    val scored = for {
      u <- 0 until inst.nUsers
      x <- 0 until inst.nItems
      if inst.cost(u)(x) <= inst.budget + 1e-9
    } yield {
      val g = repro.diffusion.LocalDiffusion.sigma(frozenInst, Seq(Seed(u, x, 1)))
      (Nominee(u, x), g, g / inst.cost(u)(x))
    }
    val byRatio = scored.sortBy(-_._3).map(_._1)
    val byGain = scored.sortBy(-_._2).map(_._1)
    (byRatio.take((poolSize + 1) / 2) ++ byGain).distinct.take(poolSize).toVector
  }

  /** Exhaustive maximization of the dynamic σ over subsets (≤ maxSeeds) of
    * pool × rounds within budget. Returns (best seed group, its σ).
    */
  def run(inst: ProblemInstance, pool: Vector[Nominee], maxSeeds: Int): (Vector[Seed], Double) = {
    val options: Vector[Seed] =
      (for (n <- pool; t <- 1 to inst.T) yield Seed(n.user, n.item, t)).toVector
    var best = (Vector.empty[Seed], 0.0)

    def rec(startIdx: Int, chosen: List[Seed], costSoFar: Double, usedPairs: Set[Nominee]): Unit = {
      if (chosen.nonEmpty) {
        val sig = LocalDiffusion.sigma(inst, chosen)
        if (sig > best._2) best = (chosen.toVector, sig)
      }
      if (chosen.length < maxSeeds) {
        var i = startIdx
        while (i < options.length) {
          val s = options(i)
          val pair = Nominee(s.user, s.item)
          val c = inst.cost(s.user)(s.item)
          // a pair may be seeded at multiple rounds per the paper, but the
          // re-seeding of an already-adopted (u, x) is a no-op; skip it.
          if (!usedPairs.contains(pair) && costSoFar + c <= inst.budget + 1e-9)
            rec(i + 1, s :: chosen, costSoFar + c, usedPairs + pair)
          i += 1
        }
      }
    }
    rec(0, Nil, 0.0, Set.empty)
    best
  }
}
