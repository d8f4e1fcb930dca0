package repro.baselines

import org.scalatest.funsuite.AnyFunSuite
import repro.TestInstances
import repro.core.{Nominee, TMI}
import repro.core.Dysim
import repro.diffusion.LocalDiffusion

class OptSpec extends AnyFunSuite {

  private def tiny = TestInstances.mk(
    nUsers = 5,
    nItems = 2,
    edges = Seq((0, 1), (1, 2), (3, 4)),
    metaS = Vector(TestInstances.sym(2)((0, 1, 0.7)), Array.fill(2, 2)(0.0)),
    budget = 2.0,
    t = 2,
    cost = (_, _) => 1.0)

  test("OPT respects the budget") {
    val i = tiny
    val pool = OptBruteForce.defaultPool(i, poolSize = 6)
    val (seeds, _) = OptBruteForce.run(i, pool, maxSeeds = 2)
    assert(i.withinBudget(seeds))
  }

  test("OPT finds the exhaustive maximum over its pool") {
    val i = tiny
    val pool = Vector(Nominee(0, 0), Nominee(3, 0))
    val (seeds, sigma) = OptBruteForce.run(i, pool, maxSeeds = 2)
    // exhaustive check against every feasible combination
    val all = for {
      k <- 1 to 2
      combo <- (for (n <- pool; t <- 1 to i.T) yield repro.core.Seed(n.user, n.item, t)).combinations(k)
      if combo.map(s => (s.user, s.item)).distinct.size == combo.size
      if i.withinBudget(combo)
    } yield LocalDiffusion.sigma(i, combo)
    assert(math.abs(sigma - all.max) < 1e-12)
    assert(seeds.nonEmpty)
  }

  test("OPT dominates every heuristic on a tiny instance") {
    val i = tiny
    val pool = OptBruteForce.defaultPool(i, poolSize = 10) // the whole V × I
    val (_, optSigma) = OptBruteForce.run(i, pool, maxSeeds = 2)
    val dysim = LocalDiffusion.sigma(i, Dysim.run(i, TMI.Config(maxCandidates = 10)))
    val bundle = LocalDiffusion.sigma(i, BundleGRD.run(i, 5))
    val hag = HAG.run(i, 5).map(LocalDiffusion.sigma(i, _)).getOrElse(0.0)
    val ps = LocalDiffusion.sigma(i, PS.run(i, 5))
    val tol = 1e-9
    assert(optSigma + tol >= dysim, s"OPT $optSigma < Dysim $dysim")
    assert(optSigma + tol >= bundle, s"OPT $optSigma < BundleGRD $bundle")
    assert(optSigma + tol >= hag, s"OPT $optSigma < HAG $hag")
    assert(optSigma + tol >= ps, s"OPT $optSigma < PS $ps")
  }

  test("defaultPool ranks pairs by frozen spread per cost") {
    val i = tiny
    val pool = OptBruteForce.defaultPool(i, poolSize = 3)
    assert(pool.size == 3)
    // user 0 reaches two users downstream; it must appear among the top picks
    assert(pool.exists(_.user == 0))
  }

  test("OPT with an empty pool returns the empty group") {
    val i = tiny
    val (seeds, sigma) = OptBruteForce.run(i, Vector.empty, maxSeeds = 2)
    assert(seeds.isEmpty && sigma == 0.0)
  }
}
