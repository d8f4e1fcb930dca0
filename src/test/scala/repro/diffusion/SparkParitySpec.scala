package repro.diffusion

import repro.{SparkSpec, TestInstances}
import repro.core.{Params, Seed}

/** The Spark engine and the local engine implement one semantics: every
  * test here runs the same campaign through both and diffs the final
  * adoption matrix, the weightings, and σ.
  */
class SparkParitySpec extends SparkSpec {

  private def assertParity(inst: repro.core.ProblemInstance, seeds: Seq[Seed], tol: Double = 1e-6): Unit = {
    val local = LocalDiffusion.run(inst, seeds)
    val sp = SparkDiffusion.run(spark, inst, seeds)
    for (v <- 0 until inst.nUsers; x <- 0 until inst.nItems)
      assert(math.abs(local.a(v)(x) - sp.a(v)(x)) < tol,
        s"adoption mismatch at (u=$v, x=$x): local=${local.a(v)(x)} spark=${sp.a(v)(x)}")
    for (v <- 0 until inst.nUsers; m <- 0 until inst.nMeta)
      assert(math.abs(local.w(v)(m) - sp.w(v)(m)) < tol,
        s"weight mismatch at (u=$v, m=$m): local=${local.w(v)(m)} spark=${sp.w(v)(m)}")
    val sigL = LocalDiffusion.sigmaOf(inst, local)
    val sigS = LocalDiffusion.sigmaOf(inst, sp)
    assert(math.abs(sigL - sigS) < tol * inst.nUsers * inst.nItems, s"sigma: $sigL vs $sigS")
  }

  // every instance is capped at few steps/rounds: with the multi-round
  // re-diffusion semantics each promotion runs its full step budget on the
  // Spark engine, so step caps keep the iterative DataFrame fixpoint short
  test("parity on the 3-user line (full dynamics)") {
    assertParity(TestInstances.line3.withParams(Params(maxSteps = 3)).withT(2), Seq(Seed(0, 0, 1)))
  }

  test("parity with multi-round seeds and complements") {
    assertParity(
      TestInstances.line3.withParams(Params(maxSteps = 3)).withT(2),
      Seq(Seed(0, 0, 1), Seed(0, 1, 2)))
  }

  test("parity with frozen dynamics") {
    val inst = TestInstances.line3.withParams(Params().frozen.copy(maxSteps = 3)).withT(1)
    assertParity(inst, Seq(Seed(0, 0, 1)))
  }

  test("parity on a random instance with substitutes (seeded trials)") {
    val inst0 = TestInstances.random(1L, nUsers = 10, nItems = 4, nEdges = 24)
    val inst = inst0.withParams(inst0.params.copy(maxSteps = 3))
    assertParity(inst, Seq(Seed(0, 0, 1), Seed(1, 1, 2)))
  }

  test("parity with converging multi-step propagation") {
    // a hub pushing to 4 users, then a second tier
    val inst = TestInstances.mk(
      nUsers = 7, nItems = 3,
      edges = Seq((0, 1), (0, 2), (0, 3), (0, 4), (1, 5), (2, 5), (3, 6)),
      metaS = Vector(
        TestInstances.sym(3)((0, 1, 0.9), (1, 2, 0.4)),
        TestInstances.sym(3)((0, 2, 0.7))),
      t = 2,
      params = Params(maxSteps = 3))
    assertParity(inst, Seq(Seed(0, 0, 1), Seed(0, 2, 2)))
  }

  test("spark sigma helper equals local sigma") {
    val inst = TestInstances.line3.withParams(Params(maxSteps = 3)).withT(1)
    val seeds = Seq(Seed(0, 0, 1))
    val s1 = SparkDiffusion.sigma(spark, inst, seeds)
    val s2 = LocalDiffusion.sigma(inst, seeds)
    assert(math.abs(s1 - s2) < 1e-6)
  }
}
