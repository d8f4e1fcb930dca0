package repro.bench

import repro.SparkSpec
import repro.core.{Dysim, TMI}
import repro.data.{DatasetGen, InstanceBuilder}
import repro.diffusion.LocalDiffusion

/** Table T-6h (paper Fig. 6(h)): Dysim's execution time across datasets
  * ordered by social-network size.
  *
  * Paper's qualitative result: time grows with the number of users AND the
  * number of items (item-impact propagation) — Gowalla and Amazon land
  * close despite different user counts.
  */
class Fig6ScalabilityBench extends SparkSpec {
  import BenchHarness._

  test("T-6h: Dysim execution time across the four lite datasets") {
    val rows = DatasetGen.allLite(budget = 10.0, t = 5).map { cfg =>
      val inst = InstanceBuilder.build(spark, cfg)
      val (seeds, ms) = timeMs(Dysim.run(inst, TMI.Config(maxCandidates = 200)))
      val sigma = LocalDiffusion.sigma(inst, seeds)
      assert(seeds.nonEmpty && inst.withinBudget(seeds))
      Seq(cfg.name, inst.nUsers.toString, inst.nItems.toString, ms.toString, f1(sigma), seeds.size.toString)
    }
    report("T6h.txt", formatTable(
      "T-6h: Dysim execution time across datasets (b=10, T=5)",
      Seq("dataset", "users", "items", "dysim-ms", "sigma", "seeds"),
      rows))
  }
}
