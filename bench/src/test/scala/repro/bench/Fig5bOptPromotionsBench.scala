package repro.bench

import repro.SparkSpec
import repro.baselines.OptBruteForce
import repro.data.{DatasetGen, InstanceBuilder}

/** Table T-5b (paper Fig. 5(b)): importance-aware influence vs the number
  * of promotions T on the 100-user Amazon sample, vs OPT.
  *
  * Paper's qualitative result: Dysim's influence grows with T (it times
  * complementary promotions) and stays closest to OPT; the baselines
  * barely benefit from more promotions.
  */
class Fig5bOptPromotionsBench extends SparkSpec {
  import BenchHarness._

  test("T-5b: sigma vs number of promotions vs OPT (amazon-small)") {
    val ts = Seq(1, 2, 3, 4)
    val rows = ts.map { t =>
      val inst = InstanceBuilder.build(spark, DatasetGen.amazonSmall(budget = 4.0, t = t))
      val pool = OptBruteForce.defaultPool(inst, poolSize = 10)
      val (_, optSigma) = OptBruteForce.run(inst, pool, maxSeeds = 3)
      val runs = contenders(inst, poolUsers = 200)
      Seq(t.toString, f2(optSigma)) ++ runs.map(r => if (r.timedOut) "timeout" else f2(r.sigma))
    }
    val text = formatTable(
      "T-5b: importance-aware influence vs #promotions (amazon-small, 100 users, b=4)",
      Seq("T", "OPT", "Dysim", "BundleGRD", "HAG", "PS"),
      rows)
    report("T5b.txt", text)
    rows.foreach(r => assert(r.drop(1).forall(c => c == "timeout" || c.toDouble >= 0.0)))
  }
}
