package repro.bench

import repro.SparkSpec
import repro.data.{DatasetGen, InstanceBuilder}

/** Tables T-6ef and T-6g (paper Figs. 6(e-f), 6(g)): importance-aware
  * influence and execution time vs the number of promotions T on two lite
  * datasets.
  *
  * Paper's qualitative results: Dysim grows markedly with T (TMI orders
  * markets, TDSI times nominees) while the baselines plateau, especially
  * for T >= 20; Dysim's timing search is pruned so its runtime barely
  * grows with T, whereas the CR-Greedy-scheduled baselines suffer.
  */
class Fig6PromotionsBench extends SparkSpec {
  import BenchHarness._

  test("T-6ef/T-6g: sigma and time vs #promotions (amazon-lite, douban-lite)") {
    val sigmaRows = scala.collection.mutable.ArrayBuffer.empty[Seq[String]]
    val timeRows = scala.collection.mutable.ArrayBuffer.empty[Seq[String]]
    Seq(DatasetGen.amazonLite(budget = 10.0), DatasetGen.doubanLite(budget = 10.0)).foreach { cfg0 =>
      // T sweep capped at 10 for wall-clock (the growth-vs-plateau contrast
      // is established well before the paper's T=40 tail)
      val ts = Seq(1, 2, 5, 10)
      ts.foreach { t =>
        val cfg = cfg0.copy(T = t)
        val inst = InstanceBuilder.build(spark, cfg)
        val runs = contenders(inst, poolUsers = 200, hagTimeoutMs = 240000L)
        println(s"[T6] ${cfg.name} T=$t: " +
          runs.map(r => s"${r.name}=${if (r.timedOut) "timeout" else f1(r.sigma)}(${r.millis}ms)").mkString(" "))
        sigmaRows += (Seq(cfg.name, t.toString) ++ runs.map(r => if (r.timedOut) "timeout" else f1(r.sigma)))
        timeRows += (Seq(cfg.name, t.toString) ++ runs.map(r => if (r.timedOut) "timeout" else r.millis.toString))
      }
    }
    val names = Seq("dataset", "T", "Dysim", "BundleGRD", "HAG", "PS")
    report("T6ef.txt", formatTable(
      "T-6ef: importance-aware influence vs #promotions (b=10)", names, sigmaRows.toSeq))
    report("T6g.txt", formatTable(
      "T-6g: execution time (ms) vs #promotions (b=10)", names, timeRows.toSeq))
  }
}
