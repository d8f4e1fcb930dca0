package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.core.{Dysim, TMI}
import repro.data.InstanceBuilder
import repro.diffusion.{LocalDiffusion, SparkDiffusion}

/** spark-submit entrypoint: select seeds with Dysim, then evaluate the
  * campaign on BOTH diffusion engines — the driver-local reference and the
  * Spark DataFrame fixpoint — and report the two σ values (they must
  * agree; the parity suite enforces this in CI).
  *
  * Usage: RunCampaign [dataset=amazon-small] [budget=4] [T=3]
  */
object RunCampaign {
  def main(args: Array[String]): Unit = {
    val name = args.lift(0).getOrElse("amazon-small")
    val budget = args.lift(1).map(_.toDouble).getOrElse(4.0)
    val t = args.lift(2).map(_.toInt).getOrElse(3)
    val spark = SparkSession.builder.appName(s"campaign-$name").master(
      sys.env.getOrElse("SPARK_MASTER", "local[*]")).getOrCreate()
    try {
      val inst = InstanceBuilder.build(spark, RunDysim.dataset(name, budget, t))
      val seeds = Dysim.run(inst, TMI.Config(maxCandidates = 200))
      println(s"seeds: ${seeds.sortBy(s => (s.t, s.user)).mkString(", ")}")
      val localSigma = LocalDiffusion.sigma(inst, seeds)
      val sparkSigma = SparkDiffusion.sigma(spark, inst, seeds)
      println(f"sigma(local engine) = $localSigma%.4f")
      println(f"sigma(spark engine) = $sparkSigma%.4f")
      println(f"|diff| = ${math.abs(localSigma - sparkSigma)}%.6f")
    } finally spark.stop()
  }
}
