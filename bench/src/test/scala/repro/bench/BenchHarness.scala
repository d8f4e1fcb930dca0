package repro.bench

import java.nio.file.{Files, Paths, StandardOpenOption}
import repro.core.{ProblemInstance, Seed, TMI, Dysim}
import repro.baselines.{BundleGRD, HAG, PS}
import repro.diffusion.LocalDiffusion

/** Shared machinery of the per-table benchmark suites: timing, table
  * formatting, result persistence (bench/results/<table>.txt), and the
  * uniform algorithm runners.
  *
  * Every algorithm is '''evaluated''' by the same evaluator — the full
  * dynamic mean-field simulator ([[LocalDiffusion.sigma]]) — so the
  * comparison measures seed quality, never evaluator differences.
  */
object BenchHarness {

  final case class AlgoRun(name: String, sigma: Double, millis: Long, nSeeds: Int, timedOut: Boolean = false)

  def timeMs[A](f: => A): (A, Long) = {
    val t0 = System.nanoTime()
    val r = f
    (r, (System.nanoTime() - t0) / 1000000L)
  }

  /** Run one algorithm end to end (selection + timing + evaluation). */
  def runAlgo(name: String, inst: ProblemInstance)(select: ProblemInstance => Option[Vector[Seed]]): AlgoRun = {
    val (seedsOpt, ms) = timeMs(select(inst))
    seedsOpt match {
      case Some(seeds) => AlgoRun(name, LocalDiffusion.sigma(inst, seeds), ms, seeds.size)
      case None        => AlgoRun(name, 0.0, ms, 0, timedOut = true)
    }
  }

  /** The standard four contenders of Figs. 5-6. */
  def contenders(
      inst: ProblemInstance,
      poolUsers: Int,
      hagTimeoutMs: Long = 120000L,
      dysimCfg: TMI.Config = null): Vector[AlgoRun] = {
    val cfg = Option(dysimCfg).getOrElse(TMI.Config(maxCandidates = poolUsers))
    Vector(
      runAlgo("Dysim", inst)(i => Some(Dysim.run(i, cfg))),
      runAlgo("BundleGRD", inst)(i => Some(BundleGRD.run(i, poolUsers))),
      runAlgo("HAG", inst)(i => HAG.run(i, poolUsers, hagTimeoutMs)),
      runAlgo("PS", inst)(i => Some(PS.run(i, poolUsers))))
  }

  /** Fixed-width table for stdout + the results file. */
  def formatTable(title: String, header: Seq[String], rows: Seq[Seq[String]]): String = {
    val all = header +: rows
    val widths = header.indices.map(i => all.map(_(i).length).max)
    def fmt(r: Seq[String]) = r.zip(widths).map { case (c, w) => c.padTo(w, ' ') }.mkString("  ")
    val sep = widths.map("-" * _).mkString("  ")
    (Seq(s"== $title ==", fmt(header), sep) ++ rows.map(fmt)).mkString("\n") + "\n"
  }

  /** Print and persist a table under bench/results/. */
  def report(fileName: String, text: String): Unit = {
    println(text)
    val dir = Paths.get(sys.props.getOrElse("bench.results.dir", "results"))
    Files.createDirectories(dir)
    Files.write(dir.resolve(fileName), text.getBytes("UTF-8"),
      StandardOpenOption.CREATE, StandardOpenOption.TRUNCATE_EXISTING)
  }

  def f1(d: Double): String = f"$d%.1f"
  def f2(d: Double): String = f"$d%.2f"
}
