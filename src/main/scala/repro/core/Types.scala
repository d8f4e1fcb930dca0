package repro.core

/** Whether a meta-graph describes the complementary or the substitutable
  * relationship between items (paper Sec. III, sets {m^C} and {m^S}).
  */
sealed trait RelKind { def sign: Double }
object RelKind {
  /** Complementary: adopting x raises preference for y. */
  case object Complementary extends RelKind { val sign = 1.0 }
  /** Substitutable: adopting x lowers preference for y. */
  case object Substitutable extends RelKind { val sign = -1.0 }
}

/** A seed `(u, x, t)`: item `x` is promoted from user `u` starting at the
  * t-th promotion (1-based, t ∈ [1, T]).
  */
final case class Seed(user: Int, item: Int, t: Int) {
  require(t >= 1, s"promotion round must be >= 1, got $t")
  def nominee: Nominee = Nominee(user, item)
}

/** A nominee `(u, x)`: a candidate seed whose promotion round is not yet
  * decided (assigned later by TDSI).
  */
final case class Nominee(user: Int, item: Int)

/** Constants of the closed-form factor model (DESIGN.md Sec. 4).
  *
  * Setting `eta = beta = gamma = 0` freezes all dynamics, which is exactly
  * the "frozen-probability" spread function f used by TMI's MCP and by the
  * static baselines.
  */
final case class Params(
    /** Prior mass on each meta-graph weighting. */
    w0: Double = 1.0,
    /** Weighting evidence rate: how fast co-adoptions shift meta-graph weightings. */
    eta: Double = 2.0,
    /** Preference cross-elasticity: effect of adopted complements/substitutes. */
    beta: Double = 0.6,
    /** Influence-learning rate: effect of adoption-set similarity on P_act. */
    gamma: Double = 0.4,
    /** Scale of the extra-adoption probability P_ext. */
    extraScale: Double = 0.5,
    /** Weighted-cascade base influence: baseAct = min(actBase, actScale/indeg). */
    actScale: Double = 1.2,
    actBase: Double = 0.4,
    /** Hard cap on the dynamic P_act (keeps 1 - p > 0 for log-space products). */
    actCap: Double = 0.9,
    /** Max mean-field steps per promotion. */
    maxSteps: Int = 8,
    /** Stop a promotion's steps once the largest adoption delta is below this. */
    eps: Double = 1e-4) {
  require(actCap < 1.0 && actCap > 0.0, "actCap must be in (0,1)")
  require(maxSteps >= 1, "maxSteps must be >= 1")

  /** The frozen variant: no perception/preference/influence updates. */
  def frozen: Params = copy(eta = 0.0, beta = 0.0, gamma = 0.0)
}

/** A driver-local IMDPP instance: everything the diffusion engines and the
  * seed-selection algorithms consume.
  *
  * Users and items are dense 0-based ints. Meta-graph relevance matrices
  * `metaS(m)(x)(y) = s(x,y|m)` are symmetric with zero diagonal. `inNbr`
  * and `inAct` are aligned: `inAct(v)(i)` is the base influence strength of
  * `inNbr(v)(i)` on `v`. Built from Spark DataFrames by
  * [[repro.data.InstanceBuilder]]; small enough for the driver by design
  * (DESIGN.md Sec. 6).
  */
final case class ProblemInstance(
    nUsers: Int,
    nItems: Int,
    itemNames: Vector[String],
    importance: Array[Double],
    inNbr: Array[Array[Int]],
    inAct: Array[Array[Double]],
    outNbr: Array[Array[Int]],
    basePref: Array[Array[Double]],
    metaKinds: Vector[RelKind],
    metaS: Vector[Array[Array[Double]]],
    cost: Array[Array[Double]],
    budget: Double,
    T: Int,
    params: Params) {
  require(importance.length == nItems, "importance must have nItems entries")
  require(inNbr.length == nUsers && inAct.length == nUsers && outNbr.length == nUsers)
  require(basePref.length == nUsers && cost.length == nUsers)
  require(metaS.length == metaKinds.length, "one relevance matrix per meta-graph")
  require(T >= 1, "at least one promotion")

  /** Indices of complementary meta-graphs. */
  val cMeta: Vector[Int] = metaKinds.zipWithIndex.collect { case (RelKind.Complementary, i) => i }

  /** Indices of substitutable meta-graphs. */
  val sMeta: Vector[Int] = metaKinds.zipWithIndex.collect { case (RelKind.Substitutable, i) => i }

  val nMeta: Int = metaKinds.length

  /** Sparse (x, y, s) pair list per meta-graph with x < y and s > 0 —
    * the hot loops of both diffusion engines iterate these instead of the
    * dense matrices.
    */
  val metaPairs: Vector[Array[(Int, Int, Double)]] = metaS.map { m =>
    val b = Array.newBuilder[(Int, Int, Double)]
    var x = 0
    while (x < nItems) {
      var y = x + 1
      while (y < nItems) {
        if (m(x)(y) > 0.0) b += ((x, y, m(x)(y)))
        y += 1
      }
      x += 1
    }
    b.result()
  }

  /** Sparse neighbor lists per meta-graph: `metaNbrs(m)(x)` lists (y, s)
    * with s(x,y|m) > 0 — symmetric expansion of [[metaPairs]] used by the
    * extra-adoption inner loop.
    */
  lazy val metaNbrs: Vector[Array[Array[(Int, Double)]]] = metaPairs.map { pairs =>
    val builders = Array.fill(nItems)(Array.newBuilder[(Int, Double)])
    pairs.foreach { case (x, y, s) => builders(x) += ((y, s)); builders(y) += ((x, s)) }
    builders.map(_.result())
  }

  def totalCost(seeds: Iterable[Seed]): Double =
    seeds.iterator.map(s => cost(s.user)(s.item)).sum

  def withinBudget(seeds: Iterable[Seed]): Boolean = totalCost(seeds) <= budget + 1e-9

  def withParams(p: Params): ProblemInstance = copy(params = p)
  def withBudget(b: Double): ProblemInstance = copy(budget = b)
  def withT(t: Int): ProblemInstance = copy(T = t)

  def inDegree(v: Int): Int = inNbr(v).length
  def outDegree(u: Int): Int = outNbr(u).length
}
