package repro

import repro.core.{Params, ProblemInstance, RelKind}
import scala.util.Random

/** Hand-crafted and randomized [[ProblemInstance]]s for unit and property
  * tests (no Spark needed — the instance is the driver-local form).
  */
object TestInstances {

  /** Symmetric zero-diagonal relevance matrix from sparse (x, y, s) pairs. */
  def sym(n: Int)(pairs: (Int, Int, Double)*): Array[Array[Double]] = {
    val m = Array.fill(n, n)(0.0)
    pairs.foreach { case (x, y, s) => require(x != y); m(x)(y) = s; m(y)(x) = s }
    m
  }

  /** Build an instance from an explicit edge list; uniform base influence
    * `act`, uniform cost, importance 1 unless overridden.
    */
  def mk(
      nUsers: Int,
      nItems: Int,
      edges: Seq[(Int, Int)],
      metaKinds: Vector[RelKind] = Vector(RelKind.Complementary, RelKind.Substitutable),
      metaS: Vector[Array[Array[Double]]] = null,
      act: Double = 0.3,
      basePref: (Int, Int) => Double = (_, _) => 0.3,
      importance: Int => Double = _ => 1.0,
      cost: (Int, Int) => Double = (_, _) => 1.0,
      budget: Double = 10.0,
      t: Int = 3,
      params: Params = Params()): ProblemInstance = {
    val inB = Array.fill(nUsers)(Vector.newBuilder[Int])
    val outB = Array.fill(nUsers)(Vector.newBuilder[Int])
    edges.foreach { case (s, d) => inB(d) += s; outB(s) += d }
    val inNbr = inB.map(_.result().toArray)
    val outNbr = outB.map(_.result().toArray)
    val ms =
      if (metaS != null) metaS
      else metaKinds.map(_ => Array.fill(nItems, nItems)(0.0))
    ProblemInstance(
      nUsers = nUsers,
      nItems = nItems,
      itemNames = (0 until nItems).map(i => s"i$i").toVector,
      importance = Array.tabulate(nItems)(importance),
      inNbr = inNbr,
      inAct = inNbr.map(_.map(_ => act)),
      outNbr = outNbr,
      basePref = Array.tabulate(nUsers, nItems)(basePref),
      metaKinds = metaKinds,
      metaS = ms,
      cost = Array.tabulate(nUsers, nItems)(cost),
      budget = budget,
      T = t,
      params = params)
  }

  /** A 3-user directed line 0 → 1 → 2 with 2 items; item 0 and 1 are
    * complements with relevance 0.8.
    */
  def line3: ProblemInstance = mk(
    nUsers = 3,
    nItems = 2,
    edges = Seq((0, 1), (1, 2)),
    metaS = Vector(sym(2)((0, 1, 0.8)), Array.fill(2, 2)(0.0)))

  /** Random small instance for property tests: random digraph, random
    * sparse relevance on C and S meta-graphs.
    */
  def random(seed: Long, nUsers: Int = 12, nItems: Int = 5, nEdges: Int = 30): ProblemInstance = {
    val rnd = new Random(seed)
    val edges = (0 until nEdges)
      .map(_ => (rnd.nextInt(nUsers), rnd.nextInt(nUsers)))
      .filter { case (a, b) => a != b }
      .distinct
    val kinds = Vector(RelKind.Complementary, RelKind.Complementary, RelKind.Substitutable)
    val mats = kinds.map { _ =>
      val m = Array.fill(nItems, nItems)(0.0)
      (0 until nItems).combinations(2).foreach { case Seq(x, y) =>
        if (rnd.nextDouble() < 0.5) { val s = rnd.nextDouble(); m(x)(y) = s; m(y)(x) = s }
      }
      m
    }
    mk(
      nUsers = nUsers,
      nItems = nItems,
      edges = edges,
      metaKinds = kinds,
      metaS = mats,
      act = 0.2 + 0.3 * rnd.nextDouble(),
      basePref = (u, x) => 0.1 + 0.5 * new Random(seed * 31 + u * 7 + x).nextDouble(),
      t = 2,
      params = Params(maxSteps = 4))
  }
}
