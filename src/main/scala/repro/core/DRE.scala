package repro.core

/** Phase 2 of Dysim — Dynamic Reachability Evaluation (Sec. IV-B.2,
  * Eqs. 1, 3, 4): given the average complementary/substitutable relevance
  * matrices over a target market's users (after the promotions of S^G),
  * rank items by DR = PI + RI.
  *
  * The likelihoods L^C = r̄C/(r̄C+r̄S) and L^S = r̄S/(r̄C+r̄S) weight the
  * signed preference impact; the recursions propagate item impact up to
  * the market diameter d.
  */
object DRE {

  /** Items y "relevant to x": r̄C(x,y) + r̄S(x,y) > 0. */
  private def neighbors(rC: Array[Array[Double]], rS: Array[Array[Double]], x: Int): IndexedSeq[Int] =
    rC.indices.filter(y => y != x && rC(x)(y) + rS(x)(y) > 0.0)

  /** Signed single-edge impact term with importance weight w:
    * L^C·r̄C·w − L^S·r̄S·w = w·(r̄C² − r̄S²)/(r̄C + r̄S).
    */
  def edgeTerm(rC: Double, rS: Double, w: Double): Double = {
    val denom = rC + rS
    if (denom <= 0.0) 0.0 else w * (rC * rC - rS * rS) / denom
  }

  /** Proactive impact table: pi(x)(d) for d in 0..dMax (Eq. 3),
    * pi(x)(0) = 0, pi(x)(d) = Σ_{y~x} [edgeTerm(x,y,w_y) + pi(y)(d−1)].
    */
  def piTable(
      rC: Array[Array[Double]],
      rS: Array[Array[Double]],
      importance: Array[Double],
      dMax: Int): Array[Array[Double]] = {
    val n = rC.length
    val nbrs = Array.tabulate(n)(x => neighbors(rC, rS, x))
    val base = Array.tabulate(n)(x => nbrs(x).iterator.map(y => edgeTerm(rC(x)(y), rS(x)(y), importance(y))).sum)
    val pi = Array.fill(n, dMax + 1)(0.0)
    var d = 1
    while (d <= dMax) {
      var x = 0
      while (x < n) {
        var acc = base(x)
        nbrs(x).foreach(y => acc += pi(y)(d - 1))
        pi(x)(d) = acc
        x += 1
      }
      d += 1
    }
    pi
  }

  /** Reactive impact table with unit importance: ri1(x)(d) (Eq. 4 with
    * w_x = 1); the true RI is w_x · ri1(x)(d) since w_x enters linearly.
    */
  def riTable(rC: Array[Array[Double]], rS: Array[Array[Double]], dMax: Int): Array[Array[Double]] = {
    val n = rC.length
    val unit = Array.fill(n)(1.0)
    piTable(rC, rS, unit, dMax) // symmetric relevance ⇒ same recursion at w ≡ 1
  }

  /** Dynamic reachability DR (Eq. 1) of every item at horizon d. */
  def drAll(
      rC: Array[Array[Double]],
      rS: Array[Array[Double]],
      importance: Array[Double],
      d: Int): Array[Double] = {
    require(d >= 0, "horizon must be non-negative")
    val pi = piTable(rC, rS, importance, d)
    val ri1 = riTable(rC, rS, d)
    Array.tabulate(rC.length)(x => pi(x)(d) + importance(x) * ri1(x)(d))
  }

  /** argmax DR over a set of not-yet-promoted items (ties: lower item id). */
  def bestItem(
      rC: Array[Array[Double]],
      rS: Array[Array[Double]],
      importance: Array[Double],
      d: Int,
      candidates: Set[Int]): Int = {
    require(candidates.nonEmpty, "no candidate items")
    val dr = drAll(rC, rS, importance, d)
    candidates.toSeq.maxBy(x => (dr(x), -x))
  }
}
