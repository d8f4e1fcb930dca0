package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.TestInstances

class DRESpec extends AnyFunSuite {

  /** Reference implementation: the literal recursion of Eqs. 3/4. */
  private def piRef(
      rC: Array[Array[Double]],
      rS: Array[Array[Double]],
      w: Array[Double],
      x: Int,
      d: Int): Double =
    if (d == 0) 0.0
    else
      rC.indices.iterator
        .filter(y => y != x && rC(x)(y) + rS(x)(y) > 0.0)
        .map(y => DRE.edgeTerm(rC(x)(y), rS(x)(y), w(y)) + piRef(rC, rS, w, y, d - 1))
        .sum

  test("edgeTerm matches the paper's Example 4 arithmetic") {
    // iPad vs iPhone: rC=0.2, rS=0.4, w=1 -> (0.2*0.2 - 0.4*0.4)/0.6 = -0.2
    assert(math.abs(DRE.edgeTerm(0.2, 0.4, 1.0) - (-0.2)) < 1e-12)
    // AirPods vs iPhone: rC=0.4, rS=0, w=0.5 -> 1 * 0.4 * 0.5 = 0.2
    assert(math.abs(DRE.edgeTerm(0.4, 0.0, 0.5) - 0.2) < 1e-12)
    // pure substitutes: negative
    assert(DRE.edgeTerm(0.0, 0.5, 1.0) < 0.0)
    // no relevance at all: zero
    assert(DRE.edgeTerm(0.0, 0.0, 1.0) == 0.0)
  }

  test("piTable depth 0 is all zeros") {
    val rC = TestInstances.sym(3)((0, 1, 0.5))
    val rS = Array.fill(3, 3)(0.0)
    val pi = DRE.piTable(rC, rS, Array(1.0, 1.0, 1.0), 0)
    assert(pi.forall(_(0) == 0.0))
  }

  test("piTable equals the literal recursion (random matrices)") {
    val rnd = new scala.util.Random(5)
    for (_ <- 1 to 5) {
      val n = 4
      val rC = Array.fill(n, n)(0.0)
      val rS = Array.fill(n, n)(0.0)
      for (x <- 0 until n; y <- (x + 1) until n) {
        if (rnd.nextBoolean()) { val v = rnd.nextDouble(); rC(x)(y) = v; rC(y)(x) = v }
        if (rnd.nextBoolean()) { val v = rnd.nextDouble(); rS(x)(y) = v; rS(y)(x) = v }
      }
      val w = Array.fill(n)(rnd.nextDouble() * 2)
      val table = DRE.piTable(rC, rS, w, 3)
      for (x <- 0 until n; d <- 0 to 3)
        assert(math.abs(table(x)(d) - piRef(rC, rS, w, x, d)) < 1e-9, s"x=$x d=$d")
    }
  }

  test("RI is linear in w_x (riTable at unit importance)") {
    val rC = TestInstances.sym(3)((0, 1, 0.4), (1, 2, 0.3))
    val rS = TestInstances.sym(3)((0, 2, 0.5))
    val ri1 = DRE.riTable(rC, rS, 2)
    val unit = Array.fill(3)(1.0)
    for (x <- 0 until 3; d <- 0 to 2)
      assert(math.abs(ri1(x)(d) - piRef(rC, rS, unit, x, d)) < 1e-9)
  }

  test("drAll = PI + w_x * RI1") {
    val rC = TestInstances.sym(3)((0, 1, 0.4), (1, 2, 0.3))
    val rS = TestInstances.sym(3)((0, 2, 0.5))
    val w = Array(2.0, 1.0, 0.5)
    val dr = DRE.drAll(rC, rS, w, 2)
    val pi = DRE.piTable(rC, rS, w, 2)
    val ri1 = DRE.riTable(rC, rS, 2)
    for (x <- 0 until 3)
      assert(math.abs(dr(x) - (pi(x)(2) + w(x) * ri1(x)(2))) < 1e-12)
  }

  test("complement-only items have positive DR, substitute-only negative") {
    val rCc = TestInstances.sym(2)((0, 1, 0.6))
    val zero = Array.fill(2, 2)(0.0)
    val drC = DRE.drAll(rCc, zero, Array(1.0, 1.0), 2)
    assert(drC.forall(_ > 0.0))
    val drS = DRE.drAll(zero, rCc, Array(1.0, 1.0), 2)
    assert(drS.forall(_ < 0.0))
  }

  test("Example 2's conclusion: the well-complemented cheap item outranks the substituted one") {
    // iPhone=0, iPad=1, AirPods=2 with the Example 4 relevance around iPhone:
    // rC(iPhone,iPad)=0.2, rS=0.4; rC(iPhone,AirPods)=0.4; rC(iPad,AirPods)=0.4
    val rC = TestInstances.sym(3)((0, 1, 0.2), (0, 2, 0.4), (1, 2, 0.4))
    val rS = TestInstances.sym(3)((0, 1, 0.4))
    val w = Array(1.0, 1.0, 0.5) // W = {iPhone: 1, iPad: 1, AirPods: 0.5}
    // depth 1 = exactly the first-level terms the paper spells out:
    // DR(iPhone) = (-0.2 + 0.2) + (-0.2 + 0.4) = 0.2; DR(AirPods) = 0.8 + 0.4 = 1.2
    val dr = DRE.drAll(rC, rS, w, 1)
    assert(math.abs(dr(0) - 0.2) < 1e-9, s"iPhone DR ${dr(0)}")
    assert(math.abs(dr(2) - 1.2) < 1e-9, s"AirPods DR ${dr(2)}")
    assert(dr(2) > dr(0), s"AirPods ${dr(2)} should outrank iPhone ${dr(0)}")
    assert(DRE.bestItem(rC, rS, w, 1, Set(0, 2)) == 2)
  }

  test("bestItem tie-breaks to the lower item id") {
    val zero = Array.fill(3, 3)(0.0)
    assert(DRE.bestItem(zero, zero, Array(1.0, 1.0, 1.0), 2, Set(1, 2)) == 1)
  }

  test("bestItem requires a candidate") {
    val zero = Array.fill(2, 2)(0.0)
    assertThrows[IllegalArgumentException](DRE.bestItem(zero, zero, Array(1.0, 1.0), 1, Set.empty))
  }

  test("deeper horizons accumulate impact on a complementary chain") {
    val rC = TestInstances.sym(4)((0, 1, 0.5), (1, 2, 0.5), (2, 3, 0.5))
    val zero = Array.fill(4, 4)(0.0)
    val pi = DRE.piTable(rC, zero, Array.fill(4)(1.0), 3)
    assert(pi(0)(3) > pi(0)(2) && pi(0)(2) > pi(0)(1))
  }
}
