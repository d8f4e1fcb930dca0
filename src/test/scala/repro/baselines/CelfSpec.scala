package repro.baselines

import org.scalatest.funsuite.AnyFunSuite

class CelfSpec extends AnyFunSuite {

  /** Additive set function: f(S) = Σ value(e). Submodular (modular). */
  private def additive(values: Map[Int, Double]): Set[Int] => Double =
    s => s.iterator.map(values).sum

  test("picks the best ratio element first") {
    val values = Map(1 -> 10.0, 2 -> 3.0, 3 -> 8.0)
    val cost = Map(1 -> 5.0, 2 -> 1.0, 3 -> 2.0)
    val sel = Celf.select[Int](Vector(1, 2, 3), cost, budget = 100, additive(values))
    assert(sel.head == 3) // ratio 4 beats 3 and 2
  }

  test("respects the budget") {
    val values = Map(1 -> 10.0, 2 -> 9.0, 3 -> 8.0)
    val cost = Map(1 -> 4.0, 2 -> 4.0, 3 -> 4.0)
    val sel = Celf.select[Int](Vector(1, 2, 3), cost, budget = 8, additive(values))
    assert(sel.size == 2)
    assert(sel.map(cost).sum <= 8.0)
  }

  test("skips unaffordable elements but keeps cheaper ones") {
    val values = Map(1 -> 100.0, 2 -> 1.0)
    val cost = Map(1 -> 50.0, 2 -> 1.0)
    val sel = Celf.select[Int](Vector(1, 2), cost, budget = 10, additive(values))
    assert(sel == Vector(2))
  }

  test("stops on zero marginal gain") {
    val values = Map(1 -> 5.0, 2 -> 0.0)
    val cost = Map(1 -> 1.0, 2 -> 1.0)
    val sel = Celf.select[Int](Vector(1, 2), cost, budget = 100, additive(values))
    assert(sel == Vector(1))
  }

  test("rejects non-positive costs") {
    assertThrows[IllegalArgumentException](
      Celf.select[Int](Vector(1), Map(1 -> 0.0), 10, additive(Map(1 -> 1.0))))
  }

  test("equals eager greedy on additive functions (randomized property)") {
    for (seed <- 1L to 60L) {
      val rnd = new scala.util.Random(seed)
      val n = 2 + rnd.nextInt(6)
      val values = (0 until n).map(i => i -> rnd.nextDouble() * 10).toMap
      val cost = (0 until n).map(i => i -> (0.5 + rnd.nextDouble() * 3)).toMap
      val budget = 1.0 + rnd.nextDouble() * 6
      val celf = Celf.select[Int]((0 until n).toVector, cost, budget, additive(values))
      // eager greedy reference
      var remaining = (0 until n).toSet
      var spent = 0.0
      val eager = Vector.newBuilder[Int]
      var go = true
      while (go) {
        val afford = remaining.filter(e => cost(e) <= budget - spent + 1e-9)
        val best = afford.toSeq.sortBy(e => (-values(e) / cost(e), e)).headOption
        best match {
          case Some(e) if values(e) > 1e-9 =>
            eager += e; spent += cost(e); remaining -= e
          case _ => go = false
        }
      }
      assert(celf.toSet == eager.result().toSet, s"seed=$seed")
    }
  }

  test("on a coverage function, CELF achieves the greedy solution") {
    // elements cover user sets; f = |covered|
    val cover = Map(1 -> Set(1, 2, 3), 2 -> Set(3, 4), 3 -> Set(1, 2))
    val f: Set[Int] => Double = s => s.flatMap(cover).size.toDouble
    val sel = Celf.select[Int](Vector(1, 2, 3), Map(1 -> 1.0, 2 -> 1.0, 3 -> 1.0), 2.0, f)
    assert(sel.head == 1)
    assert(sel == Vector(1, 2), "element 3 adds nothing after 1")
  }
}
