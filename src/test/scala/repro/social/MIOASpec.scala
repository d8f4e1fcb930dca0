package repro.social

import repro.SparkSpec

class MIOASpec extends SparkSpec {

  /** A weighted diamond: 0 -> 1 -> 3 (0.5 * 0.5) and 0 -> 2 -> 3 (0.9 * 0.9). */
  private val diamond = Seq((0, 1, 0.5), (0, 2, 0.9), (1, 3, 0.5), (2, 3, 0.9))

  private def outAdj(edges: Seq[(Int, Int, Double)], n: Int): Array[Array[(Int, Double)]] = {
    val b = Array.fill(n)(Array.newBuilder[(Int, Double)])
    edges.foreach { case (u, v, p) => b(u) += ((v, p)) }
    b.map(_.result())
  }

  test("local: best path probability is the max product path") {
    val reach = MIOA.reachLocal(outAdj(diamond, 4), Seq(0), theta = 0.01)
    assert(math.abs(reach(3) - 0.81) < 1e-9) // via node 2, not 0.25 via node 1
    assert(math.abs(reach(2) - 0.9) < 1e-9)
    assert(reach(0) == 1.0)
  }

  test("local: theta cuts off weak paths") {
    val reach = MIOA.reachLocal(outAdj(diamond, 4), Seq(0), theta = 0.85)
    assert(reach.keySet == Set(0, 2))
  }

  test("local: multi-source takes the best source") {
    val edges = Seq((0, 2, 0.2), (1, 2, 0.8))
    val reach = MIOA.reachLocal(outAdj(edges, 3), Seq(0, 1), theta = 0.1)
    assert(math.abs(reach(2) - 0.8) < 1e-9)
  }

  test("local: unreachable nodes are absent") {
    val edges = Seq((0, 1, 0.5))
    val reach = MIOA.reachLocal(outAdj(edges, 4), Seq(0), theta = 0.1)
    assert(!reach.contains(2) && !reach.contains(3))
  }

  test("local: zero-probability arcs are ignored") {
    val edges = Seq((0, 1, 0.0))
    val reach = MIOA.reachLocal(outAdj(edges, 2), Seq(0), theta = 0.1)
    assert(!reach.contains(1))
  }

  test("GraphX Pregel agrees with local Dijkstra on the diamond") {
    val local = MIOA.reachLocal(outAdj(diamond, 4), Seq(0), theta = 0.01)
    val gx = MIOA.reachGraphX(spark.sparkContext, diamond, 4, Seq(0), theta = 0.01)
    assert(gx.keySet == local.keySet)
    gx.foreach { case (v, p) => assert(math.abs(p - local(v)) < 1e-9, s"node $v") }
  }

  test("GraphX Pregel agrees with local Dijkstra on random graphs") {
    val rnd = new scala.util.Random(17)
    for (trial <- 1 to 3) {
      val n = 25
      val edges = (0 until 120).map(_ =>
        (rnd.nextInt(n), rnd.nextInt(n), 0.1 + 0.8 * rnd.nextDouble()))
        .filter { case (a, b, _) => a != b }
        .distinctBy(e => (e._1, e._2))
      val srcs = Seq(rnd.nextInt(n), rnd.nextInt(n)).distinct
      val local = MIOA.reachLocal(outAdj(edges, n), srcs, theta = 0.05)
      val gx = MIOA.reachGraphX(spark.sparkContext, edges, n, srcs, theta = 0.05)
      assert(gx.keySet == local.keySet, s"trial $trial")
      gx.foreach { case (v, p) => assert(math.abs(p - local(v)) < 1e-9, s"trial $trial node $v") }
    }
  }

  test("outAdjacency inverts the in-adjacency representation") {
    val inNbr = Array(Array.empty[Int], Array(0), Array(0, 1))
    val inAct = Array(Array.empty[Double], Array(0.4), Array(0.2, 0.3))
    val out = MIOA.outAdjacency(inNbr, inAct)
    assert(out(0).toSet == Set((1, 0.4), (2, 0.2)))
    assert(out(1).toSet == Set((2, 0.3)))
    assert(out(2).isEmpty)
  }

  test("theta must be positive") {
    assertThrows[IllegalArgumentException](MIOA.reachLocal(outAdj(diamond, 4), Seq(0), 0.0))
  }
}
