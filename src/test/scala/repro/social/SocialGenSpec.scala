package repro.social

import repro.SparkSpec

class SocialGenSpec extends SparkSpec {

  test("edges are deterministic in the seed") {
    val a = SocialGen.collectEdges(SocialGen.edges(spark, 50, 200, seed = 5L)).sorted
    val b = SocialGen.collectEdges(SocialGen.edges(spark, 50, 200, seed = 5L)).sorted
    assert(a == b)
  }

  test("different seeds give different graphs") {
    val a = SocialGen.collectEdges(SocialGen.edges(spark, 50, 200, seed = 5L)).sorted
    val b = SocialGen.collectEdges(SocialGen.edges(spark, 50, 200, seed = 6L)).sorted
    assert(a != b)
  }

  test("no self loops and no duplicates") {
    val edges = SocialGen.collectEdges(SocialGen.edges(spark, 40, 300, seed = 7L))
    assert(edges.forall { case (s, d) => s != d })
    assert(edges.distinct.size == edges.size)
  }

  test("all endpoints are in range") {
    val n = 30
    val edges = SocialGen.collectEdges(SocialGen.edges(spark, n, 150, seed = 8L))
    assert(edges.forall { case (s, d) => s >= 0 && s < n && d >= 0 && d < n })
  }

  test("degree distribution is skewed (power-law-ish)") {
    val n = 200
    val edges = SocialGen.collectEdges(SocialGen.edges(spark, n, 2000, seed = 9L))
    val outDeg = edges.groupBy(_._1).view.mapValues(_.size).toMap
    val degs = (0 until n).map(u => outDeg.getOrElse(u, 0))
    val maxDeg = degs.max
    val meanDeg = degs.sum.toDouble / n
    assert(maxDeg > 4 * meanDeg, s"max $maxDeg should dominate mean $meanDeg")
    // low ids (the head of the power law) should hold most of the mass
    val headMass = (0 until n / 10).map(degs).sum.toDouble / degs.sum
    assert(headMass > 0.25, s"head mass $headMass")
  }

  test("at most nEdges edges survive dedup") {
    val edges = SocialGen.collectEdges(SocialGen.edges(spark, 20, 100, seed = 10L))
    assert(edges.size <= 100 && edges.nonEmpty)
  }
}
