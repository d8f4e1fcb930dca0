package repro.social

import org.apache.spark.SparkContext
import org.apache.spark.graphx.{Edge, EdgeDirection, Graph, Pregel, VertexId}

/** Maximum-influence reach, after MIOA [22]: the set of users whose best
  * influence path probability from any of a set of source users is at
  * least `theta`, where a path's probability is the product of the edge
  * influence strengths.
  *
  * Two implementations with identical semantics (agreement-tested):
  *  - [[reachLocal]] — multi-source Dijkstra over cost = −ln(p);
  *  - [[reachGraphX]] — GraphX Pregel min-plus propagation (the
  *    bulk-graph-analytics path for large social networks).
  */
object MIOA {

  /** Multi-source Dijkstra. `out(u)` lists (v, p) influence arcs u→v with
    * p ∈ (0,1]. Returns user -> best path probability (≥ theta), sources
    * included with probability 1.
    */
  def reachLocal(
      out: Array[Array[(Int, Double)]],
      sources: Seq[Int],
      theta: Double): Map[Int, Double] = {
    require(theta > 0.0, "theta must be positive (log-space costs)")
    val n = out.length
    val dist = Array.fill(n)(Double.PositiveInfinity)
    val pq = scala.collection.mutable.PriorityQueue.empty[(Double, Int)](Ordering.by(-_._1))
    val maxCost = -math.log(theta)
    sources.foreach { s => dist(s) = 0.0; pq.enqueue((0.0, s)) }
    while (pq.nonEmpty) {
      val (d, u) = pq.dequeue()
      if (d <= dist(u)) {
        var i = 0
        val nbrs = out(u)
        while (i < nbrs.length) {
          val (v, p) = nbrs(i)
          if (p > 0.0) {
            val nd = d - math.log(math.min(1.0, p))
            if (nd < dist(v) && nd <= maxCost + 1e-12) {
              dist(v) = nd
              pq.enqueue((nd, v))
            }
          }
          i += 1
        }
      }
    }
    (0 until n).iterator
      .filter(v => dist(v).isFinite && math.exp(-dist(v)) >= theta - 1e-12)
      .map(v => v -> math.exp(-dist(v)))
      .toMap
  }

  /** GraphX Pregel shortest path over −ln(p) edge costs from multiple
    * sources; same contract as [[reachLocal]].
    */
  def reachGraphX(
      sc: SparkContext,
      edges: Seq[(Int, Int, Double)],
      nUsers: Int,
      sources: Seq[Int],
      theta: Double): Map[Int, Double] = {
    require(theta > 0.0, "theta must be positive (log-space costs)")
    val src = sources.toSet
    val maxCost = -math.log(theta)
    val vertices = sc.parallelize((0 until nUsers).map { v =>
      (v.toLong: VertexId, if (src(v)) 0.0 else Double.PositiveInfinity)
    })
    val edgeRdd = sc.parallelize(edges.collect {
      case (u, v, p) if p > 0.0 => Edge(u.toLong, v.toLong, -math.log(math.min(1.0, p)))
    })
    val graph = Graph(vertices, edgeRdd)
    val sp = Pregel(graph, Double.PositiveInfinity, activeDirection = EdgeDirection.Out)(
      vprog = (_, d, msg) => math.min(d, msg),
      sendMsg = t => {
        val nd = t.srcAttr + t.attr
        if (nd < t.dstAttr && nd <= maxCost + 1e-12) Iterator((t.dstId, nd)) else Iterator.empty
      },
      mergeMsg = math.min)
    sp.vertices
      .filter { case (_, d) => d.isFinite && math.exp(-d) >= theta - 1e-12 }
      .collect()
      .iterator
      .map { case (v, d) => v.toInt -> math.exp(-d) }
      .toMap
  }

  /** Build the weighted out-adjacency used by [[reachLocal]] from an
    * instance's in-adjacency (inNbr/inAct aligned arrays).
    */
  def outAdjacency(inNbr: Array[Array[Int]], inAct: Array[Array[Double]]): Array[Array[(Int, Double)]] = {
    val n = inNbr.length
    val builders = Array.fill(n)(Array.newBuilder[(Int, Double)])
    var v = 0
    while (v < n) {
      var i = 0
      while (i < inNbr(v).length) {
        builders(inNbr(v)(i)) += ((v, inAct(v)(i)))
        i += 1
      }
      v += 1
    }
    builders.map(_.result())
  }
}
