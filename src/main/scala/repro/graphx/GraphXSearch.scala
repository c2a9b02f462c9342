package repro.graphx

import org.apache.spark.graphx.{Edge, EdgeTriplet, Graph, VertexId}
import org.apache.spark.sql.SparkSession
import repro.core.{Cost, CostFunctions, QueryType}
import repro.crowd.CrowdModel
import repro.indoor.Point

/** FPQ/LCPQ as a Pregel label-correcting computation over the door-level
  * traversal graph.
  *
  * Vertices are doors plus two virtual endpoints; an edge (d_i → d_j, v)
  * exists when a partition v can be entered through d_i and left through
  * d_j (the same expansions Algorithm 3 performs). Edge weights are
  * time-dependent: a label arriving at d_i with elapsed time `t` crosses v
  * at the population of the grid interval covering `t_q + t`, read from a
  * broadcast population timeline (produced by the global estimator — the
  * distributed one in [[GraphXEstimator]] or the sequential Algorithm 1).
  *
  * Bellman–Ford-style relaxation converges to the cost-minimal label per
  * vertex even when crowd evolution makes the network non-FIFO (where
  * Dijkstra can be slightly suboptimal), so tests assert the Pregel cost is
  * never worse than the driver search's, with exact agreement on static
  * (snapshot / crowd-free) weights.
  */
object GraphXSearch {

  final case class Result(cost: Cost, found: Boolean)

  private val Inf = Cost(Double.PositiveInfinity, Double.PositiveInfinity, Double.PositiveInfinity)

  /** @param popTimeline pops(g)(v); arrival steps beyond the last row clamp
    *                    to it. A single-row timeline freezes the crowd
    *                    (snapshot mode).
    */
  def run(
      spark: SparkSession,
      model: CrowdModel,
      popTimeline: Array[Array[Double]],
      ps: Point,
      pt: Point,
      tq: Double,
      qt: QueryType,
  ): Result = {
    val sc    = spark.sparkContext
    val space = model.space
    val hostS = space.host(ps)
    val hostT = space.host(pt)
    val srcId: VertexId = space.numDoors.toLong
    val tgtId: VertexId = space.numDoors.toLong + 1

    val popsB = sc.broadcast(popTimeline)
    val ord   = Cost.ordering(qt)

    // (partition, dist) per traversal edge
    val edgeList = Vector.newBuilder[Edge[(Int, Double)]]
    for (v <- 0 until space.numPartitions; di <- space.enterDoors(v); dj <- space.leaveDoors(v) if di != dj) {
      val dist = space.doorDist(v, di, dj)
      if (dist.isFinite) edgeList += Edge(di.toLong, dj.toLong, (v, dist))
    }
    for (dj <- space.leaveDoors(hostS)) {
      val dist = space.pointToDoor(ps, dj)
      if (dist.isFinite) edgeList += Edge(srcId, dj.toLong, (hostS, dist))
    }
    for (di <- space.enterDoors(hostT)) {
      val dist = space.doors(di).pos.dist(pt)
      if (dist.isFinite) edgeList += Edge(di.toLong, tgtId, (hostT, dist))
    }
    if (hostS == hostT) {
      val dist = ps.dist(pt)
      if (dist.isFinite) edgeList += Edge(srcId, tgtId, (hostS, dist))
    }

    val vertices = sc.parallelize((0L to tgtId).map(id => (id, if (id == srcId) Cost.Zero else Inf)))
    val graph    = Graph(vertices, sc.parallelize(edgeList.result()))

    val modelB = sc.broadcast(model)
    def relax(triplet: EdgeTriplet[Cost, (Int, Double)]): Iterator[(VertexId, Cost)] = {
      val src = triplet.srcAttr
      if (!src.time.isFinite) Iterator.empty
      else {
        val (v, dist) = triplet.attr
        val m         = modelB.value
        val pops      = popsB.value
        val g         = math.min(pops.length - 1, m.gridStep(tq + src.time))
        val cand      = src + CostFunctions.segmentCost(m, v, dist, pops(g)(v))
        if (ord.lt(cand, triplet.dstAttr)) Iterator((triplet.dstId, cand)) else Iterator.empty
      }
    }

    val res = graph.pregel(Inf)(
      vprog = (_, attr, msg) => ord.min(attr, msg),
      sendMsg = relax,
      mergeMsg = (a, b) => ord.min(a, b),
    )
    val tgtCost = res.vertices.filter(_._1 == tgtId).map(_._2).collect().head
    res.unpersist(blocking = false)
    popsB.destroy()
    modelB.destroy()
    Result(tgtCost, tgtCost.time.isFinite)
  }
}
