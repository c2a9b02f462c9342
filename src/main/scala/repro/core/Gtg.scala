package repro.core

import repro.estimator.PopulationEstimator
import repro.indoor.Point
import scala.collection.mutable

/** Baseline `*PQ-GTG`: search over a *general time-dependent graph* where
  * doors are vertices and every intra-partition door-to-door hop is an edge
  * (Section 6.1.1, Appendix A). All doors are treated as bidirectional
  * (GTG cannot express door directionality), so for each partition with k
  * doors there are k·(k−1) directed edges — far more than the crowd model's
  * per-door edges, which is exactly why this baseline is slow.
  *
  * As in the paper, it is Dijkstra without precomputation (the adjacency is
  * materialized per query, and that cost is part of the measured time) and
  * uses the same exact population estimator, so its *results* match the
  * exact searches.
  */
object Gtg {

  def run(
      estimator: PopulationEstimator,
      ps: Point,
      pt: Point,
      tq: Double,
      qt: QueryType,
      maxGrid: Int = 5000,
  ): Search.Result = {
    val t0ns  = System.nanoTime()
    val model = estimator.model
    val space = model.space
    val ord   = Cost.ordering(qt)

    // Materialize the GTG adjacency: door -> (nextDoor, viaPartition, dist).
    val adj = Array.fill(space.numDoors)(Vector.empty[(Int, Int, Double)])
    var gtgEdges = 0L
    for (v <- 0 until space.numPartitions) {
      val ds = space.allDoors(v)
      for (di <- ds; dj <- ds if di != dj) {
        val dist = space.doorDist(v, di, dj)
        if (dist.isFinite) { adj(di) :+= ((dj, v, dist)); gtgEdges += 1 }
      }
    }

    val hostS = space.host(ps)
    val hostT = space.host(pt)

    // `via` is the partition crossed to reach the node: the next edge must
    // not cross it again (one does not U-turn mid-partition), matching the
    // crowd-model search's "enterable partition minus previous partition".
    final case class Stamp(node: Search.Node, cost: Cost, via: Int)
    implicit val stampOrd: Ordering[Stamp] = Ordering.by[Stamp, Cost](_.cost)(ord).reverse
    val queue   = mutable.PriorityQueue.empty[Stamp]
    val best    = mutable.HashMap.empty[Search.Node, Cost]
    val prev    = mutable.HashMap.empty[Search.Node, Search.Node]
    val settled = mutable.HashSet.empty[Search.Node]
    var pushes  = 0L
    var peak    = 0

    def push(node: Search.Node, cost: Cost, from: Search.Node, via: Int): Unit =
      if (best.get(node).forall(b => ord.lt(cost, b))) {
        best(node) = cost; prev(node) = from
        queue.enqueue(Stamp(node, cost, via)); pushes += 1; peak = math.max(peak, queue.size)
      }

    def seg(vk: Int, dist: Double, g: Int): Option[Cost] =
      if (!dist.isFinite) None
      else Some(CostFunctions.segmentCost(model, vk, dist, estimator.populationAt(vk, g)))

    def stats(): Search.Stats = {
      val s = Search.Stats(
        (System.nanoTime() - t0ns) / 1e6,
        estimator.state.popDerivations,
        estimator.state.flowDerivations,
        // the materialized GTG adjacency is retained for the whole query —
        // charge it to the memory metric alongside the stamps
        pushes + gtgEdges / 3,
        peak,
        settled.size,
      )
      s
    }

    push(Search.Src, Cost.Zero, Search.Src, -1)
    var result: Option[Search.Result] = None
    while (result.isEmpty && queue.nonEmpty) {
      val s = queue.dequeue()
      if (!settled.contains(s.node)) {
        settled += s.node
        val g = math.min(maxGrid, model.gridStep(tq + s.cost.time))
        s.node match {
          case Search.Tgt =>
            val pathBuf = mutable.ListBuffer.empty[Search.Node]
            var cur: Search.Node = Search.Tgt
            while (cur != Search.Src) { pathBuf.prepend(cur); cur = prev(cur) }
            pathBuf.prepend(Search.Src)
            result = Some(Search.Result(pathBuf.toVector, s.cost, found = true, stats()))
          case Search.Src =>
            if (hostS == hostT)
              seg(hostS, ps.dist(pt), g).foreach(c => push(Search.Tgt, c, Search.Src, hostS))
            space.allDoors(hostS).foreach { dj =>
              seg(hostS, space.pointToDoor(ps, dj), g).foreach(c => push(Search.D(dj), c, Search.Src, hostS))
            }
          case Search.D(di) =>
            if (space.allDoors(hostT).contains(di))
              seg(hostT, space.doors(di).pos.dist(pt), g)
                .foreach(c => push(Search.Tgt, s.cost + c, s.node, hostT))
            adj(di).foreach { case (dj, v, dist) =>
              if (v != s.via && !settled.contains(Search.D(dj)))
                seg(v, dist, g).foreach(c => push(Search.D(dj), s.cost + c, s.node, v))
            }
        }
      }
    }
    result.getOrElse(
      Search.Result(Vector.empty, Cost(Double.PositiveInfinity, Double.PositiveInfinity, Double.PositiveInfinity), found = false, stats()))
  }
}
