package repro.core

import repro.crowd.{CrowdModel, ModelState}
import repro.estimator.PopulationEstimator
import repro.indoor.Point
import scala.collection.mutable

/** Unified crowd-aware path search — Algorithm 3 (Search) + Algorithm 4
  * (Expand). Handles both FPQ and LCPQ via the [[Cost]] ordering, and any
  * population-derivation strategy via the injected [[PopulationEstimator]]
  * (exact local = `*PQ`, exact global = `*PQ-G`, PP = `*PQ-PP`, NT =
  * `*PQ-NT`).
  *
  * Search nodes are doors plus the two virtual endpoints. Each stamp carries
  * the partition entered through its door (Alg. 3 line 13) so the next
  * expansion knows which partition to traverse. Populations are derived
  * lazily: a segment's cost at arrival time `t^a` reads the population over
  * the grid interval covering `t^a`, and the estimator derives (and
  * memoizes) everything that lookup needs — this is Alg. 3 lines 15–18.
  */
object Search {

  sealed trait Node
  case object Src                 extends Node
  case object Tgt                 extends Node
  final case class D(door: Int)   extends Node

  /** Per-query instrumentation. `memKB` is the paper's memory metric,
    * modeled as retained bytes of the search/estimation bookkeeping
    * (derived population records, flow records, stamps, settled set) —
    * see DESIGN.md §5.5.
    */
  final case class Stats(
      millis: Double,
      popDerivations: Long,
      flowDerivations: Long,
      pushes: Long,
      queuePeak: Int,
      settled: Int,
  ) {
    def memKB: Double =
      (popDerivations * 24.0 + flowDerivations * 48.0 + pushes * 72.0 + settled * 16.0) / 1024.0
    def +(o: Stats): Stats = Stats(
      millis + o.millis, popDerivations + o.popDerivations, flowDerivations + o.flowDerivations,
      pushes + o.pushes, math.max(queuePeak, o.queuePeak), settled + o.settled)
  }

  final case class Result(path: Vector[Node], cost: Cost, found: Boolean, stats: Stats) {
    /** Door id sequence, for path-equality (hit-rate) comparison. */
    def doorSeq: Vector[Int] = path.collect { case D(d) => d }
  }

  private final case class Stamp(node: Node, cost: Cost, entered: Int)

  /** Run the search from an indoor point. `maxGrid` caps how far populations
    * are derived (the horizon); `tq` is the query time (absolute, ≥ model.t0).
    */
  def run(
      estimator: PopulationEstimator,
      ps: Point,
      pt: Point,
      tq: Double,
      qt: QueryType,
      maxGrid: Int = 5000,
  ): Result = runFrom(estimator, Left(ps), pt, tq, qt, maxGrid)

  /** Run the search from either an indoor point (Left) or a door the walker
    * currently stands at together with the partition just entered (Right) —
    * the latter is what the adaptive baseline re-plans from at every node.
    */
  def runFrom(
      estimator: PopulationEstimator,
      start: Either[Point, (Int, Int)],
      pt: Point,
      tq: Double,
      qt: QueryType,
      maxGrid: Int = 5000,
  ): Result = {
    val t0ns            = System.nanoTime()
    val model: CrowdModel = estimator.model
    val state: ModelState = estimator.state
    val space           = model.space
    val ord             = Cost.ordering(qt)
    implicit val stampOrd: Ordering[Stamp] = Ordering.by[Stamp, Cost](_.cost)(ord).reverse

    val hostT = space.host(pt)
    // For a door start, hostS is unused; -1 marks "not a point start".
    val hostS = start.fold(space.host, _ => -1)

    val queue   = mutable.PriorityQueue.empty[Stamp]
    val best    = mutable.HashMap.empty[Node, Cost]
    val prev    = mutable.HashMap.empty[Node, Node]
    val settled = mutable.HashSet.empty[Node]
    var pushes  = 0L
    var peak    = 0

    def push(s: Stamp, from: Node): Unit = {
      if (best.get(s.node).forall(b => ord.lt(s.cost, b))) {
        best(s.node) = s.cost
        prev(s.node) = from
        queue.enqueue(s)
        pushes += 1
        peak = math.max(peak, queue.size)
      }
    }

    def segCost(vk: Int, dist: Double, arrivalG: Int): Option[Cost] =
      if (!dist.isFinite) None
      else Some(CostFunctions.segmentCost(model, vk, dist, estimator.populationAt(vk, arrivalG)))

    def stats(): Stats =
      Stats((System.nanoTime() - t0ns) / 1e6, state.popDerivations, state.flowDerivations, pushes, peak, settled.size)

    start match {
      case Left(_)             => push(Stamp(Src, Cost.Zero, hostS), Src)
      case Right((door, vIn))  => push(Stamp(D(door), Cost.Zero, vIn), Src)
    }

    var result: Option[Result] = None
    while (result.isEmpty && queue.nonEmpty) {
      val s = queue.dequeue()
      if (!settled.contains(s.node)) {
        settled += s.node
        if (s.node == Tgt) {
          // GetPath: walk prev from Tgt back to Src
          val pathBuf = mutable.ListBuffer.empty[Node]
          var cur: Node = Tgt
          while (cur != Src) { pathBuf.prepend(cur); cur = prev(cur) }
          pathBuf.prepend(Src)
          result = Some(Result(pathBuf.toVector, s.cost, found = true, stats()))
        } else {
          val arrivalG = math.min(maxGrid, model.gridStep(tq + s.cost.time))
          s.node match {
            case Src =>
              val ps = start.swap.getOrElse(sys.error("Src stamp without a point start"))
              if (hostS == hostT)
                segCost(hostS, ps.dist(pt), arrivalG).foreach(c => push(Stamp(Tgt, c, hostT), Src))
              space.leaveDoors(hostS).foreach { dj =>
                val entered = space.linksFrom((hostS, dj)).map(_.to).min
                segCost(hostS, space.pointToDoor(ps, dj), arrivalG)
                  .foreach(c => push(Stamp(D(dj), c, entered), Src))
              }
            case D(di) =>
              val v = s.entered
              // Alg. 3 lines 19–20: expansion towards p_t when d_i can enter its host
              if (space.enterDoors(hostT).contains(di))
                segCost(hostT, space.doors(di).pos.dist(pt), arrivalG)
                  .foreach(c => push(Stamp(Tgt, s.cost + c, hostT), s.node))
              // Alg. 3 lines 21–22: every unvisited leaveable door of v
              space.leaveDoors(v).foreach { dj =>
                if (!settled.contains(D(dj))) {
                  val entered = space.linksFrom((v, dj)).map(_.to).filter(_ != v) match {
                    case Seq()   => space.linksFrom((v, dj)).map(_.to).min
                    case nonSelf => nonSelf.min
                  }
                  segCost(v, space.doorDist(v, di, dj), arrivalG)
                    .foreach(c => push(Stamp(D(dj), s.cost + c, entered), s.node))
                }
              }
            case Tgt => () // handled above
          }
        }
      }
    }
    result.getOrElse(Result(Vector.empty, Cost(Double.PositiveInfinity, Double.PositiveInfinity, Double.PositiveInfinity), found = false, stats()))
  }
}
