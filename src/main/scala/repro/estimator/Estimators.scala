package repro.estimator

import repro.crowd.{CrowdModel, EdgeKey, ModelState}
import scala.collection.mutable

/** A time-evolving population estimator (Section 4): given a partition and a
  * grid step, returns the partition's (estimated) population over that unit
  * time interval. Derivations are memoized in the shared [[ModelState]], so
  * repeated lookups during one query are free and instrumented exactly once.
  */
trait PopulationEstimator {
  def state: ModelState
  def model: CrowdModel = state.model
  def name: String

  /** Population of partition v over grid interval g (g=0 is the latest
    * known population `P_{t_l}`).
    */
  def populationAt(v: Int, g: Int): Double
}

/** Algorithm 1 — PopulationGlobal. Advances the whole model one grid step at
  * a time: assign every edge its expected flow (λ at report steps, else 0),
  * rectify each partition's outflows against its current population
  * (Figure 4), then apply Eq. 6 to every partition.
  */
final class GlobalEstimator(val state: ModelState) extends PopulationEstimator {
  val name = "global"
  private val space      = model.space
  private var derivedUpTo = 0
  // per-partition out/in edge indices, precomputed once
  private val outIdx: Array[Array[Int]] = Array.tabulate(space.numPartitions)(v =>
    space.outLinks(v).map(l => state.edgeIndex(EdgeKey(l.from, l.to, l.door))).toArray)
  private val inIdx: Array[Array[Int]] = Array.tabulate(space.numPartitions)(v =>
    space.inLinks(v).map(l => state.edgeIndex(EdgeKey(l.from, l.to, l.door))).toArray)

  def populationAt(v: Int, g: Int): Double = {
    if (g <= 0) return model.initialPop(v)
    ensure(g)
    state.getPopRaw(v, g)
  }

  private def ensure(gTarget: Int): Unit = {
    val nEdges = model.edges.size
    while (derivedUpTo < gTarget) {
      val g = derivedUpTo + 1
      var ei = 0
      while (ei < nEdges) {
        state.putFlowRaw(ei, g, model.expectedFlow(model.edges(ei), g))
        ei += 1
      }
      var v = 0
      while (v < space.numPartitions) {
        val pPrev = if (g == 1) model.initialPop(v) else state.getPopRaw(v, g - 1)
        val outs  = outIdx(v)
        var outSum = 0.0
        var i      = 0
        while (i < outs.length) { outSum += state.getFlowRaw(outs(i), g); i += 1 }
        if (outSum > pPrev && outSum > 0) {
          val scale = pPrev / outSum
          i = 0
          while (i < outs.length) {
            state.putFlowRaw(outs(i), g, state.getFlowRaw(outs(i), g) * scale); i += 1
          }
        }
        state.markOutDone(v, g)
        v += 1
      }
      v = 0
      while (v < space.numPartitions) {
        val pPrev = if (g == 1) model.initialPop(v) else state.getPopRaw(v, g - 1)
        var outSum = 0.0
        var i      = 0
        val outs   = outIdx(v)
        while (i < outs.length) { outSum += state.getFlowRaw(outs(i), g); i += 1 }
        var inSum = 0.0
        i = 0
        val ins = inIdx(v)
        while (i < ins.length) { inSum += state.getFlowRaw(ins(i), g); i += 1 }
        state.putPop(v, g, math.max(0.0, pPrev - outSum + inSum))
        v += 1
      }
      derivedUpTo = g
    }
  }
}

/** Algorithm 2 — PopulationLocal — and its Strategy-PP variant.
  *
  * Derives a single partition's population forward step by step. At each
  * step, the partition's own outflows are set from the flow functions and
  * rectified against its previous population; inflows are obtained by
  * recursively deriving each upstream partition's (rectified) outflows when
  * `exactUpstream` is true, or taken directly from the flow functions when
  * false (Strategy PP: "Population Derivation for Partial Partitions" — the
  * single-line change to Alg. 2's line 20 described in Section 5.2).
  *
  * All intermediate flows/populations are memoized in [[ModelState]], so
  * shared upstream work across lookups is never repeated.
  */
final class LocalEstimator(val state: ModelState, exactUpstream: Boolean) extends PopulationEstimator {
  val name          = if (exactUpstream) "local" else "pp"
  private val space = model.space
  // highest contiguously-derived step per partition — O(1) repeat lookups
  private val derivedUpTo = new Array[Int](space.numPartitions)
  private val outIdx: Array[Array[Int]] = Array.tabulate(space.numPartitions)(v =>
    space.outLinks(v).map(l => state.edgeIndex(EdgeKey(l.from, l.to, l.door))).toArray)
  private val inIdx: Array[Array[Int]] = Array.tabulate(space.numPartitions)(v =>
    space.inLinks(v).map(l => state.edgeIndex(EdgeKey(l.from, l.to, l.door))).toArray)
  private val inSrc: Array[Array[Int]] = Array.tabulate(space.numPartitions)(v =>
    space.inLinks(v).map(_.from).toArray)

  def populationAt(v: Int, g: Int): Double = {
    if (g <= 0) return model.initialPop(v)
    var gg = derivedUpTo(v) + 1
    while (gg <= g) {
      if (!state.hasPop(v, gg)) step(v, gg)
      gg += 1
    }
    if (g > derivedUpTo(v)) derivedUpTo(v) = g
    state.getPopRaw(v, g)
  }

  private def prevPop(v: Int, g: Int): Double =
    if (g == 1) model.initialPop(v) else populationAt(v, g - 1)

  /** Set and rectify v's outflows at step g (idempotent). */
  private def ensureOut(v: Int, g: Int): Unit = {
    if (!state.markOutDone(v, g)) return
    val pPrev  = prevPop(v, g)
    val outs   = outIdx(v)
    var outSum = 0.0
    var i      = 0
    while (i < outs.length) {
      val ei = outs(i)
      val f =
        if (state.hasFlow(ei, g)) state.getFlowRaw(ei, g)
        else { val x = model.expectedFlow(model.edges(ei), g); state.putFlowRaw(ei, g, x); x }
      outSum += f
      i += 1
    }
    if (outSum > pPrev && outSum > 0) {
      val scale = pPrev / outSum
      i = 0
      while (i < outs.length) {
        state.putFlowRaw(outs(i), g, state.getFlowRaw(outs(i), g) * scale); i += 1
      }
    }
  }

  private def step(v: Int, g: Int): Unit = {
    val pPrev = prevPop(v, g)
    ensureOut(v, g)
    var inSum = 0.0
    val ins   = inIdx(v)
    var i     = 0
    while (i < ins.length) {
      val ei = ins(i)
      if (!state.hasFlow(ei, g)) {
        if (exactUpstream) ensureOut(inSrc(v)(i), g) // recursion into the upstream cone
        else state.putFlowRaw(ei, g, model.expectedFlow(model.edges(ei), g)) // Strategy PP
      }
      inSum += state.getFlowRaw(ei, g)
      i += 1
    }
    var outSum = 0.0
    val outs   = outIdx(v)
    i = 0
    while (i < outs.length) { outSum += state.getFlowRaw(outs(i), g); i += 1 }
    state.putPop(v, g, math.max(0.0, pPrev - outSum + inSum))
  }
}

/** Crowd-free estimator: every partition is empty, so ρ is a constant and
  * the search degenerates to a plain shortest-(distance) path. Used for
  * query-instance generation (the s2t control) and reduction tests.
  */
final class ZeroEstimator(val state: ModelState) extends PopulationEstimator {
  val name                                 = "zero"
  def populationAt(v: Int, g: Int): Double = 0.0
}

/** Freezes another estimator at a fixed grid step, making all edge weights
  * time-independent (snapshot mode) — used to cross-validate the Pregel
  * search against driver Dijkstra, where both are provably optimal.
  */
final class FrozenEstimator(inner: PopulationEstimator, gFixed: Int) extends PopulationEstimator {
  val name                                 = s"frozen@$gFixed"
  val state: ModelState                    = inner.state
  def populationAt(v: Int, g: Int): Double = inner.populationAt(v, gFixed)
}

/** Strategy NT — "Population Derivation at Necessary Timestamps" — layered
  * on top of Strategy PP as in the paper. If the std-dev σ of a partition's
  * historical flow differences is below η, its population at the arrival
  * step is extrapolated directly via Eq. 7; otherwise the PP derivation runs.
  */
final class NTEstimator(inner: LocalEstimator, eta: Double = 3.0) extends PopulationEstimator {
  val name                   = "nt"
  val state: ModelState      = inner.state
  private val cache          = mutable.HashMap.empty[(Int, Int), Double]

  def populationAt(v: Int, g: Int): Double =
    cache.getOrElseUpdate(
      (v, g), {
        val (mu, sigma) = model.historyStats(v)
        if (sigma < eta) {
          state.popDerivations += 1
          val est = model.initialPop(v) + mu * model.updateStepsBetween(v, 0, g)
          math.max(0.0, est)
        } else inner.populationAt(v, g)
      },
    )
}
