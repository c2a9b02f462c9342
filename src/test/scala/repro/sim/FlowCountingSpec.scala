package repro.sim

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.testutil.TestModels

class FlowCountingSpec extends SparkSpec {

  private lazy val space = TestModels.mini()
  private lazy val traj  = TrajectoryGen.generate(spark, space, nObjects = 60, span = 1200,
    dropRate = 0.12, seed = 31, recordsPerObject = 40).cache()
  private lazy val pairs = FlowCounting.consecutivePairs(traj).cache()

  test("trajectories look like positioning data: in-bounds, time-ordered per object") {
    import spark.implicits._
    val recs = traj.as[TrajectoryGen.Rec].collect()
    assert(recs.nonEmpty)
    recs.foreach { r =>
      val p = space.partitions(r.part)
      assert(p.rect.contains(r.x, r.y), s"record $r outside its partition")
      assert(r.floor == p.floor)
    }
    recs.groupBy(_.obj).foreach { case (_, rs) =>
      rs.sortBy(_.t).sliding(2).foreach {
        case Array(a, b) => assert(a.t < b.t)
        case _           => ()
      }
    }
  }

  test("consecutive pairs: count is records minus one per object (Oracle-checked)") {
    val expectedSql =
      "SELECT CAST(obj AS BIGINT) AS obj, CAST(COUNT(*) - 1 AS BIGINT) AS pairs " +
      "FROM recs GROUP BY obj HAVING COUNT(*) > 1"
    val got = pairs.groupBy("obj").agg(count(lit(1)).as("pairs"))
    Oracle.assertEquivalent(got, expectedSql, "recs" -> traj)
  }

  test("a realistic fraction of pairs is topologically disconnected (~12%)") {
    val frac = FlowCounting.disconnectedFraction(spark, space, pairs)
    assert(frac > 0.03 && frac < 0.30, s"disconnected fraction $frac")
  }

  test("sub-path probabilities are a distribution and prefer shorter paths") {
    // find a disconnected transition in this space: two rooms two hops apart
    val a = space.partitions.find(p => !p.isStairway).get.id
    val twoHop = (for {
      l1 <- space.outLinks(a)
      l2 <- space.outLinks(l1.to)
      if l2.to != a && space.outLinks(a).forall(_.to != l2.to)
    } yield l2.to).headOption
    assert(twoHop.isDefined, "mini space should have a 2-hop pair")
    val paths = FlowCounting.subPaths(space, a, twoHop.get)
    assert(paths.nonEmpty)
    val probSum = paths.map(_._2).sum
    assert(math.abs(probSum - 1.0) < 1e-9)
    paths.foreach { case (doors, p) => assert(p > 0 && doors.nonEmpty) }
    // monotone: if multiple paths, a shorter one never has lower probability
    if (paths.size > 1) {
      val withLen = paths.map { case (ds, p) =>
        val len = if (ds.size < 2) 1.0
          else ds.sliding(2).map { case Seq((d1, _, mid), (d2, _, _)) =>
            math.max(1.0, space.doorDist(mid, d1, d2)) }.sum
        (len, p)
      }.sortBy(_._1)
      withLen.sliding(2).foreach {
        case Seq((l1, p1), (l2, p2)) => if (l1 < l2) assert(p1 >= p2 - 1e-12)
        case _                       => ()
      }
    }
  }

  test("sub-paths longer than twice the shortest are excluded") {
    val a = 0
    val b = space.outLinks(space.outLinks(a).head.to).head.to
    val paths = FlowCounting.subPaths(space, a, b)
    if (paths.size > 1) {
      val lens = paths.map { case (ds, _) =>
        if (ds.size < 2) 1.0
        else ds.sliding(2).map { case Seq((d1, _, mid), (d2, _, _)) =>
          math.max(1.0, space.doorDist(mid, d1, d2)) }.sum
      }
      assert(lens.max <= 2 * lens.min + 1e-9)
    }
  }

  test("adjacent transitions contribute probability-1 crossings at the right door") {
    import spark.implicits._
    val cross = FlowCounting.crossings(spark, space, pairs).cache()
    val adjacentPairs = pairs.as[FlowCounting.PairRow].collect()
      .filter(p => p.p1 != p.p2 && space.outLinks(p.p1).exists(_.to == p.p2))
    assert(adjacentPairs.nonEmpty)
    val crossings = cross.collect()
    // every crossing references a real directed link
    crossings.foreach { c =>
      assert(space.links.exists(l => l.door == c.door && l.from == c.src && l.to == c.dst), s"bad crossing $c")
      assert(c.prob > 0 && c.prob <= 1.0 + 1e-9)
    }
  }

  test("total crossing probability mass equals (adjacent pairs) + (resolved disconnected pairs)") {
    import spark.implicits._
    val cross = FlowCounting.crossings(spark, space, pairs)
    val prs   = pairs.as[FlowCounting.PairRow].collect().filter(p => p.p1 != p.p2)
    val resolvedMass = prs.map { p =>
      if (space.outLinks(p.p1).exists(_.to == p.p2)) 1.0
      else {
        val sp = FlowCounting.subPaths(space, p.p1, p.p2)
        if (sp.isEmpty) 0.0 else sp.map { case (ds, prob) => prob * ds.size }.sum
      }
    }.sum
    val crossMass = cross.collect().map(_.prob).sum
    assert(math.abs(crossMass - resolvedMass) < 1e-6)
  }

  test("windowed flows aggregate crossings per 10s window (Oracle-checked)") {
    val cross = FlowCounting.crossings(spark, space, pairs).toDF()
    val flows = FlowCounting.windowedFlows(FlowCounting.crossings(spark, space, pairs))
    val sql =
      "SELECT CAST(door AS INT) AS door, CAST(src AS INT) AS src, CAST(dst AS INT) AS dst, " +
      "CAST(FLOOR(CAST(t AS DOUBLE) / 10.0) AS BIGINT) AS win, SUM(CAST(prob AS DOUBLE)) AS flow " +
      "FROM crossings GROUP BY 1, 2, 3, 4"
    Oracle.assertEquivalent(flows, sql, "crossings" -> cross)
  }

  test("fitted λ are non-negative and scale linearly with the scale factor") {
    val flows = FlowCounting.windowedFlows(FlowCounting.crossings(spark, space, pairs))
    val l1    = FlowCounting.fitLambdas(flows, nWindows = 120, scale = 1.0)
    val l50   = FlowCounting.fitLambdas(flows, nWindows = 120, scale = 50.0)
    assert(l1.nonEmpty)
    l1.foreach { case (e, v) =>
      assert(v >= 0)
      assert(math.abs(l50(e) - 50.0 * v) < 1e-9)
    }
  }

  test("end-to-end small pipeline builds a valid crowd model") {
    val built = RealDataPipeline.build(spark, nObjects = 60, span = 1200, scale = 10.0,
      seed = 31, spaceOverride = Some(space))
    assert(built.records > 0)
    assert(built.disconnectedFraction > 0.0 && built.disconnectedFraction < 0.5)
    val m = built.model
    assert(m.space.numPartitions == space.numPartitions)
    m.lambda.values.foreach(v => assert(v >= 0))
    m.initialPop.zipWithIndex.foreach { case (p, v) =>
      assert(p >= 0 && p <= m.capacity(v) + 1e-9)
    }
    assert(m.historyNet.size == space.numPartitions)
    // the built model must be usable by the full search stack
    val ps = space.partitions(0).rect.interiorPoint(0.5, 0.5, 0)
    val pt = space.partitions(12).rect.interiorPoint(0.5, 0.5, 0)
    val res = repro.core.Search.run(
      new repro.estimator.LocalEstimator(new repro.crowd.ModelState(m), exactUpstream = true),
      ps, pt, 0.0, repro.core.QueryType.FPQ)
    assert(res.found)
  }
}
