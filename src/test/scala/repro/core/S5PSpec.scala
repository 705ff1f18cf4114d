package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.TestGraphs
import repro.metrics.Metrics

class S5PSpec extends AnyFunSuite {

  private def validAssignment(stream: IndexedSeq[Edge], k: Int,
                              pids: Array[Int]): Unit = {
    assert(pids.length == stream.length, "every edge assigned exactly once")
    assert(pids.forall(p => p >= 0 && p < k), "partition ids in range")
  }

  for (k <- Seq(2, 3, 4, 8)) {
    test(s"toy graph k=$k: valid assignment, hard balance, RF sane") {
      val ctx = TestGraphs.ctx(TestGraphs.toy, k, tau = 1.0)
      val res = S5P().partition(TestGraphs.toy, ctx)
      validAssignment(TestGraphs.toy, k, res.pids)
      val cap = math.ceil(TestGraphs.toy.length / k.toDouble).toLong
      assert(Metrics.loads(res.pids, k).forall(_ <= cap))
      val rf = Metrics.replicationFactor(TestGraphs.toy, res.pids)
      assert(rf >= 1.0 && rf <= k.toDouble)
    }
  }

  for ((name, stream) <- Seq("rmat" -> TestGraphs.rmatSmall,
                             "community" -> TestGraphs.communitySmall);
       k <- Seq(4, 16)) {
    test(s"$name k=$k: valid, balanced within τ=1.0, RF ≥ 1") {
      val ctx = TestGraphs.ctx(stream, k, tau = 1.0)
      val res = S5P().partition(stream, ctx)
      validAssignment(stream, k, res.pids)
      assert(Metrics.loadBalance(res.pids, k) <=
        k.toDouble * math.ceil(stream.length / k.toDouble) / stream.length + 1e-9)
      assert(Metrics.replicationFactor(stream, res.pids) >= 1.0)
    }
  }

  test("S5P beats HDRF on the community-structured graph (the paper's headline)") {
    val stream = TestGraphs.communitySmall
    val k = 16
    val s5p = S5P(tau = 1.05).partition(stream, TestGraphs.ctx(stream, k))
    val hdrf = repro.partitioners.HDRF().partition(stream, TestGraphs.ctx(stream, k))
    val rfS = Metrics.replicationFactor(stream, s5p.pids)
    val rfH = Metrics.replicationFactor(stream, hdrf.pids)
    assert(rfS < rfH, s"S5P=$rfS vs HDRF=$rfH")
  }

  test("S5P exploits community structure: low RF on the web-like graph") {
    val stream = TestGraphs.communitySmall
    val k = 8
    val res = S5P().partition(stream, TestGraphs.ctx(stream, k, tau = 1.0))
    val rf = Metrics.replicationFactor(stream, res.pids)
    assert(rf < 3.0, s"expected community graph RF well below hash-level, got $rf")
  }

  test("deterministic across runs") {
    val stream = TestGraphs.rmatTiny
    val ctx = TestGraphs.ctx(stream, 4, tau = 1.0)
    val a = S5P().partition(stream, ctx)
    val b = S5P().partition(stream, ctx)
    assert(a.pids.sameElements(b.pids))
  }

  test("CMS and exact-Θ variants produce near-identical RF (Fig. 9 claim)") {
    val stream = TestGraphs.communitySmall
    val ctx = TestGraphs.ctx(stream, 8, tau = 1.0)
    val withCms = S5P(useCms = true).partition(stream, ctx)
    val exact = S5P(useCms = false).partition(stream, ctx)
    val rfC = Metrics.replicationFactor(stream, withCms.pids)
    val rfE = Metrics.replicationFactor(stream, exact.pids)
    assert(math.abs(rfC - rfE) / rfE < 0.15, s"cms=$rfC exact=$rfE")
  }

  test("CMS variant uses less game state than the exact variant on a big-Θ graph") {
    val stream = TestGraphs.communitySmall
    val stats = TestGraphs.localStats(stream)
    val clustering = SkewClustering.cluster(stream, stats, 64) // small κ ⇒ many clusters
    val cms = GameInput.build(stream, stats, clustering, useCms = true)
    val exact = GameInput.build(stream, stats, clustering, useCms = false)
    assert(cms.thetaStateBytes <= exact.thetaStateBytes,
      s"cms=${cms.thetaStateBytes} exact=${exact.thetaStateBytes}")
  }

  test("two-stage beats or matches one-stage on skewed input (Fig. 7d)") {
    val stream = TestGraphs.rmatSmall
    val ctx = TestGraphs.ctx(stream, 16, tau = 1.0)
    val two = S5P(twoStage = true).partition(stream, ctx)
    val one = S5P(twoStage = false).partition(stream, ctx)
    val rf2 = Metrics.replicationFactor(stream, two.pids)
    val rf1 = Metrics.replicationFactor(stream, one.pids)
    assert(rf2 <= rf1 * 1.10, s"two-stage=$rf2 one-stage=$rf1")
  }

  test("parallel game path produces a valid, balanced assignment") {
    val stream = TestGraphs.communitySmall
    val ctx = TestGraphs.ctx(stream, 8, tau = 1.0)
    val res = S5P(threads = 4, batchSize = 16).partition(stream, ctx)
    validAssignment(stream, 8, res.pids)
    val cap = math.ceil(stream.length / 8.0).toLong
    assert(Metrics.loads(res.pids, 8).forall(_ <= cap))
  }

  test("edge-level ablation (w/o clustering) runs and is valid on a tiny graph") {
    val stream = TestGraphs.rmatTiny
    val ctx = TestGraphs.ctx(stream, 4)
    val res = S5P(clusterLevel = false).partition(stream, ctx)
    validAssignment(stream, 4, res.pids)
  }

  test("cluster-level game yields lower RF than edge-level game (Fig. 7c)") {
    val stream = TestGraphs.rmatTiny
    val ctx = TestGraphs.ctx(stream, 8, tau = 1.0)
    val withC = S5P().partition(stream, ctx)
    val without = S5P(clusterLevel = false).partition(stream, ctx)
    val rfW = Metrics.replicationFactor(stream, withC.pids)
    val rfO = Metrics.replicationFactor(stream, without.pids)
    assert(rfW <= rfO, s"with=$rfW without=$rfO")
  }

  test("S5P-B: valid assignment (no balance cap by construction)") {
    val stream = TestGraphs.rmatTiny
    val ctx = TestGraphs.ctx(stream, 4)
    val res = S5P(bounded = true).partition(stream, ctx)
    validAssignment(stream, 4, res.pids)
  }

  test("Theorem 2: S5P-B RF obeys the closed-form bound") {
    val stream = TestGraphs.rmatSmall
    val stats = TestGraphs.localStats(stream)
    val k = 8
    val res = S5P(bounded = true).partition(stream, TestGraphs.ctx(stream, k))
    val rf = Metrics.replicationFactor(stream, res.pids)
    import scala.jdk.CollectionConverters._
    val degrees = stats.degrees.values().asScala.map(_.toInt).toArray
    val bound = theorem2Bound(degrees, stats, k)
    assert(rf <= bound, s"rf=$rf bound=$bound")
  }

  test("Theorem 3: the Theorem-2 bound decreases with ρ (more skew, lower bound)") {
    val stream = TestGraphs.rmatSmall
    val stats = TestGraphs.localStats(stream)
    import scala.jdk.CollectionConverters._
    val degrees = stats.degrees.values().asScala.map(_.toInt).toArray
    val b1 = theorem2BoundAtRho(degrees, stats, 8, rho = 2.0)
    val b2 = theorem2BoundAtRho(degrees, stats, 8, rho = 2.8)
    assert(b1 <= b2, s"bound(ρ=2.0)=$b1 should be ≤ bound(ρ=2.8)=$b2")
  }

  /** Equation (8) with the graph's fitted ρ. */
  private def theorem2Bound(degrees: Array[Int], stats: GraphStats, k: Int): Double = {
    val rho = math.max(1.05, repro.metrics.Skewness.regressionRho(degrees))
    theorem2BoundAtRho(degrees, stats, k, rho)
  }

  private def theorem2BoundAtRho(degrees: Array[Int], stats: GraphStats,
                                 k: Int, rho: Double): Double = {
    val xi = stats.avgDegree
    val nv = degrees.length
    val chiT = degrees.count(_ <= xi).toDouble / nv
    val chiH = 1.0 - chiT
    val dm = math.max(1, degrees.min).toDouble
    val nT = math.max(1, (chiT * nv).toInt)
    val tail = (1 to nT).map { i =>
      dm * math.pow(math.pow((k - 1) / dm, 1.0 - rho) + (i - 1.0) / nv, -1.0)
    }.sum / nT
    chiH * k + tail + 1.0
  }
}
