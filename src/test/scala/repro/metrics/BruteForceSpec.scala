package repro.metrics

import org.scalatest.funsuite.AnyFunSuite
import repro.TestGraphs
import repro.core.{Edge, S5P}
import repro.gen.GraphGen

class BruteForceSpec extends AnyFunSuite {

  test("triangle on k=3 with cap 1: optimum is 2 replicas per vertex") {
    // 3 edges, cap=1 ⇒ each edge in its own partition ⇒ every vertex in 2.
    val tri = IndexedSeq(Edge(0, 1), Edge(1, 2), Edge(2, 0))
    val (rf, assign) = BruteForce.minReplicationFactor(tri, 3)
    assert(rf == 2.0)
    assert(assign.distinct.length == 3)
  }

  test("two disjoint edges, k=2: optimum RF is 1") {
    val g = IndexedSeq(Edge(0, 1), Edge(2, 3))
    val (rf, _) = BruteForce.minReplicationFactor(g, 2)
    assert(rf == 1.0)
  }

  test("matches naive exhaustive enumeration on random tiny graphs") {
    for (seed <- 1 to 4) {
      val g = GraphGen.smallConnected(6, 8, seed)
      val k = 3
      val cap = math.ceil(8.0 / k).toLong
      // Naive k^m enumeration under the same cap.
      var best = Double.MaxValue
      val m = g.length
      def rf(assign: Array[Int]): Double = Metrics.replicationFactor(g, assign)
      val assign = new Array[Int](m)
      def loop(i: Int): Unit = {
        if (i == m) {
          val loads = Metrics.loads(assign, k)
          if (loads.forall(_ <= cap)) best = math.min(best, rf(assign))
        } else for (p <- 0 until k) { assign(i) = p; loop(i + 1) }
      }
      loop(0)
      val (got, gotAssign) = BruteForce.minReplicationFactor(g, k)
      assert(math.abs(got - best) < 1e-12, s"seed=$seed got=$got naive=$best")
      val gotLoads = Metrics.loads(gotAssign, k)
      assert(gotLoads.forall(_ <= cap))
    }
  }

  test("optimum respects the balance cap") {
    val g = GraphGen.smallConnected(7, 12, 42)
    val (rf, assign) = BruteForce.minReplicationFactor(g, 4)
    val cap = math.ceil(12.0 / 4).toLong
    assert(Metrics.loads(assign, 4).forall(_ <= cap))
    assert(rf >= 1.0)
  }

  test("optimum lower-bounds every heuristic (Table 5 sanity)") {
    for ((n, m, seed) <- Seq((7, 12, 101), (8, 15, 102), (10, 12, 103))) {
      val g = GraphGen.smallConnected(n, m, seed)
      val k = 4
      val (opt, _) = BruteForce.minReplicationFactor(g, k)
      val s5p = S5P().partition(g, TestGraphs.ctx(g, k, tau = 1.0))
      val rf = Metrics.replicationFactor(g, s5p.pids)
      assert(opt <= rf + 1e-12, s"($n,$m): opt=$opt, S5P=$rf")
    }
  }

  test("rejects graphs that are too large") {
    val g = GraphGen.rmat(100, 30, 1)
    intercept[IllegalArgumentException] { BruteForce.minReplicationFactor(g, 4) }
  }
}
