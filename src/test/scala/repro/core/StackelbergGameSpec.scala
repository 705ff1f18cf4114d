package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.TestGraphs

class StackelbergGameSpec extends AnyFunSuite {

  private def gameInputFor(stream: IndexedSeq[Edge], k: Int, useCms: Boolean = false) = {
    val stats = TestGraphs.localStats(stream)
    val clustering = SkewClustering.cluster(stream, stats, k)
    GameInput.build(stream, stats, clustering, useCms)
  }

  test("sizes attribute every edge: Σ|c| = |E|") {
    for (stream <- Seq(TestGraphs.toy, TestGraphs.rmatTiny, TestGraphs.commTiny)) {
      val in = gameInputFor(stream, 4)
      assert(math.abs(in.size.sum - stream.length) < 1e-6)
    }
  }

  test("neighbor lists are symmetric") {
    val in = gameInputFor(TestGraphs.rmatTiny, 4)
    for (c <- 0 until in.numClusters; j <- in.nbrs(c))
      assert(in.nbrs(j).contains(c), s"asymmetric edge $c→$j")
  }

  test("exact Θ weights are positive on neighbors") {
    val in = gameInputFor(TestGraphs.rmatTiny, 4)
    for (c <- 0 until in.numClusters; j <- in.nbrs(c))
      assert(in.weightOf(c, j) > 0)
  }

  test("CMS Θ never underestimates the exact Θ") {
    val exact = gameInputFor(TestGraphs.commTiny, 4, useCms = false)
    val approx = gameInputFor(TestGraphs.commTiny, 4, useCms = true)
    assert(exact.numClusters == approx.numClusters)
    for (c <- 0 until exact.numClusters; j <- exact.nbrs(c))
      assert(approx.weightOf(c, j) >= exact.weightOf(c, j))
  }

  test("head clusters precede tail clusters in the unified id space") {
    val in = gameInputFor(TestGraphs.toy, 3)
    assert(in.numHead > 0)
    assert(in.numHead < in.numClusters)
  }

  test("Eq. 11: δ_max lies within the derived normalization range") {
    val in = gameInputFor(TestGraphs.rmatTiny, 4)
    val k = 4
    val d = StackelbergGame.delta(in, k)
    val sumSize = in.size.sum
    val lower = 1.0 / sumSize
    val upper = k * (0 until in.numClusters).map(c => in.cutTotal(c) + in.size(c)).sum / (sumSize * sumSize)
    assert(d >= lower - 1e-9 && d <= upper + 1e-9)
    assert(math.abs(d - upper) < 1e-9, "we pick δ = δ_max as the paper does")
  }

  test("Theorem 4: social welfare equals the sum of individual costs") {
    val k = 4
    val in = gameInputFor(TestGraphs.commTiny, k)
    val res = StackelbergGame.solve(in, k)
    val d = res.delta
    // Left-hand form: δ·Σ|p|²/k + Σ_i Θ(p_i, V)/k with Θ(p,V)=Θ(p,V−p)+|p|.
    val load = new Array[Double](k)
    for (c <- 0 until in.numClusters) load(res.c2p(c)) += in.size(c)
    var crossFromPartition = 0.0
    for (c <- 0 until in.numClusters; j <- in.nbrs(c))
      if (res.c2p(c) != res.c2p(j)) crossFromPartition += in.weightOf(c, j)
    val lhs = d * load.map(l => l * l).sum / k + (crossFromPartition + load.sum) / k
    // Right-hand form: Σ individual costs (what welfare() computes).
    val rhs = StackelbergGame.welfare(in, k, d, res.c2p)
    assert(math.abs(lhs - rhs) < 1e-6 * math.max(1.0, math.abs(lhs)),
      s"lhs=$lhs rhs=$rhs")
  }

  test("equilibrium: no cluster can improve by unilateral deviation") {
    val k = 3
    val in = gameInputFor(TestGraphs.toy, k)
    val res = StackelbergGame.solve(in, k)
    assert(res.rounds < 50, "converged before the round cap")
    val base = StackelbergGame.welfare(in, k, res.delta, res.c2p)
    for (c <- 0 until in.numClusters; p <- 0 until k if p != res.c2p(c)) {
      val alt = res.c2p.clone(); alt(c) = p
      // Deviation cannot reduce the deviator's own cost. Individual cost of
      // c: δ/k·|c|·|p_c| + (F(c)+|c|)/k.
      def cost(assign: Array[Int]): Double = {
        val load = new Array[Double](k)
        for (x <- 0 until in.numClusters) load(assign(x)) += in.size(x)
        var cut = 0.0
        for (j <- in.nbrs(c)) if (assign(j) != assign(c)) cut += in.weightOf(c, j)
        res.delta / k * in.size(c) * load(assign(c)) + (cut + in.size(c)) / k
      }
      assert(cost(res.c2p) <= cost(alt) + 1e-9,
        s"cluster $c prefers partition $p (base welfare $base)")
    }
  }

  test("convergence within the round cap on small graphs") {
    for (stream <- Seq(TestGraphs.rmatTiny, TestGraphs.commTiny)) {
      val in = gameInputFor(stream, 4)
      val res = StackelbergGame.solve(in, 4)
      assert(res.rounds <= 50)
    }
  }

  test("two-stage and one-stage both produce valid placements") {
    val in = gameInputFor(TestGraphs.commTiny, 4)
    for (twoStage <- Seq(true, false)) {
      val res = StackelbergGame.solve(in, 4, StackelbergGame.Config(twoStage = twoStage))
      assert(res.c2p.length == in.numClusters)
      assert(res.c2p.forall(p => p >= 0 && p < 4))
    }
  }

  test("parallel batched game produces a valid placement") {
    val in = gameInputFor(TestGraphs.commTiny, 4)
    val res = StackelbergGame.solve(in, 4,
      StackelbergGame.Config(threads = 4, batchSize = 8))
    assert(res.c2p.forall(p => p >= 0 && p < 4))
  }

  test("Theorem 5: welfare at equilibrium is within (k+1)·OPT-lower-bound") {
    val k = 3
    val in = gameInputFor(TestGraphs.toy, k)
    val res = StackelbergGame.solve(in, k)
    // OPT ≥ (1/k)·Σ(F(c)+|c|) (Eq. 15); PoA ≤ k+1 (Theorem 5).
    val optLb = (0 until in.numClusters).map(c => in.cutTotal(c) + in.size(c)).sum / k.toDouble
    assert(res.welfare <= (k + 1) * optLb + 1e-9,
      s"welfare ${res.welfare} exceeds (k+1)·OPT-lb ${(k + 1) * optLb}")
  }

  test("Theorem 6 flavor: rounds are far below the 2(Σdeg+|V|) bound") {
    val stream = TestGraphs.rmatTiny
    val stats = TestGraphs.localStats(stream)
    val in = gameInputFor(stream, 4)
    val res = StackelbergGame.solve(in, 4)
    val bound = 2L * (2L * stats.numEdges + stats.numVertices)
    assert(res.rounds <= bound)
  }

  test("game is deterministic") {
    val in = gameInputFor(TestGraphs.rmatTiny, 4)
    val a = StackelbergGame.solve(in, 4)
    val b = StackelbergGame.solve(in, 4)
    assert(a.c2p.sameElements(b.c2p))
  }

  test("single-table game input (CLUGP mode): sizes sum to |E|") {
    val stream = TestGraphs.commTiny
    val stats = TestGraphs.localStats(stream)
    val v2c = SkewClustering.genericCluster(stream, stats, 4, globalDegrees = false, splitting = true)
    val in = GameInput.buildSingle(stream, v2c, useCms = false)
    assert(in.numHead == 0)
    assert(math.abs(in.size.sum - stream.length) < 1e-6)
  }
}
