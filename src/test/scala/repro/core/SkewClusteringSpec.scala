package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.TestGraphs
import repro.gen.GraphGen

class SkewClusteringSpec extends AnyFunSuite {
  private val toy = TestGraphs.toy
  private val toyStats = TestGraphs.localStats(toy)

  test("toy graph: ξ = avg degree = 2·14/12") {
    val c = SkewClustering.cluster(toy, toyStats, k = 3)
    assert(math.abs(c.xi - 28.0 / 12) < 1e-9)
  }

  test("toy graph: κ = 2|E|/k ≈ 9.33 for k=3") {
    val c = SkewClustering.cluster(toy, toyStats, k = 3)
    assert(math.abs(c.kappa - 28.0 / 3) < 1e-9)
  }

  test("toy graph: v0,v1,v2 are the head vertices") {
    val xi = toyStats.avgDegree
    val heads = (0L to 11L).filter(v => toyStats.degree(v) > xi)
    assert(heads == Seq(0L, 1L, 2L))
  }

  test("toy graph: head edges are exactly {e5,e6,e12} (both endpoints head)") {
    val xi = toyStats.avgDegree
    val headIdx = toy.zipWithIndex.collect {
      case (e, i) if SkewClustering.isHeadEdge(e, toyStats, xi) => i + 1
    }
    assert(headIdx == Seq(5, 6, 12))
  }

  test("toy graph: head table covers exactly the head vertices") {
    val c = SkewClustering.cluster(toy, toyStats, k = 3)
    import scala.jdk.CollectionConverters._
    assert(c.v2cH.keySet().asScala == Set(0L, 1L, 2L))
  }

  test("toy graph: tail table covers every endpoint of a tail edge") {
    val c = SkewClustering.cluster(toy, toyStats, k = 3)
    val xi = toyStats.avgDegree
    val tailVerts = toy.filterNot(SkewClustering.isHeadEdge(_, toyStats, xi))
      .flatMap(e => Seq(e.src, e.dst)).toSet
    import scala.jdk.CollectionConverters._
    assert(c.v2cH.size + c.v2cT.size > 0)
    assert(c.v2cT.keySet().asScala == tailVerts)
  }

  test("a head vertex touching tail edges appears in both tables") {
    val c = SkewClustering.cluster(toy, toyStats, k = 3)
    // v2 is head and has tail edges e4(v2,v7), e9, e10, e11.
    assert(c.v2cH.containsKey(2L) && c.v2cT.containsKey(2L))
  }

  test("every endpoint of the stream lands in at least one table") {
    for (stream <- Seq(TestGraphs.rmatTiny, TestGraphs.commTiny)) {
      val stats = TestGraphs.localStats(stream)
      val c = SkewClustering.cluster(stream, stats, k = 4)
      stream.foreach { e =>
        assert(c.v2cH.containsKey(e.src) || c.v2cT.containsKey(e.src))
        assert(c.v2cH.containsKey(e.dst) || c.v2cT.containsKey(e.dst))
      }
    }
  }

  test("clustering is deterministic") {
    val a = SkewClustering.cluster(TestGraphs.rmatTiny, TestGraphs.localStats(TestGraphs.rmatTiny), 4)
    val b = SkewClustering.cluster(TestGraphs.rmatTiny, TestGraphs.localStats(TestGraphs.rmatTiny), 4)
    assert(a.v2cH == b.v2cH && a.v2cT == b.v2cT)
  }

  test("community graph clusters align with planted communities") {
    // Vertices of the same community should mostly share a tail cluster:
    // count intra-community edges whose endpoints share a cluster.
    val stream = TestGraphs.communitySmall
    val stats = TestGraphs.localStats(stream)
    val c = SkewClustering.cluster(stream, stats, k = 4)
    val xi = stats.avgDegree
    val tailEdges = stream.filterNot(SkewClustering.isHeadEdge(_, stats, xi))
    val sameCluster = tailEdges.count(e => c.v2cT.get(e.src) == c.v2cT.get(e.dst))
    assert(sameCluster.toDouble / tailEdges.size > 0.5,
      s"only $sameCluster/${tailEdges.size} tail edges internal")
  }

  test("larger κ yields no more tail clusters than smaller κ (coarser merge)") {
    val stream = TestGraphs.rmatTiny
    val stats = TestGraphs.localStats(stream)
    val loose = SkewClustering.cluster(stream, stats, 2)  // κ = |E|
    val tight = SkewClustering.cluster(stream, stats, 32) // κ = |E|/16
    assert(loose.numTailClusters <= tight.numTailClusters)
  }

  test("S5P-B variant (globalTail, no κ) still covers all vertices") {
    val stream = TestGraphs.rmatTiny
    val stats = TestGraphs.localStats(stream)
    val c = SkewClustering.cluster(stream, stats, 4,
      kappaOverride = Some(Double.PositiveInfinity), globalTail = true)
    stream.foreach { e =>
      assert(c.v2cH.containsKey(e.src) || c.v2cT.containsKey(e.src))
      assert(c.v2cH.containsKey(e.dst) || c.v2cT.containsKey(e.dst))
    }
  }

  test("genericCluster (local, no split) assigns every endpoint") {
    val stream = TestGraphs.commTiny
    val stats = TestGraphs.localStats(stream)
    val v2c = SkewClustering.genericCluster(stream, stats, 4, globalDegrees = false, splitting = false)
    stream.foreach(e => assert(v2c.containsKey(e.src) && v2c.containsKey(e.dst)))
  }

  test("genericCluster with global degrees assigns every endpoint (2PS-L mode)") {
    val stream = TestGraphs.commTiny
    val stats = TestGraphs.localStats(stream)
    val v2c = SkewClustering.genericCluster(stream, stats, 4, globalDegrees = true, splitting = false)
    stream.foreach(e => assert(v2c.containsKey(e.src) && v2c.containsKey(e.dst)))
  }

  test("genericCluster splitting (CLUGP mode) assigns every endpoint") {
    val stream = TestGraphs.commTiny
    val stats = TestGraphs.localStats(stream)
    val v2c = SkewClustering.genericCluster(stream, stats, 4, globalDegrees = false, splitting = true)
    stream.foreach(e => assert(v2c.containsKey(e.src) && v2c.containsKey(e.dst)))
  }

  test("Table 1 feature matrix: the clustering family implements the claimed modes") {
    // Holl/CLUGP migrate on local volumes, 2PS-L on global, S5P on both —
    // verified structurally: global mode volumes never consult local
    // degrees; skew mode produces the two tables.
    val stream = TestGraphs.rmatTiny
    val stats = TestGraphs.localStats(stream)
    val skew = SkewClustering.cluster(stream, stats, 4)
    assert(skew.v2cH.size() > 0, "skew-aware mode produces head clusters")
    assert(skew.v2cT.size() > 0, "skew-aware mode produces tail clusters")
  }

  test("a graph with uniform degrees has no head edges (regular ⇒ all tail)") {
    // Cycle graph: every degree = 2 = ξ, and head needs strictly greater.
    val cycle = (0L until 20L).map(i => Edge(i, (i + 1) % 20))
    val stats = TestGraphs.localStats(cycle)
    val c = SkewClustering.cluster(cycle, stats, 4)
    assert(c.v2cH.isEmpty)
    assert(c.v2cT.size == 20)
  }

  test("GrowableDoubleArray grows and accumulates") {
    val a = new GrowableDoubleArray
    a.add(5000, 2.5); a.add(5000, 1.5)
    assert(a(5000) == 4.0)
    assert(a(123) == 0.0)
  }
}
