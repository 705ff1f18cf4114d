package repro.gen

import org.scalatest.funsuite.AnyFunSuite
import repro.TestGraphs
import repro.metrics.Skewness

class GraphGenSpec extends AnyFunSuite {

  test("rmat is deterministic in the seed") {
    val a = GraphGen.rmat(1000, 5000, seed = 7)
    val b = GraphGen.rmat(1000, 5000, seed = 7)
    assert(a == b)
    val c = GraphGen.rmat(1000, 5000, seed = 8)
    assert(a != c)
  }

  test("rmat produces the requested edge count and vertex range") {
    val edges = GraphGen.rmat(1000, 5000, seed = 1)
    assert(edges.length == 5000)
    edges.foreach { e =>
      assert(e.src >= 0 && e.src < 1000)
      assert(e.dst >= 0 && e.dst < 1000)
      assert(e.src != e.dst, "no self loops")
    }
  }

  test("rmat degree distribution is skewed (power-law-ish)") {
    val stats = TestGraphs.localStats(GraphGen.rmat(2000, 40000, seed = 2))
    import scala.jdk.CollectionConverters._
    val degrees = stats.degrees.values().asScala.map(_.toInt).toArray
    assert(degrees.max > 10 * (2.0 * 40000 / degrees.length),
      "hub degree far above average")
    assert(Skewness.pearson1(degrees) > 0.0, "right-skewed")
  }

  test("skewer rmat corners give more skew (synthetic G-series knob)") {
    def maxDeg(a: Double): Int = {
      val st = TestGraphs.localStats(GraphGen.rmat(2000, 30000, 3, a, (1 - a) / 3, (1 - a) / 3))
      import scala.jdk.CollectionConverters._
      st.degrees.values().asScala.max
    }
    assert(maxDeg(0.7) > maxDeg(0.3))
  }

  test("community graph is deterministic and respects bounds") {
    val a = GraphGen.community(500, 3000, seed = 5)
    assert(a == GraphGen.community(500, 3000, seed = 5))
    assert(a.length == 3000)
    a.foreach { e =>
      assert(e.src >= 0 && e.src < 500 && e.dst >= 0 && e.dst < 500)
      assert(e.src != e.dst)
    }
  }

  test("community graph has strong locality (few cross-community edges)") {
    // Communities are contiguous id ranges; a proxy: most edges connect
    // nearby ids relative to a random baseline.
    val n = 1000
    val edges = GraphGen.community(n, 10000, seed = 6)
    val near = edges.count(e => math.abs(e.src - e.dst) < n / 10)
    assert(near.toDouble / edges.length > 0.6, s"only $near/10000 local")
  }

  test("smallConnected produces exactly (n, m) simple connected graphs") {
    for ((n, m) <- Seq((7, 12), (8, 15), (10, 12))) {
      val edges = GraphGen.smallConnected(n, m, seed = n)
      assert(edges.length == m)
      val verts = edges.flatMap(e => Seq(e.src, e.dst)).toSet
      assert(verts == (0L until n).toSet, "all vertices present")
      // simple: no duplicate undirected pairs, no loops
      val pairs = edges.map(e => (math.min(e.src, e.dst), math.max(e.src, e.dst)))
      assert(pairs.distinct.length == m)
      pairs.foreach { case (a, b) => assert(a != b) }
      // connected: BFS reaches everything
      val adj = edges.flatMap(e => Seq(e.src -> e.dst, e.dst -> e.src))
        .groupBy(_._1).view.mapValues(_.map(_._2)).toMap
      val seen = collection.mutable.Set(0L)
      val queue = collection.mutable.Queue(0L)
      while (queue.nonEmpty) {
        val v = queue.dequeue()
        adj.getOrElse(v, Seq.empty).foreach { u =>
          if (!seen.contains(u)) { seen += u; queue += u }
        }
      }
      assert(seen.size == n, "connected")
    }
  }

  test("smallConnected rejects infeasible sizes") {
    intercept[IllegalArgumentException] { GraphGen.smallConnected(4, 2, 1) }
    intercept[IllegalArgumentException] { GraphGen.smallConnected(4, 7, 1) }
  }

  test("toy graph matches the Fig. 3 shape: 12 vertices, 14 edges") {
    val t = GraphGen.toyGraph
    assert(t.length == 14)
    assert(t.flatMap(e => Seq(e.src, e.dst)).toSet.size == 12)
  }

  test("registry holds the paper's 11 real + 6 synthetic analogs") {
    assert(GraphGen.registry.length == 17)
    assert(GraphGen.registry.count(_.kind == "Social") == 4)
    assert(GraphGen.registry.count(_.kind == "Web") == 7)
    assert(GraphGen.registry.count(_.kind == "Synthetic") == 6)
  }

  for (spec <- GraphGen.registry) {
    test(s"registry ${spec.name}: generator matches the declared sizes") {
      val edges = spec.gen()
      assert(edges.length == spec.numEdges)
      val stats = TestGraphs.localStats(edges)
      assert(stats.numVertices <= spec.numVertices)
      assert(stats.numVertices > spec.numVertices / 2,
        s"only ${stats.numVertices} of ${spec.numVertices} vertices touched")
    }
  }

  test("G-series density grows within each group (G1<G2<G3, G4<G5<G6)") {
    def density(n: String) = {
      val s = GraphGen.byName(n)
      s.numEdges.toDouble / s.numVertices
    }
    assert(density("G1") < density("G2") && density("G2") < density("G3"))
    assert(density("G4") < density("G5") && density("G5") < density("G6"))
  }

  test("byName fails on unknown graphs") {
    intercept[RuntimeException] { GraphGen.byName("nope") }
  }

  test("u01 stays in [0,1) and is deterministic") {
    for (i <- 0L until 1000L) {
      val x = GraphGen.u01(42, i, 3)
      assert(x >= 0.0 && x < 1.0)
      assert(x == GraphGen.u01(42, i, 3))
    }
  }
}
