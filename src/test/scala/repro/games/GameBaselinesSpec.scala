package repro.games

import org.scalatest.funsuite.AnyFunSuite
import repro.TestGraphs
import repro.core.S5P
import repro.gen.GraphGen
import repro.metrics.Metrics

class GameBaselinesSpec extends AnyFunSuite {

  test("RMGP: DNF guard fires above the edge budget (the paper's >24h rows)") {
    val r = RMGP(maxEdges = 100).partition(TestGraphs.rmatTiny, TestGraphs.ctx(TestGraphs.rmatTiny, 4))
    assert(r.dnf)
    assert(r.pids.isEmpty)
  }

  test("CVSP: DNF guard fires above the edge budget") {
    val r = CVSP(maxEdges = 100).partition(TestGraphs.rmatTiny, TestGraphs.ctx(TestGraphs.rmatTiny, 4))
    assert(r.dnf)
  }

  test("RMGP converges (rounds below cap) on small graphs") {
    val r = RMGP(maxRounds = 30).partition(TestGraphs.commTiny, TestGraphs.ctx(TestGraphs.commTiny, 4))
    assert(!r.dnf)
    assert(r.rounds <= 30)
  }

  test("MDSGP processes windows; total rounds grow with the stream") {
    val short = MDSGP(windowSize = 64).partition(TestGraphs.rmatTiny, TestGraphs.ctx(TestGraphs.rmatTiny, 4))
    assert(short.rounds >= TestGraphs.rmatTiny.length / 64, "at least one round per window")
  }

  test("CVSP separator game produces k non-empty groups on a connected graph") {
    val g = GraphGen.community(300, 2500, seed = 9)
    val r = CVSP().partition(g, TestGraphs.ctx(g, 4))
    assert(Metrics.loads(r.pids, 4).forall(_ > 0))
  }

  test("vertex games keep the whole adjacency: memory above S5P's") {
    val s = TestGraphs.communitySmall
    val ctx = TestGraphs.ctx(s, 8)
    val s5p = S5P().partition(s, TestGraphs.ctx(s, 8, tau = 1.0))
    for (g <- Seq[repro.partitioners.EdgePartitioner](RMGP(), MDSGP(), CVSP())) {
      val r = g.partition(s, ctx)
      assert(r.stateBytes > s5p.stateBytes, s"${g.name}: ${r.stateBytes} vs S5P ${s5p.stateBytes}")
    }
  }

  test("S5P matches or beats every game baseline on RF (Table 4 ordering)") {
    val s = TestGraphs.communitySmall
    val k = 8
    val s5pRf = Metrics.replicationFactor(s, S5P().partition(s, TestGraphs.ctx(s, k, tau = 1.0)).pids)
    for (g <- Seq[repro.partitioners.EdgePartitioner](RMGP(), MDSGP(), CVSP())) {
      val rf = Metrics.replicationFactor(s, g.partition(s, TestGraphs.ctx(s, k)).pids)
      assert(s5pRf <= rf * 1.15, s"${g.name}: S5P=$s5pRf vs $rf")
    }
  }

  test("RMGP semantic weight changes the outcome (multi-criteria is live)") {
    val s = TestGraphs.communitySmall
    val a = RMGP(semanticWeight = 0.0).partition(s, TestGraphs.ctx(s, 8))
    val b = RMGP(semanticWeight = 50.0).partition(s, TestGraphs.ctx(s, 8))
    assert(!a.pids.sameElements(b.pids))
  }
}
