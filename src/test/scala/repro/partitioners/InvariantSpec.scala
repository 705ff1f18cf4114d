package repro.partitioners

import org.scalatest.funsuite.AnyFunSuite
import repro.TestGraphs
import repro.core.{Edge, S5P}
import repro.games.{CVSP, MDSGP, RMGP}
import repro.metrics.Metrics

/** Cross-cutting invariants every partitioner must satisfy, on every test
  * graph and partition count: complete single assignment, in-range ids,
  * capacity respected (within the stated slack), RF ∈ [1, k], determinism.
  */
class InvariantSpec extends AnyFunSuite {

  private val partitioners: Seq[(EdgePartitioner, Double)] = Seq(
    // (partitioner, allowed balance slack over ⌈τ|E|/k⌉·k/|E|)
    (S5P(tau = 1.0), 0.0),
    (S5P(bounded = true), Double.PositiveInfinity), // S5P-B drops the cap by design
    (CLUGP(tau = 1.0), 0.0),
    (TwoPSL(), 0.0),
    (HDRF(), 0.0),
    (GreedyPG(), 0.0),
    (DBH(), 0.0),
    (GridPartitioner(), 0.0),
    (NE(), 0.0),
    (HEPLite(), 1.0),       // two independently-capped halves: each ⌈·⌉ can
                            // round up, which dominates at toy-graph scale
    (MetisLike(), 0.0),
    (RMGP(), 0.0),
    (MDSGP(windowSize = 128), 0.0),
    (CVSP(), 0.0),
  )

  private val graphs = Seq(
    "toy" -> TestGraphs.toy,
    "rmatTiny" -> TestGraphs.rmatTiny,
    "commTiny" -> TestGraphs.commTiny,
  )

  for ((p, slack) <- partitioners; (gname, stream) <- graphs; k <- Seq(2, 4, 8)) {
    test(s"${p.name} / $gname / k=$k: complete, in-range, capped, RF sane") {
      val ctx = TestGraphs.ctx(stream, k)
      val res = p.partition(stream, ctx)
      assert(!res.dnf, "no DNF at this scale")
      assert(res.pids.length == stream.length, "every edge assigned exactly once")
      assert(res.pids.forall(x => x >= 0 && x < k), "ids in range")
      if (!slack.isInfinity) {
        val capBal = k.toDouble * ctx.capacity / stream.length * (1.0 + slack) + 1e-9
        assert(Metrics.loadBalance(res.pids, k) <= capBal,
          s"balance ${Metrics.loadBalance(res.pids, k)} vs cap $capBal")
      }
      val rf = Metrics.replicationFactor(stream, res.pids)
      assert(rf >= 1.0 && rf <= k.toDouble, s"rf=$rf")
    }
  }

  for ((p, _) <- partitioners.take(8)) {
    test(s"${p.name}: deterministic across runs") {
      val stream = TestGraphs.rmatTiny
      val ctx = TestGraphs.ctx(stream, 4)
      val a = p.partition(stream, ctx)
      val b = p.partition(stream, ctx)
      assert(a.pids.sameElements(b.pids))
    }
  }

  test("all partitioners report non-negative time and state") {
    val stream = TestGraphs.rmatTiny
    val ctx = TestGraphs.ctx(stream, 4)
    for ((p, _) <- partitioners) {
      val r = p.partition(stream, ctx)
      assert(r.timeMs >= 0)
      assert(r.stateBytes >= 0)
    }
  }

  test("single-edge graph works for all partitioners") {
    val one = IndexedSeq(Edge(0, 1))
    for ((p, _) <- partitioners) {
      val r = p.partition(one, TestGraphs.ctx(one, 2))
      assert(r.pids.length == 1 && r.pids(0) >= 0 && r.pids(0) < 2)
    }
  }

  test("duplicate edges are each assigned (multigraph streams)") {
    val dup = IndexedSeq(Edge(0, 1), Edge(0, 1), Edge(1, 2), Edge(0, 1))
    for ((p, _) <- partitioners if p.name != "S5P-B") {
      val r = p.partition(dup, TestGraphs.ctx(dup, 2))
      assert(r.pids.length == 4)
    }
  }
}
