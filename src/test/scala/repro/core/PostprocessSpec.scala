package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.TestGraphs

class PostprocessSpec extends AnyFunSuite {
  private val stream = TestGraphs.rmatTiny
  private val k = 4

  /** A postprocess run with a trivial cluster map (vertex id mod k). */
  private def run(capacity: Long): Array[Int] =
    Postprocess.assign(stream, k, capacity,
      isHead = _ => false,
      c2pOfEdge = (e, _) => ((e.src % k).toInt, (e.dst % k).toInt))

  test("every edge is assigned to a valid partition") {
    val pids = run(math.ceil(stream.length / k.toDouble).toLong)
    assert(pids.length == stream.length)
    assert(pids.forall(p => p >= 0 && p < k))
  }

  test("capacity L is never exceeded") {
    val cap = math.ceil(stream.length / k.toDouble).toLong
    val pids = run(cap)
    val loads = repro.metrics.Metrics.loads(pids, k)
    assert(loads.forall(_ <= cap), loads.mkString(","))
  }

  test("τ=1.0 yields near-perfect balance (Theorem 1: τ ≤ kL/|E|)") {
    val cap = math.ceil(stream.length / k.toDouble).toLong
    val pids = run(cap)
    val bal = repro.metrics.Metrics.loadBalance(pids, k)
    assert(bal <= k.toDouble * cap / stream.length + 1e-9)
  }

  test("without pressure edges land on a cluster partition or a replica partition") {
    // Huge capacity: each edge lands on pu/pv or a partition already
    // holding a replica of one endpoint (the §5.2 replication matrix).
    val replicas = new repro.partitioners.ReplicaTable(k)
    val pids = Postprocess.assign(stream, k, Long.MaxValue,
      _ => false, (e, _) => ((e.src % k).toInt, (e.dst % k).toInt))
    stream.zip(pids).foreach { case (e, p) =>
      val ok = p == (e.src % k).toInt || p == (e.dst % k).toInt ||
        replicas.contains(e.src, p) || replicas.contains(e.dst, p)
      assert(ok, s"edge $e landed on $p with no affinity")
      replicas.add(e.src, p); replicas.add(e.dst, p)
    }
  }

  test("replica-awareness concentrates repeated edges on one partition") {
    // All three copies of (0,1) follow the replicas created by the first.
    val tiny = IndexedSeq(Edge(0, 1), Edge(0, 1), Edge(0, 1))
    val pids = Postprocess.assign(tiny, 2, Long.MaxValue,
      _ => false, (_, _) => (0, 1))
    assert(pids.toSeq == Seq(0, 0, 0))
  }

  test("overflow spills to partitions with room (capacity saturation)") {
    // All cluster maps point at p0, capacity 1: spill must fan out.
    val tiny = IndexedSeq(Edge(0, 1), Edge(2, 3), Edge(4, 5), Edge(6, 7))
    val k4 = 4
    for (head <- Seq(true, false)) {
      val pids = Postprocess.assign(tiny, k4, 1L, _ => head, (_, _) => (0, 0))
      assert(pids.sorted.toSeq == Seq(0, 1, 2, 3), s"head=$head: ${pids.toSeq}")
    }
  }

  test("impossible capacity throws") {
    intercept[IllegalStateException] {
      Postprocess.assign(IndexedSeq(Edge(0, 1), Edge(1, 2), Edge(2, 3)), 2, 1L,
        _ => false, (_, _) => (0, 0))
    }
  }

  test("assignment is deterministic") {
    val a = run(math.ceil(stream.length / k.toDouble).toLong)
    val b = run(math.ceil(stream.length / k.toDouble).toLong)
    assert(a.sameElements(b))
  }
}
