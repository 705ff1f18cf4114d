package repro.partitioners

import org.scalatest.funsuite.AnyFunSuite
import repro.TestGraphs
import repro.core.Edge
import repro.metrics.Metrics

/** Behavior specific to the individual streaming baselines. */
class StreamingSpec extends AnyFunSuite {

  // ------------------------------------------------------------- HDRF ----

  test("HDRF: first edge goes to an empty partition, both replicas recorded") {
    val one = IndexedSeq(Edge(5, 9))
    val r = HDRF().partition(one, TestGraphs.ctx(one, 4))
    assert(r.pids(0) >= 0)
  }

  test("HDRF: co-located consecutive edges share a partition when balanced") {
    // A path u-v, v-w: second edge scores highest where v already lives.
    // k=2 so the shared capacity cap (⌈τ·2/2⌉ = 2) has room for both.
    val g = IndexedSeq(Edge(0, 1), Edge(1, 2))
    val r = HDRF().partition(g, TestGraphs.ctx(g, 2))
    assert(r.pids(0) == r.pids(1))
  }

  test("HDRF: higher k increases RF on a skewed graph (Table 3 trend)") {
    val s = TestGraphs.rmatSmall
    val rf = Seq(4, 16, 64).map { k =>
      Metrics.replicationFactor(s, HDRF().partition(s, TestGraphs.ctx(s, k)).pids)
    }
    assert(rf(0) <= rf(1) && rf(1) <= rf(2), rf.mkString(","))
  }

  test("HDRF degree-awareness beats Greedy on a skewed graph") {
    val s = TestGraphs.rmatSmall
    val k = 16
    val hdrf = Metrics.replicationFactor(s, HDRF().partition(s, TestGraphs.ctx(s, k)).pids)
    val greedy = Metrics.replicationFactor(s, GreedyPG().partition(s, TestGraphs.ctx(s, k)).pids)
    assert(hdrf <= greedy * 1.25, s"hdrf=$hdrf greedy=$greedy")
  }

  // ------------------------------------------------------------ Greedy ----

  test("Greedy: intersection rule keeps a triangle together") {
    // k=2 gives capacity 2 per partition: the triangle fits in two.
    val tri = IndexedSeq(Edge(0, 1), Edge(1, 2), Edge(0, 2))
    val r = GreedyPG().partition(tri, TestGraphs.ctx(tri, 2))
    assert(r.pids.distinct.length <= 2)
  }

  // --------------------------------------------------------------- DBH ----

  test("DBH: mirror edges of a hub hash to the tail endpoints' partitions") {
    // Star around 0: partner i has partial degree 1 < hub degree, so the
    // edge hashes by the partner (after the first edge).
    val star = (1L to 40L).map(i => Edge(0, i))
    val r = DBH().partition(star, TestGraphs.ctx(star, 4))
    // Hub 0 is replicated widely — that is DBH's design.
    val rf = Metrics.replicationFactor(star, r.pids)
    assert(rf > 1.0)
  }

  test("DBH is O(1): insensitive to k in decision cost (smoke: runs at k=64)") {
    val s = TestGraphs.rmatSmall
    val r = DBH().partition(s, TestGraphs.ctx(s, 64))
    assert(r.pids.length == s.length)
  }

  // -------------------------------------------------------------- Grid ----

  test("Grid: dims factor k into the square-most grid") {
    val g = GridPartitioner()
    assert(g.dims(16) == (4, 4))
    assert(g.dims(32) == (4, 8))
    assert(g.dims(7) == (1, 7))
  }

  test("Grid: RF is bounded by the constraint-set size (2√k-ish)") {
    val s = TestGraphs.rmatSmall
    val k = 16
    val r = GridPartitioner().partition(s, TestGraphs.ctx(s, k))
    val rf = Metrics.replicationFactor(s, r.pids)
    assert(rf <= 2 * math.sqrt(k.toDouble) + 1)
  }

  // ------------------------------------------------------------- 2PS-L ----

  test("2PS-L: clustering phase lowers RF vs plain hashing on community graph") {
    val s = TestGraphs.communitySmall
    val k = 8
    val two = Metrics.replicationFactor(s, TwoPSL().partition(s, TestGraphs.ctx(s, k)).pids)
    val dbh = Metrics.replicationFactor(s, DBH().partition(s, TestGraphs.ctx(s, k)).pids)
    assert(two < dbh, s"2psl=$two dbh=$dbh")
  }

  // ------------------------------------------------------------- CLUGP ----

  test("CLUGP: competitive on community graphs (its target domain)") {
    val s = TestGraphs.communitySmall
    val k = 8
    val clugp = Metrics.replicationFactor(s, CLUGP(tau = 1.05).partition(s, TestGraphs.ctx(s, k)).pids)
    val dbh = Metrics.replicationFactor(s, DBH().partition(s, TestGraphs.ctx(s, k)).pids)
    assert(clugp < dbh, s"clugp=$clugp dbh=$dbh")
  }

  // ----------------------------------------------------------- offline ----

  test("NE: offline expansion beats DBH on community graphs") {
    val s = TestGraphs.communitySmall
    val k = 8
    val ne = Metrics.replicationFactor(s, NE().partition(s, TestGraphs.ctx(s, k)).pids)
    val dbh = Metrics.replicationFactor(s, DBH().partition(s, TestGraphs.ctx(s, k)).pids)
    assert(ne < dbh, s"ne=$ne dbh=$dbh")
  }

  test("NE: retains the full adjacency (offline memory profile)") {
    val s = TestGraphs.rmatTiny
    val ne = NE().partition(s, TestGraphs.ctx(s, 4))
    val dbh = DBH().partition(s, TestGraphs.ctx(s, 4))
    assert(ne.stateBytes > dbh.stateBytes)
  }

  test("HEP: splits work between NE and HDRF by the degree threshold") {
    val s = TestGraphs.rmatSmall
    val r = HEPLite(hdfFactor = 2.0).partition(s, TestGraphs.ctx(s, 8))
    assert(r.pids.length == s.length)
  }

  test("METIS-like: multilevel produces at least one coarsening level") {
    val s = TestGraphs.communitySmall
    val r = MetisLike().partition(s, TestGraphs.ctx(s, 4))
    assert(r.rounds >= 1)
  }

  test("METIS-like: strong locality on the community graph (edge-cut strength)") {
    val s = TestGraphs.communitySmall
    val k = 4
    val metis = Metrics.replicationFactor(s, MetisLike().partition(s, TestGraphs.ctx(s, k)).pids)
    val dbh = Metrics.replicationFactor(s, DBH().partition(s, TestGraphs.ctx(s, k)).pids)
    assert(metis < dbh, s"metis=$metis dbh=$dbh")
  }
}
