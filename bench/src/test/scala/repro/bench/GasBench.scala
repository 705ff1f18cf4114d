package repro.bench

import repro.SparkSpec
import repro.core.{GraphOps, S5P}
import repro.gas.GasEngine
import repro.gen.GraphGen
import repro.harness.Tables
import repro.partitioners.{CLUGP, DBH, EdgePartitioner, HDRF, PartitionContext}

/** Supplementary (paper §6.6, Figure 11): PageRank on the GAS simulator —
  * communication cost and the modeled runtime under varying RTT, per
  * partitioner. Figures are out of scope for tables, but the "up to 81%
  * communication reduction" claim is checked here.
  */
class GasBench extends SparkSpec {

  private val k = 32
  private lazy val stream = GraphGen.byName("UK2").gen()
  private lazy val stats = Tables.localStats(stream)
  private lazy val edgesDf = GraphOps.toEdgeDf(spark, stream).cache()

  private def comm(p: EdgePartitioner, rtt: Double = 0.0) = {
    val res = p.partition(stream, PartitionContext(k, stats, Tables.Tau))
    GasEngine.commStats(GraphOps.withAssignment(spark, edgesDf, res.pids), k,
      rttSeconds = rtt)
  }

  test("GAS: PageRank communication cost per partitioner (Fig. 11b analog)") {
    println("==== GAS SIM (PageRank on UK2 analog, k=32) ====")
    val rows = Seq[(String, EdgePartitioner)](
      "DBH" -> DBH(), "HDRF" -> HDRF(), "CLUGP" -> CLUGP(tau = Tables.Tau),
      "S5P" -> S5P(tau = Tables.Tau)).map { case (n, p) =>
      val c = comm(p)
      println(f"$n%-6s messages/iter=${c.messagesPerIter}%10d replicas=${c.replicas}%9d " +
        f"maxPartEdges=${c.maxPartitionEdges}%8d modelTime=${c.runtimeModel}%8.5fs")
      n -> c
    }.toMap
    // S5P communicates least; vs hashing the reduction is large (paper: 81%).
    assert(rows("S5P").messagesPerIter < rows("HDRF").messagesPerIter)
    assert(rows("S5P").messagesPerIter < rows("CLUGP").messagesPerIter)
    val reduction = 1.0 - rows("S5P").messagesPerIter.toDouble / rows("DBH").messagesPerIter
    println(f"S5P vs DBH communication reduction: ${reduction * 100}%.1f%% (paper: up to 81%%)")
    assert(reduction > 0.4, s"expected a large reduction, got $reduction")
  }

  test("GAS: runtime model under RTT sweep (Fig. 11c analog)") {
    for (rttMs <- Seq(10, 50, 100)) {
      val s5p = comm(S5P(tau = Tables.Tau), rttMs / 1000.0)
      val dbh = comm(DBH(), rttMs / 1000.0)
      println(f"RTT=${rttMs}ms  S5P=${s5p.runtimeModel}%8.5fs  DBH=${dbh.runtimeModel}%8.5fs")
      assert(s5p.runtimeModel <= dbh.runtimeModel)
    }
  }

  test("GAS: PageRank result is partition-independent (correctness gate)") {
    val small = GraphGen.byName("IN").gen()
    val df = GraphOps.toEdgeDf(spark, small)
    val st = Tables.localStats(small)
    val a = GasEngine.pagerank(spark,
      GraphOps.withAssignment(spark, df, DBH().partition(small, PartitionContext(k, st, Tables.Tau)).pids), 3)
      .collect().map(r => (r.getLong(0), r.getDouble(1))).toMap
    val b = GasEngine.pagerank(spark,
      GraphOps.withAssignment(spark, df, S5P(tau = Tables.Tau).partition(small, PartitionContext(k, st, Tables.Tau)).pids), 3)
      .collect().map(r => (r.getLong(0), r.getDouble(1))).toMap
    a.foreach { case (v, r) => assert(math.abs(r - b(v)) < 1e-9) }
  }
}
