package repro.gas

import repro.{Oracle, SparkSpec, TestGraphs}
import repro.core.{GraphOps, S5P}
import repro.partitioners.DBH
import repro.metrics.Metrics

class GasEngineSpec extends SparkSpec {
  import org.apache.spark.sql.functions._

  private lazy val stream = TestGraphs.rmatTiny
  private lazy val edgesDf = GraphOps.toEdgeDf(spark, stream).cache()

  private def assignedWith(p: repro.partitioners.EdgePartitioner, k: Int) = {
    val res = p.partition(stream, TestGraphs.ctx(stream, k))
    GraphOps.withAssignment(spark, edgesDf, res.pids)
  }

  test("PageRank mass is conserved (sums to 1)") {
    val ranks = GasEngine.pagerank(spark, assignedWith(DBH(), 4), iterations = 5)
    val total = ranks.agg(sum("rank")).head().getDouble(0)
    assert(math.abs(total - 1.0) < 1e-6, s"mass=$total")
  }

  test("Spark PageRank matches the driver reference") {
    val ranks = GasEngine.pagerank(spark, assignedWith(DBH(), 4), iterations = 5)
      .collect().map(r => (r.getLong(0), r.getDouble(1))).toMap
    val ref = GasEngine.pagerankReference(stream, iterations = 5)
    assert(ranks.keySet == ref.keySet)
    ranks.foreach { case (v, r) =>
      assert(math.abs(r - ref(v)) < 1e-9, s"vertex $v: $r vs ${ref(v)}")
    }
  }

  test("PageRank is independent of the partitioning") {
    val a = GasEngine.pagerank(spark, assignedWith(DBH(), 4), 4)
      .collect().map(r => (r.getLong(0), r.getDouble(1))).toMap
    val b = GasEngine.pagerank(spark, assignedWith(S5P(tau = 1.0), 8), 4)
      .collect().map(r => (r.getLong(0), r.getDouble(1))).toMap
    assert(a.keySet == b.keySet)
    a.foreach { case (v, r) => assert(math.abs(r - b(v)) < 1e-9) }
  }

  test("one PageRank contribution step matches DuckDB (oracle)") {
    val assigned = assignedWith(DBH(), 4)
    val edges = assigned.select("src", "dst")
    val outDeg = edges.groupBy("src").agg(count(lit(1)).as("outdeg"))
    val step = edges.join(outDeg, "src")
      .groupBy(col("dst").as("vertex"))
      .agg(round(sum(lit(1.0) / col("outdeg")), 6).as("inflow"))
      .select("vertex", "inflow")
    Oracle.assertEquivalent(
      step,
      """WITH outdeg AS (SELECT src, COUNT(*) AS od FROM edges GROUP BY src)
        |SELECT e.dst AS vertex, ROUND(SUM(1.0 / o.od), 6) AS inflow
        |FROM edges e JOIN outdeg o ON e.src = o.src
        |GROUP BY e.dst""".stripMargin,
      "edges" -> edges)
  }

  test("commStats messages = 2·(Σ|P(v)| − |V|), consistent with driver RF") {
    val k = 8
    val res = DBH().partition(stream, TestGraphs.ctx(stream, k))
    val assigned = GraphOps.withAssignment(spark, edgesDf, res.pids)
    val stats = GasEngine.commStats(assigned, k)
    val rf = Metrics.replicationFactor(stream, res.pids)
    val nv = TestGraphs.localStats(stream).numVertices
    assert(stats.replicas == math.round(rf * nv))
    assert(stats.messagesPerIter == 2 * (stats.replicas - nv))
  }

  test("better partitioning (lower RF) means fewer messages — the §6.6 link") {
    val k = 8
    val s5p = S5P(tau = 1.0).partition(stream, TestGraphs.ctx(stream, k, tau = 1.0))
    val dbh = DBH().partition(stream, TestGraphs.ctx(stream, k))
    val mS = GasEngine.commStats(GraphOps.withAssignment(spark, edgesDf, s5p.pids), k)
    val mD = GasEngine.commStats(GraphOps.withAssignment(spark, edgesDf, dbh.pids), k)
    val rfS = Metrics.replicationFactor(stream, s5p.pids)
    val rfD = Metrics.replicationFactor(stream, dbh.pids)
    assert((rfS < rfD) == (mS.messagesPerIter < mD.messagesPerIter))
  }

  test("runtime model grows with RTT (the PUMBA latency experiment)") {
    val assigned = assignedWith(DBH(), 4)
    val fast = GasEngine.commStats(assigned, 4, rttSeconds = 0.01)
    val slow = GasEngine.commStats(assigned, 4, rttSeconds = 0.1)
    assert(slow.runtimeModel > fast.runtimeModel)
  }
}
