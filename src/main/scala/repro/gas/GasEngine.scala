package repro.gas

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** A GAS-model (Gather-Apply-Scatter) distributed graph-processing
  * simulator — the PowerGraph substitute for the paper's §6.6 deployment
  * experiments (DESIGN.md §4).
  *
  * Given a vertex-cut edge assignment (eid, src, dst, pid), vertices are
  * replicated on every partition holding one of their edges; the first such
  * partition is the master. Communication per GAS iteration is exactly the
  * mirror↔master sync volume, 2·Σ_v (|P(v)|−1) messages (gather-up +
  * scatter-down), a deterministic function of the replication sets — which
  * is why partitioning quality transfers to communication cost.
  */
object GasEngine {

  /** @param messagesPerIter  mirror syncs per PageRank iteration
    * @param replicas         Σ_v |P(v)|
    * @param maxPartitionEdges compute-bound partition size
    * @param runtimeModel     modeled seconds per iteration under the given
    *                         per-edge compute cost and per-message latency
    */
  final case class CommStats(messagesPerIter: Long, replicas: Long,
                             maxPartitionEdges: Long, runtimeModel: Double)

  /** Mirror-sync statistics of an assignment. */
  def commStats(assigned: DataFrame, k: Int,
                computeCostPerEdge: Double = 1e-7,
                msgCost: Double = 5e-7, rttSeconds: Double = 0.0): CommStats = {
    val reps = assigned.select(col("src").as("vertex"), col("pid"))
      .unionAll(assigned.select(col("dst").as("vertex"), col("pid")))
      .groupBy("vertex").agg(countDistinct("pid").as("reps"))
    val totalReps = reps.agg(sum("reps")).head().getLong(0)
    val nv = reps.count()
    val maxEdges = assigned.groupBy("pid").count().agg(max("count")).head().getLong(0)
    val messages = 2L * (totalReps - nv)
    // Makespan model: local compute on the largest partition + sync volume
    // spread over k links + a constant number of barrier round-trips.
    val t = maxEdges * computeCostPerEdge + messages.toDouble / k * msgCost + 2 * rttSeconds
    CommStats(messages, totalReps, maxEdges, t)
  }

  /** PageRank over the partitioned graph, expressed as DataFrame dataflow.
    * Results are independent of the partitioning (asserted in tests); the
    * partitioning only changes the communication statistics.
    *
    * Treats edges as directed src→dst; dangling mass is redistributed
    * uniformly, damping 0.85 — the PowerGraph PageRank example semantics.
    */
  def pagerank(spark: SparkSession, assigned: DataFrame, iterations: Int = 10,
               damping: Double = 0.85): DataFrame = {
    val edges = assigned.select("src", "dst").cache()
    val vertices = edges.select(col("src").as("vertex"))
      .unionAll(edges.select(col("dst").as("vertex"))).distinct().cache()
    val nv = vertices.count()
    val outDeg = edges.groupBy("src").agg(count(lit(1)).as("outdeg"))

    var ranks = vertices.withColumn("rank", lit(1.0 / nv))
    for (_ <- 1 to iterations) {
      val contribs = edges
        .join(ranks, edges("src") === ranks("vertex"))
        .join(outDeg, "src")
        .select(col("dst").as("vertex"), (col("rank") / col("outdeg")).as("contrib"))
        .groupBy("vertex").agg(sum("contrib").as("inflow"))
      // Dangling vertices contribute their rank uniformly.
      val danglingMass = ranks.join(outDeg, ranks("vertex") === outDeg("src"), "left_anti")
        .agg(coalesce(sum("rank"), lit(0.0))).head().getDouble(0)
      ranks = ranks.select(col("vertex"))
        .join(contribs, Seq("vertex"), "left")
        .select(col("vertex"),
          (lit((1.0 - damping) / nv) +
           lit(damping) * (coalesce(col("inflow"), lit(0.0)) + lit(danglingMass / nv))).as("rank"))
    }
    ranks
  }

  /** Driver-side reference PageRank for correctness tests. */
  def pagerankReference(edges: IndexedSeq[repro.core.Edge], iterations: Int = 10,
                        damping: Double = 0.85): Map[Long, Double] = {
    val vs = edges.flatMap(e => Seq(e.src, e.dst)).distinct
    val nv = vs.size
    val out = edges.groupBy(_.src).map { case (v, es) => (v, es.size) }
    var rank = vs.map(v => v -> 1.0 / nv).toMap
    for (_ <- 1 to iterations) {
      val inflow = edges.groupBy(_.dst).map { case (d, es) =>
        d -> es.map(e => rank(e.src) / out(e.src)).sum
      }
      val dangling = vs.filterNot(out.contains).map(rank).sum
      rank = vs.map { v =>
        v -> ((1.0 - damping) / nv + damping * (inflow.getOrElse(v, 0.0) + dangling / nv))
      }.toMap
    }
    rank
  }
}
