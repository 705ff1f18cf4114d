package repro.metrics

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.core.Edge

/** Partitioning quality metrics (Eq. 1 and the balance constraint of Eq. 2).
  *
  * The Spark variants operate on the assigned-edge DataFrame
  * (eid, src, dst, pid) and are oracle-checked against DuckDB in tests;
  * the driver variants are used inside benches where the stream is already
  * local.
  */
object Metrics {

  /** Replication factor: Σ_v |P(v)| / |V| (vertex replication form). */
  def replicationFactor(stream: IndexedSeq[Edge], pids: Array[Int]): Double = {
    require(stream.length == pids.length, "assignment not aligned with stream")
    val parts = new java.util.HashMap[Long, java.util.BitSet]()
    var i = 0
    while (i < stream.length) {
      val e = stream(i)
      var b = parts.get(e.src)
      if (b == null) { b = new java.util.BitSet(); parts.put(e.src, b) }
      b.set(pids(i))
      b = parts.get(e.dst)
      if (b == null) { b = new java.util.BitSet(); parts.put(e.dst, b) }
      b.set(pids(i))
      i += 1
    }
    var total = 0L
    val it = parts.values().iterator()
    while (it.hasNext) total += it.next().cardinality()
    total.toDouble / parts.size
  }

  /** Relative load balance: k · max_i |P_i| / |E| (Eq. 2 left-hand side). */
  def loadBalance(pids: Array[Int], k: Int): Double = {
    val loads = new Array[Long](k)
    pids.foreach(p => loads(p) += 1)
    k.toDouble * loads.max / pids.length
  }

  def loads(pids: Array[Int], k: Int): Array[Long] = {
    val l = new Array[Long](k)
    pids.foreach(p => l(p) += 1)
    l
  }

  /** Spark-side RF over (eid, src, dst, pid). */
  def replicationFactorDf(assigned: DataFrame): Double = {
    val reps = assigned.select(col("src").as("vertex"), col("pid"))
      .unionAll(assigned.select(col("dst").as("vertex"), col("pid")))
      .groupBy("vertex")
      .agg(countDistinct("pid").as("reps"))
    val row = reps.agg(sum("reps").as("total"), count(lit(1)).as("nv")).head()
    row.getLong(0).toDouble / row.getLong(1)
  }

  /** Spark-side per-vertex replication joined with global degree — feeds the
    * degree-distribution form of Eq. 1 (avg replication g(d) per degree d).
    */
  def replicationByDegree(assigned: DataFrame): DataFrame = {
    val reps = assigned.select(col("src").as("vertex"), col("pid"))
      .unionAll(assigned.select(col("dst").as("vertex"), col("pid")))
      .groupBy("vertex")
      .agg(countDistinct("pid").as("reps"))
    val degs = repro.core.GraphOps.degreesDf(assigned.select("eid", "src", "dst"))
    reps.join(degs, "vertex")
      .groupBy("degree")
      .agg(avg("reps").as("avg_reps"), count(lit(1)).as("num_vertices"))
  }
}
