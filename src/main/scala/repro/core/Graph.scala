package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** A directed edge of the input stream. Vertex ids are dense-ish longs. */
final case class Edge(src: Long, dst: Long)

/** Summary statistics of a streamed graph, computed once up front via Spark.
  *
  * @param numVertices number of distinct endpoint ids
  * @param numEdges    number of edges in the stream
  * @param degrees     global degree per vertex (undirected view: in+out,
  *                    an endpoint of `m` incident edges has degree `m`)
  */
final case class GraphStats(numVertices: Long, numEdges: Long, degrees: java.util.HashMap[Long, Int]) {
  def degree(v: Long): Int = degrees.getOrDefault(v, 0)
  def avgDegree: Double = 2.0 * numEdges / numVertices
}

/** Spark-side plumbing for the streaming partitioners.
  *
  * The paper's algorithms are single-pass, bounded-memory streams; the
  * sequential kernels consume the edge stream via `toLocalIterator` in
  * stream order, while degrees/metrics are DataFrame aggregations.
  */
object GraphOps {

  /** Schema: eid (stream position), src, dst. */
  def toEdgeDf(spark: SparkSession, edges: Seq[Edge]): DataFrame = {
    import spark.implicits._
    edges.zipWithIndex.map { case (e, i) => (i.toLong, e.src, e.dst) }
      .toDF("eid", "src", "dst")
  }

  /** Global degrees as a DataFrame (vertex, degree). */
  def degreesDf(edges: DataFrame): DataFrame = {
    edges.select(col("src").as("vertex"))
      .unionAll(edges.select(col("dst").as("vertex")))
      .groupBy("vertex").agg(count(lit(1)).cast("int").as("degree"))
  }

  /** Compute graph stats with Spark, collecting the O(|V|) degree table. */
  def stats(edges: DataFrame): GraphStats = {
    val degs = degreesDf(edges).collect()
    val m = new java.util.HashMap[Long, Int](degs.length * 2)
    var i = 0
    while (i < degs.length) {
      m.put(degs(i).getLong(0), degs(i).getInt(1)); i += 1
    }
    val numEdges = edges.count()
    GraphStats(m.size.toLong, numEdges, m)
  }

  /** Stream the edges to the driver in stream order. O(1) driver memory per
    * batch; the kernels keep only O(|V|) state.
    */
  def streamEdges(edges: DataFrame): Iterator[Edge] = {
    import scala.jdk.CollectionConverters._
    edges.select("eid", "src", "dst").orderBy("eid")
      .toLocalIterator().asScala
      .map(r => Edge(r.getLong(1), r.getLong(2)))
  }

  /** Collect the stream once into an array (bench path: replaying the same
    * stream into several partitioners without re-running the Spark scan).
    */
  def collectStream(edges: DataFrame): Array[Edge] = {
    edges.select("eid", "src", "dst").orderBy("eid").collect()
      .map(r => Edge(r.getLong(1), r.getLong(2)))
  }

  /** Attach a partition assignment (aligned with stream order) to the edges. */
  def withAssignment(spark: SparkSession, edges: DataFrame, pids: Array[Int]): DataFrame = {
    import spark.implicits._
    val pidDf = pids.zipWithIndex.map { case (p, i) => (i.toLong, p) }.toSeq
      .toDF("eid", "pid")
    edges.join(pidDf, "eid")
  }
}
