package repro.metrics

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** The four graph-skewness metrics of §2.3 / Table 2.
  *
  * Inputs are degree sequences (from `GraphOps.degreesDf` or a driver-side
  * array); `rho` fits the power-law exponent by least squares over the
  * log-log degree histogram, `rho1`/`rho2` are Pearson's first/second
  * skewness, `rho3` the planarization indicator |E| − (3|V| − 6).
  */
object Skewness {

  final case class Report(rho: Double, rho1: Double, rho2: Double, rho3: Long)

  def fromDegrees(degrees: Array[Int], numEdges: Long): Report = {
    require(degrees.nonEmpty, "empty degree sequence")
    val n = degrees.length
    Report(regressionRho(degrees), pearson1(degrees), pearson2(degrees),
           numEdges - (3L * n - 6L))
  }

  /** Power-law exponent ρ: f(d) ∝ d^-ρ fitted as -slope of the log-log
    * histogram (zero-count bins are skipped, as the paper notes logarithms
    * cannot handle them).
    */
  def regressionRho(degrees: Array[Int]): Double = {
    val hist = degrees.groupBy(identity).map { case (d, vs) => (d, vs.length) }
      .filter { case (d, c) => d > 0 && c > 0 }
    if (hist.size < 2) return 0.0
    val pts = hist.toArray.map { case (d, c) => (math.log(d.toDouble), math.log(c.toDouble)) }
    val mx = pts.map(_._1).sum / pts.length
    val my = pts.map(_._2).sum / pts.length
    val sxy = pts.map { case (x, y) => (x - mx) * (y - my) }.sum
    val sxx = pts.map { case (x, _) => (x - mx) * (x - mx) }.sum
    if (sxx == 0) 0.0 else -sxy / sxx
  }

  /** Pearson's first skewness: (mean − mode) / σ. */
  def pearson1(degrees: Array[Int]): Double = {
    val mean = degrees.map(_.toDouble).sum / degrees.length
    val mode = degrees.groupBy(identity).maxBy { case (d, vs) => (vs.length, -d) }._1
    val sd = stddev(degrees, mean)
    if (sd == 0) 0.0 else (mean - mode) / sd
  }

  /** Pearson's second skewness: 3(mean − median) / σ. */
  def pearson2(degrees: Array[Int]): Double = {
    val mean = degrees.map(_.toDouble).sum / degrees.length
    val sorted = degrees.sorted
    val median =
      if (sorted.length % 2 == 1) sorted(sorted.length / 2).toDouble
      else (sorted(sorted.length / 2 - 1) + sorted(sorted.length / 2)) / 2.0
    val sd = stddev(degrees, mean)
    if (sd == 0) 0.0 else 3.0 * (mean - median) / sd
  }

  private def stddev(degrees: Array[Int], mean: Double): Double = {
    val v = degrees.map(d => (d - mean) * (d - mean)).sum / degrees.length
    math.sqrt(v)
  }

  /** Spark-side degree collection for large graphs: (vertex, degree) → report. */
  def fromDegreesDf(degreesDf: DataFrame, numEdges: Long): Report = {
    val degs = degreesDf.select(col("degree").cast("int")).collect().map(_.getInt(0))
    fromDegrees(degs, numEdges)
  }
}
