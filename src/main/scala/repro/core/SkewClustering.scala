package repro.core

import java.util.{HashMap => JHashMap}

/** Output of the streaming clustering phase.
  *
  * @param v2cH  Vertex-to-Head-Cluster table (head vertices appearing in
  *              head edges only)
  * @param v2cT  Vertex-to-Tail-Cluster table (every endpoint of a tail edge,
  *              including head vertices that also touch tail edges)
  * @param xi    head/tail degree threshold ξ = β·2|E|/|V|
  * @param kappa maximum cluster volume κ = 2|E|/k (∞ in S5P-B)
  */
final case class Clustering(v2cH: JHashMap[Long, Int], v2cT: JHashMap[Long, Int],
                            xi: Double, kappa: Double) {
  def numHeadClusters: Int = distinct(v2cH)
  def numTailClusters: Int = distinct(v2cT)
  private def distinct(m: JHashMap[Long, Int]): Int = {
    val s = new java.util.HashSet[Int]()
    val it = m.values().iterator()
    while (it.hasNext) s.add(it.next())
    s.size
  }
  def stateBytes: Long = (v2cH.size + v2cT.size).toLong * 28L
}

/** Algorithm 1 — skewness-aware streaming graph clustering, plus the generic
  * allocate/migrate kernel that also backs the 2PS-L and CLUGP clusterings
  * (Table 1: Holl = local, 2PS-L = global, CLUGP = local + splitting).
  */
object SkewClustering {

  /** Is `e` a head edge under threshold `xi`? Head edge ⇔ both endpoints
    * have global degree strictly above ξ (Definition 1).
    */
  def isHeadEdge(e: Edge, stats: GraphStats, xi: Double): Boolean =
    stats.degree(e.src) > xi && stats.degree(e.dst) > xi

  /** One-pass skewness-aware clustering over the stream (Algorithm 1).
    *
    * Head edges run the global-degree kernel (volumes carry global degrees);
    * tail edges the local-degree kernel (volumes carry running local
    * degrees). Both kernels migrate the lighter endpoint into the heavier
    * endpoint's cluster when capacity allows.
    */
  def cluster(stream: IndexedSeq[Edge], stats: GraphStats, k: Int,
              beta: Double = 1.0, kappaOverride: Option[Double] = None,
              globalTail: Boolean = false,
              tailSplitting: Boolean = true): Clustering = {
    val xi = beta * stats.avgDegree
    val kappa = kappaOverride.getOrElse(2.0 * stats.numEdges / k)

    val v2cH = new JHashMap[Long, Int]()
    val v2cT = new JHashMap[Long, Int]()
    val volH = new GrowableDoubleArray
    val volT = new GrowableDoubleArray
    // Tail capacity is enforced on a global-degree volume (S5P precomputes
    // global degrees for ξ anyway — Table 1 lists its migration as
    // "local/global"): local-degree volumes are near zero early in the
    // stream, so a κ check on them alone lets early clusters snowball far
    // past the partition capacity.
    val volTG = new GrowableDoubleArray
    val ld = new JHashMap[Long, Int]() // running local degrees (tail kernel)
    var nextH = 0
    var nextT = 0

    var idx = 0
    while (idx < stream.length) {
      val e = stream(idx)
      val u = e.src; val v = e.dst
      if (isHeadEdge(e, stats, xi)) {
        // ---- head kernel: global-degree volumes (lines 2–11) ----
        if (!v2cH.containsKey(u)) {
          v2cH.put(u, nextH); volH.add(nextH, stats.degree(u)); nextH += 1
        }
        if (!v2cH.containsKey(v)) {
          v2cH.put(v, nextH); volH.add(nextH, stats.degree(v)); nextH += 1
        }
        val cu = v2cH.get(u); val cv = v2cH.get(v)
        if (cu != cv && volH(cu) < kappa && volH(cv) < kappa) {
          // i = endpoint whose cluster is lightest without it (line 6);
          // ties break toward the smaller-volume cluster, then toward u.
          val su = volH(cu) - stats.degree(u)
          val sv = volH(cv) - stats.degree(v)
          val uIsI = su < sv || (su == sv && volH(cu) <= volH(cv))
          val (i, ci, cj, di) =
            if (uIsI) (u, cu, cv, stats.degree(u).toDouble)
            else (v, cv, cu, stats.degree(v).toDouble)
          if (volH(cj) + di < kappa) {
            volH.add(cj, di); volH.add(ci, -di)
            v2cH.put(i, cj)
          }
        }
      } else {
        // ---- tail kernel: local-degree volumes (lines 12–21); S5P-B swaps
        // in global degrees everywhere (Theorem 2's bounded variant) ----
        if (!v2cT.containsKey(u)) {
          v2cT.put(u, nextT)
          if (globalTail) volT.add(nextT, stats.degree(u))
          volTG.add(nextT, stats.degree(u))
          nextT += 1
        }
        if (!v2cT.containsKey(v)) {
          v2cT.put(v, nextT)
          if (globalTail) volT.add(nextT, stats.degree(v))
          volTG.add(nextT, stats.degree(v))
          nextT += 1
        }
        var cu = v2cT.get(u); var cv = v2cT.get(v)
        if (!globalTail) {
          // This edge raises both endpoints' local degrees, hence volumes.
          ld.merge(u, 1, _ + _); ld.merge(v, 1, _ + _)
          volT.add(cu, 1.0); volT.add(cv, 1.0)
        }
        if (tailSplitting) {
          // Split an endpoint off an overflowing cluster (global-degree
          // capacity): keeps tail clusters partition-sized without
          // freezing early merge mistakes in place.
          if (volTG(cu) >= kappa && cu != cv) {
            val w = ld.getOrDefault(u, 0).toDouble
            val g = stats.degree(u).toDouble
            volT.add(cu, -w); volTG.add(cu, -g)
            v2cT.put(u, nextT); volT.add(nextT, w); volTG.add(nextT, g)
            cu = nextT; nextT += 1
          }
          if (volTG(cv) >= kappa && cu != cv) {
            val w = ld.getOrDefault(v, 0).toDouble
            val g = stats.degree(v).toDouble
            volT.add(cv, -w); volTG.add(cv, -g)
            v2cT.put(v, nextT); volT.add(nextT, w); volTG.add(nextT, g)
            cv = nextT; nextT += 1
          }
        }
        if (cu != cv && volTG(cu) < kappa && volTG(cv) < kappa) {
          val uIsI = volT(cu) < volT(cv) || (volT(cu) == volT(cv))
          val (i, ci, cj) = if (uIsI) (u, cu, cv) else (v, cv, cu)
          val wi = if (globalTail) stats.degree(i).toDouble else ld.get(i).toDouble
          val gi = stats.degree(i).toDouble
          if (volTG(cj) + gi < kappa) {
            volT.add(cj, wi); volT.add(ci, -wi)
            volTG.add(cj, gi); volTG.add(ci, -gi)
            v2cT.put(i, cj)
          }
        }
      }
      idx += 1
    }
    Clustering(v2cH, v2cT, xi, kappa)
  }

  /** Generic single-table allocate/migrate clustering (Hollocou family).
    *
    * @param globalDegrees use precomputed global degrees as volumes (2PS-L)
    *                      instead of running local degrees (Holl/CLUGP)
    * @param splitting     CLUGP's splitting: a vertex joining a saturated
    *                      cluster is split off into a fresh cluster
    */
  def genericCluster(stream: IndexedSeq[Edge], stats: GraphStats, k: Int,
                     globalDegrees: Boolean, splitting: Boolean,
                     kappaOverride: Option[Double] = None): JHashMap[Long, Int] = {
    val kappa = kappaOverride.getOrElse(2.0 * stats.numEdges / k)
    val v2c = new JHashMap[Long, Int]()
    val vol = new GrowableDoubleArray
    val ld = new JHashMap[Long, Int]()
    var next = 0

    def weight(x: Long): Double =
      if (globalDegrees) stats.degree(x).toDouble else ld.getOrDefault(x, 0).toDouble

    var idx = 0
    while (idx < stream.length) {
      val e = stream(idx)
      val u = e.src; val v = e.dst
      if (!v2c.containsKey(u)) {
        v2c.put(u, next); if (globalDegrees) vol.add(next, stats.degree(u)); next += 1
      }
      if (!v2c.containsKey(v)) {
        v2c.put(v, next); if (globalDegrees) vol.add(next, stats.degree(v)); next += 1
      }
      var cu = v2c.get(u); var cv = v2c.get(v)
      if (!globalDegrees) {
        ld.merge(u, 1, _ + _); ld.merge(v, 1, _ + _)
        vol.add(cu, 1.0); vol.add(cv, 1.0)
      }
      if (splitting) {
        // CLUGP: detach an endpoint whose cluster overflowed.
        if (vol(cu) >= kappa && cu != cv) {
          val w = weight(u)
          vol.add(cu, -w); v2c.put(u, next); vol.add(next, w); cu = next; next += 1
        }
        if (vol(cv) >= kappa && cu != cv) {
          val w = weight(v)
          vol.add(cv, -w); v2c.put(v, next); vol.add(next, w); cv = next; next += 1
        }
      }
      if (cu != cv && vol(cu) < kappa && vol(cv) < kappa) {
        val uIsI = vol(cu) <= vol(cv)
        val (i, ci, cj) = if (uIsI) (u, cu, cv) else (v, cv, cu)
        val wi = weight(i)
        if (vol(cj) + wi < kappa || kappaOverride.contains(Double.PositiveInfinity)) {
          vol.add(cj, wi); vol.add(ci, -wi)
          v2c.put(i, cj)
        }
      }
      idx += 1
    }
    v2c
  }
}

/** Auto-growing double array indexed by cluster id. */
final class GrowableDoubleArray {
  private var a = new Array[Double](1024)
  def apply(i: Int): Double = if (i < a.length) a(i) else 0.0
  def add(i: Int, delta: Double): Unit = {
    if (i >= a.length) {
      var n = a.length
      while (n <= i) n *= 2
      a = java.util.Arrays.copyOf(a, n)
    }
    a(i) += delta
  }
  def sizeBytes: Long = a.length.toLong * 8
}
