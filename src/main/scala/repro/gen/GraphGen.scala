package repro.gen

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.core.Edge

/** Deterministic synthetic graph generators.
  *
  * Substitutes for the paper's datasets (DESIGN.md §4): the 11 SNAP/WebGraph
  * crawls are replaced by scaled-down analogs; the TrillionG R-MAT graphs by
  * our own recursive-quadrant R-MAT. All generators are pure functions of a
  * seed, so Spark-generated and driver-generated streams agree.
  */
object GraphGen {

  // ---------------------------------------------------------------- RNG ----

  /** SplitMix64 finalizer — the per-edge, per-draw RNG primitive. */
  def mix(z0: Long): Long = {
    var z = z0 + 0x9E3779B97F4A7C15L
    z = (z ^ (z >>> 30)) * 0xBF58476D1CE4E5B9L
    z = (z ^ (z >>> 27)) * 0x94D049BB133111EBL
    z ^ (z >>> 31)
  }

  /** j-th uniform double in [0,1) for stream element `i` under `seed`. */
  def u01(seed: Long, i: Long, j: Int): Double = {
    val x = mix(mix(seed ^ (i * 0xA24BAED4963EE407L)) + j * 0x9FB21C651E98DF25L)
    (x >>> 11) * (1.0 / (1L << 53).toDouble)
  }

  // -------------------------------------------------------------- R-MAT ----

  /** One R-MAT edge: recursive quadrant descent over a 2^scale × 2^scale
    * adjacency matrix with corner probabilities (a,b,c,d), a+b+c+d=1.
    */
  def rmatEdge(seed: Long, i: Long, scale: Int,
               a: Double, b: Double, c: Double, n: Long): Edge = {
    var src = 0L; var dst = 0L
    var bit = 0
    while (bit < scale) {
      val r = u01(seed, i, bit)
      if (r < a) { /* top-left */ }
      else if (r < a + b) { dst |= (1L << bit) }
      else if (r < a + b + c) { src |= (1L << bit) }
      else { src |= (1L << bit); dst |= (1L << bit) }
      bit += 1
    }
    // Clamp into [0, n) (scale may overshoot n) and kill self-loops.
    src %= n; dst %= n
    if (src == dst) dst = (dst + 1) % n
    Edge(src, dst)
  }

  /** R-MAT stream of `numEdges` edges over `numVertices` vertices. */
  def rmat(numVertices: Long, numEdges: Long, seed: Long,
           a: Double = 0.57, b: Double = 0.19, c: Double = 0.19): IndexedSeq[Edge] = {
    val scale = math.max(1, 64 - java.lang.Long.numberOfLeadingZeros(numVertices - 1))
    (0L until numEdges).map(i => rmatEdge(seed, i, scale, a, b, c, numVertices))
  }

  // ---------------------------------------------- community (web-like) ----

  /** Community-structured power-law graph: stands in for web crawls, which
    * have strong locality (low-conductance host-level clusters) plus
    * power-law hubs. `pIntra` of edges stay within a community; endpoints
    * inside a community are hub-biased (zipf-ish rank exponent `hubBias`).
    */
  def community(numVertices: Long, numEdges: Long, seed: Long,
                pIntra: Double = 0.96, hubBias: Double = 0.75,
                commExp: Double = 1.4, dstBias: Double = 0.2): IndexedSeq[Edge] = {
    // Power-law community sizes: size(rank) ∝ rank^-commExp, min size 8.
    val sizes = scala.collection.mutable.ArrayBuffer.empty[Long]
    var total = 0L
    var rank = 1
    val base = math.max(8.0, numVertices / 40.0)
    while (total < numVertices) {
      val s = math.max(8L, (base / math.pow(rank, commExp)).toLong)
      val sz = math.min(s, numVertices - total)
      sizes += sz; total += sz; rank += 1
    }
    val starts = sizes.scanLeft(0L)(_ + _).toArray // community start offsets
    val nc = sizes.length
    // Communities are picked proportionally to size so avg degree is even.
    val cum = new Array[Double](nc)
    var acc = 0.0
    var ci = 0
    while (ci < nc) { acc += sizes(ci).toDouble; cum(ci) = acc; ci += 1 }

    def pickCommunity(r: Double): Int = {
      val target = r * acc
      var lo = 0; var hi = nc - 1
      while (lo < hi) { val mid = (lo + hi) / 2; if (cum(mid) < target) lo = mid + 1 else hi = mid }
      lo
    }
    /** Hub-biased member: rank drawn with an inverse-power CDF. */
    def member(c: Int, r: Double, bias: Double): Long = {
      val sz = sizes(c)
      val x = math.pow(r, 1.0 / (1.0 - bias)) // small x ⇒ hubby
      val off = math.min(sz - 1, (x * sz).toLong)
      starts(c) + off
    }

    (0L until numEdges).map { i =>
      val c = pickCommunity(u01(seed, i, 0))
      if (u01(seed, i, 1) < pIntra || nc == 1) {
        val s = member(c, u01(seed, i, 2), hubBias)
        var d = member(c, u01(seed, i, 3), dstBias)
        if (d == s) d = starts(c) + ((d - starts(c) + 1) % sizes(c))
        Edge(s, d)
      } else {
        // Cross edge: this community's hub links to another community's hub.
        val c2raw = pickCommunity(u01(seed, i, 4))
        val c2 = if (c2raw == c) (c2raw + 1) % nc else c2raw
        Edge(member(c, u01(seed, i, 5), hubBias), member(c2, u01(seed, i, 6), hubBias))
      }
    }
  }

  /** Social-network analog: community structure (real social graphs have
    * strong communities) with weaker locality than web crawls, plus a
    * fraction of global hub edges (power-law celebrities cutting across
    * communities). This is the structure S5P's skew-awareness exploits on
    * OK/TW/FR/LJ — a plain R-MAT mixer has no communities at lite scale and
    * cannot reproduce the clustering-family behavior (DESIGN.md §4).
    */
  def social(numVertices: Long, numEdges: Long, seed: Long,
             pIntra: Double = 0.78, hubBias: Double = 0.55,
             pHub: Double = 0.10, commExp: Double = 1.3): IndexedSeq[Edge] = {
    // Community cores are dense (dstBias 0.4) with mild internal skew; the
    // hub-degree-to-κ ratio mirrors the paper's graphs (hubs ≈ 1–10% of
    // 2|E|/k), which lite scaling would otherwise distort.
    val base = community(numVertices, numEdges, seed, pIntra, hubBias, commExp,
      dstBias = 0.4)
    base.zipWithIndex.map { case (e, i) =>
      if (u01(seed, i.toLong, 7) < pHub) {
        // Global hub edge: zipf-ranked celebrity → uniform vertex.
        val r = u01(seed, i.toLong, 8)
        val hub = math.min(numVertices - 1, (math.pow(r, 2.0) * numVertices).toLong)
        var dst = (u01(seed, i.toLong, 9) * numVertices).toLong
        if (dst == hub) dst = (dst + 1) % numVertices
        Edge(hub, dst)
      } else e
    }
  }

  // ----------------------------------------- small random simple graphs ----

  /** Connected random simple graph with exactly (n, m) — the Table 5 tiny
    * instances (the paper does not publish Gα/Gβ/Gγ; DESIGN.md §4).
    */
  def smallConnected(n: Int, m: Int, seed: Long): IndexedSeq[Edge] = {
    require(m >= n - 1 && m <= n.toLong * (n - 1) / 2, s"infeasible ($n,$m)")
    val edges = scala.collection.mutable.LinkedHashSet.empty[(Long, Long)]
    // Spanning path first (connectivity), then random extra edges.
    var i = 0
    val perm = (0 until n).toArray
    // Fisher–Yates with the deterministic RNG.
    var k = n - 1
    while (k > 0) {
      val j = (u01(seed, k.toLong, 0) * (k + 1)).toInt
      val t = perm(k); perm(k) = perm(j); perm(j) = t
      k -= 1
    }
    while (i < n - 1) {
      val a = perm(i).toLong; val b = perm(i + 1).toLong
      edges += ((math.min(a, b), math.max(a, b)))
      i += 1
    }
    var draw = 0L
    while (edges.size < m) {
      val a = (u01(seed, draw, 1) * n).toInt.toLong
      val b = (u01(seed, draw, 2) * n).toInt.toLong
      if (a != b) edges += ((math.min(a, b), math.max(a, b)))
      draw += 1
    }
    edges.toIndexedSeq.map { case (a, b) => Edge(a, b) }
  }

  // -------------------------------------------------- Fig. 3 toy fixture ----

  /** 12-vertex / 14-edge toy graph in the spirit of Figure 3: hubs v0,v1,v2
    * are head vertices (degree > ξ = 2·14/12 ≈ 2.33); edge index = arrival.
    */
  val toyGraph: IndexedSeq[Edge] = IndexedSeq(
    Edge(3, 4), Edge(4, 5), Edge(5, 6), Edge(2, 7),   // e1..e4 (tail)
    Edge(1, 2), Edge(0, 1),                           // e5,e6 (head)
    Edge(1, 8), Edge(0, 9), Edge(2, 9), Edge(2, 10),  // e7..e10
    Edge(2, 11), Edge(0, 2), Edge(1, 10), Edge(3, 6)  // e11..e14 (e12 head)
  )

  // --------------------------------------------------- dataset registry ----

  /** A named dataset: a generator plus the paper's reported statistics, so
    * Table 2 can print paper-vs-ours side by side.
    */
  final case class GraphSpec(name: String, kind: String,
                             numVertices: Long, numEdges: Long,
                             gen: () => IndexedSeq[Edge],
                             paperV: String, paperE: String,
                             paperSkew: (Double, Double, Double, String))

  private def socialSpec(name: String, v: Long, e: Long, seed: Long,
                         pv: String, pe: String, sk: (Double, Double, Double, String)) =
    GraphSpec(name, "Social", v, e, () => social(v, e, seed), pv, pe, sk)

  private def web(name: String, v: Long, e: Long, seed: Long,
                  pv: String, pe: String, sk: (Double, Double, Double, String)) =
    GraphSpec(name, "Web", v, e, () => community(v, e, seed), pv, pe, sk)

  private def synth(name: String, v: Long, e: Long, seed: Long,
                    pv: String, pe: String, sk: (Double, Double, Double, String)) =
    GraphSpec(name, "Synthetic", v, e, () => rmat(v, e, seed, 0.57, 0.19, 0.19), pv, pe, sk)

  /** Scaled-down analogs of Table 2 (~1/1000 of the paper's edges, capped at
    * 1M edges; avg degree preserved). Skew tuple = paper's (ρ, ρ1, ρ2, ρ3).
    */
  val registry: IndexedSeq[GraphSpec] = IndexedSeq(
    socialSpec("OK",  3100,   117000,  11, "3.1M",  "117M", (2.13, 0.49, 0.61, "108M")),
    socialSpec("TW",  28000,  1000000, 12, "42M",   "1.5B", (1.43, 0.03, 0.07, "1.3B")),
    socialSpec("FR",  33000,  900000,  13, "66M",   "1.8B", (2.56, 0.39, 1.00, "1.6B")),
    socialSpec("LJ",  4000,   35000,   14, "4M",    "35M",  (2.40, 0.38, 0.79, "227M")),
    web("IT",   34200,  1000000, 15, "41M",   "1.2B", (1.74, 0.06, 0.13, "1B")),
    web("UK7",  28600,  1000000, 16, "106M",  "3.7B", (1.31, 0.10, 0.20, "3.4B")),
    web("IN",   1000,   16000,   17, "1M",    "16M",  (1.36, 0.15, 0.31, "12M")),
    web("SK",   26800,  1000000, 18, "51M",   "1.9B", (1.11, 0.04, 0.07, "1.8B")),
    web("UK2",  18000,  298000,  19, "18M",   "298M", (2.06, 0.21, 0.38, "243M")),
    web("AR",   23000,  639000,  20, "23M",   "639M", (1.62, 0.10, 0.19, "572M")),
    web("WB",   59000,  500000,  21, "118M",  "1B",   (2.21, 0.11, 0.23, "665M")),
    synth("G1", 10400,  314000,  31, "1.04M", "314M", (0.89, 0.15, 0.44, "102M")),
    synth("G2", 10400,  629000,  32, "1.04M", "629M", (0.87, 0.17, 0.48, "626M")),
    synth("G3", 10400,  1040000, 33, "1.04M", "1.04B",(0.84, 0.19, 0.52, "1B")),
    synth("G4", 16800,  168000,  34, "67.1M", "671M", (1.16, 0.048, 0.145, "469M")),
    synth("G5", 16800,  503000,  35, "67.1M", "2.01B",(1.11, 0.051, 0.152, "1B")),
    synth("G6", 16800,  1000000, 36, "67.1M", "3.36B",(1.07, 0.053, 0.157, "3B")),
  )

  def byName(name: String): GraphSpec =
    registry.find(_.name == name).getOrElse(sys.error(s"unknown graph $name"))

  /** Spark-side dataset: the same stream as `spec.gen()` but materialized
    * through a DataFrame (eid, src, dst).
    */
  def toDf(spark: SparkSession, edges: IndexedSeq[Edge]): DataFrame =
    repro.core.GraphOps.toEdgeDf(spark, edges)
}
