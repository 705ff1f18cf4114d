package repro.core

/** Count-Min Sketch (Cormode & Muthukrishnan) over long keys.
  *
  * The paper uses a CMS to hold the inter-cluster edge counts Θ(c_i, c_j)
  * (§4.4): the key is the (ordered) cluster-ID pair, the value the spanning
  * edge count. Estimates overestimate by at most ε·N with probability 1−ν,
  * where N is the total inserted weight.
  *
  * @param epsilon additive error fraction (paper default 0.1)
  * @param nu      failure probability (paper default 0.01)
  */
final class CountMinSketch(val epsilon: Double = 0.1, val nu: Double = 0.01) {
  val width: Int = math.ceil(math.E / epsilon).toInt
  val depth: Int = math.ceil(math.log(1.0 / nu)).toInt
  private val table = Array.ofDim[Long](depth, width)
  private var totalWeight = 0L

  /** Row-r hash of a long key (splitmix with a per-row salt). */
  private def bucket(key: Long, r: Int): Int = {
    val h = GenHash.mix(key ^ (r.toLong * 0x8E9D5AAF53C1F2EDL))
    ((h % width).toInt + width) % width
  }

  def add(key: Long, w: Long = 1L): Unit = {
    var r = 0
    while (r < depth) { table(r)(bucket(key, r)) += w; r += 1 }
    totalWeight += w
  }

  /** Point estimate: min over rows; never underestimates. */
  def estimate(key: Long): Long = {
    var best = Long.MaxValue
    var r = 0
    while (r < depth) {
      val v = table(r)(bucket(key, r))
      if (v < best) best = v
      r += 1
    }
    if (best == Long.MaxValue) 0L else best
  }

  def total: Long = totalWeight

  /** Accounted state footprint in bytes (Table 4 memory column). */
  def stateBytes: Long = depth.toLong * width * 8
}

/** Shared hash helpers (also used by the generators' RNG). */
object GenHash {
  def mix(z0: Long): Long = {
    var z = z0 + 0x9E3779B97F4A7C15L
    z = (z ^ (z >>> 30)) * 0xBF58476D1CE4E5B9L
    z = (z ^ (z >>> 27)) * 0x94D049BB133111EBL
    z ^ (z >>> 31)
  }

  /** Order-independent pairing of two non-negative ints into one long key. */
  def pairKey(a: Int, b: Int): Long = {
    val lo = math.min(a, b).toLong
    val hi = math.max(a, b).toLong
    (hi << 32) | lo
  }
}
