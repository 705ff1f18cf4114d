package repro.core

import java.util.{HashMap => JHashMap}
import scala.concurrent.{Await, Future}
import scala.concurrent.duration.Duration
import scala.concurrent.ExecutionContext.Implicits.global

/** The cluster-level view the game plays over.
  *
  * Cluster ids are unified and dense: head clusters occupy [0, numHead),
  * tail clusters [numHead, numClusters). Sizes attribute each edge to its
  * endpoint clusters (internal edge: 1; spanning edge: ½ + ½, keeping
  * Σ|c| = |E| as Eq. 11/12 assume — DESIGN.md §6). Θ(c_i, c_j) counts
  * spanning edges plus one unit per vertex shared between a head and a tail
  * cluster (the leader→follower coupling channel).
  */
final class GameInput(val numHead: Int, val numClusters: Int,
                      val size: Array[Double],
                      val nbrs: Array[Array[Int]],
                      val weightOf: (Int, Int) => Long,
                      val thetaStateBytes: Long,
                      /** dense-id remaps back into the clustering tables */
                      val headIdOf: JHashMap[Int, Int],
                      val tailIdOf: JHashMap[Int, Int]) {
  def cutTotal(c: Int): Long = {
    var s = 0L; var i = 0
    val ns = nbrs(c)
    while (i < ns.length) { s += weightOf(c, ns(i)); i += 1 }
    s
  }
  def stateBytes: Long =
    thetaStateBytes + size.length * 8L + nbrs.map(_.length * 4L + 16L).sum
}

object GameInput {

  /** Build the game view with one extra pass over the stream.
    *
    * @param useCms store Θ in a Count-Min Sketch (§4.4); otherwise an exact
    *               pair→count map (the paper's red-black-tree baseline)
    */
  def build(stream: IndexedSeq[Edge], stats: GraphStats, clustering: Clustering,
            useCms: Boolean, eps: Double = 0.1, nu: Double = 0.01): GameInput = {
    // Dense remap of the surviving (post-migration) cluster labels.
    val headDense = new JHashMap[Int, Int]()
    val tailDense = new JHashMap[Int, Int]()
    clustering.v2cH.values().forEach(c => if (!headDense.containsKey(c)) headDense.put(c, headDense.size))
    clustering.v2cT.values().forEach(c => if (!tailDense.containsKey(c)) tailDense.put(c, tailDense.size))
    val nH = headDense.size
    val n = nH + tailDense.size

    val size = new Array[Double](n)
    val nbrSets = Array.fill(n)(new java.util.HashSet[Int]())
    val cms = if (useCms) new CountMinSketch(eps, nu) else null
    val exact = if (useCms) null else new JHashMap[Long, Long]()

    def addTheta(a: Int, b: Int): Unit = {
      nbrSets(a).add(b); nbrSets(b).add(a)
      val key = GenHash.pairKey(a, b)
      if (useCms) cms.add(key) else exact.merge(key, 1L, _ + _)
    }

    val xi = clustering.xi
    var i = 0
    while (i < stream.length) {
      val e = stream(i)
      val head = SkewClustering.isHeadEdge(e, stats, xi)
      val (cu, cv) =
        if (head)
          (headDense.get(clustering.v2cH.get(e.src)),
           headDense.get(clustering.v2cH.get(e.dst)))
        else
          (nH + tailDense.get(clustering.v2cT.get(e.src)),
           nH + tailDense.get(clustering.v2cT.get(e.dst)))
      if (cu == cv) size(cu) += 1.0
      else { size(cu) += 0.5; size(cv) += 0.5; addTheta(cu, cv) }
      i += 1
    }

    // Leader→follower coupling: a vertex living in both tables is replicated
    // iff its head and tail clusters land on different partitions.
    val it = clustering.v2cH.entrySet().iterator()
    while (it.hasNext) {
      val ent = it.next()
      val tc = clustering.v2cT.get(ent.getKey)
      if (tc != null) addTheta(headDense.get(ent.getValue), nH + tailDense.get(tc))
    }

    val nbrs = nbrSets.map { s =>
      val a = new Array[Int](s.size)
      var j = 0; val itr = s.iterator()
      while (itr.hasNext) { a(j) = itr.next(); j += 1 }
      a
    }
    val weightOf: (Int, Int) => Long =
      if (useCms) (a, b) => cms.estimate(GenHash.pairKey(a, b))
      else (a, b) => exact.getOrDefault(GenHash.pairKey(a, b), 0L)
    val thetaBytes = if (useCms) cms.stateBytes else exact.size.toLong * 48L
    new GameInput(nH, n, size, nbrs, weightOf, thetaBytes, headDense, tailDense)
  }

  /** Game view over a single (undifferentiated) cluster table — used by the
    * one-stage ablation and by CLUGP (no head/tail split: every player is a
    * "follower" and numHead = 0).
    */
  def buildSingle(stream: IndexedSeq[Edge], v2c: JHashMap[Long, Int],
                  useCms: Boolean, eps: Double = 0.1, nu: Double = 0.01): GameInput = {
    val dense = new JHashMap[Int, Int]()
    v2c.values().forEach(c => if (!dense.containsKey(c)) dense.put(c, dense.size))
    val n = dense.size
    val size = new Array[Double](n)
    val nbrSets = Array.fill(n)(new java.util.HashSet[Int]())
    val cms = if (useCms) new CountMinSketch(eps, nu) else null
    val exact = if (useCms) null else new JHashMap[Long, Long]()
    var i = 0
    while (i < stream.length) {
      val e = stream(i)
      val cu = dense.get(v2c.get(e.src)); val cv = dense.get(v2c.get(e.dst))
      if (cu == cv) size(cu) += 1.0
      else {
        size(cu) += 0.5; size(cv) += 0.5
        nbrSets(cu).add(cv); nbrSets(cv).add(cu)
        val key = GenHash.pairKey(cu, cv)
        if (useCms) cms.add(key) else exact.merge(key, 1L, _ + _)
      }
      i += 1
    }
    val nbrs = nbrSets.map { s =>
      val a = new Array[Int](s.size)
      var j = 0; val itr = s.iterator()
      while (itr.hasNext) { a(j) = itr.next(); j += 1 }
      a
    }
    val weightOf: (Int, Int) => Long =
      if (useCms) (a, b) => cms.estimate(GenHash.pairKey(a, b))
      else (a, b) => exact.getOrDefault(GenHash.pairKey(a, b), 0L)
    val thetaBytes = if (useCms) cms.stateBytes else exact.size.toLong * 48L
    new GameInput(0, n, size, nbrs, weightOf, thetaBytes, new JHashMap(), dense)
  }
}

/** Algorithm 2 — cluster-to-partition assignment via a two-stage Stackelberg
  * game solved with best-response dynamics (leaders first each round), or a
  * one-stage simultaneous pool when `twoStage = false`.
  */
object StackelbergGame {

  /** @param capacity edge capacity of one partition (L). A cluster larger
    *                  than L can only materialize L edges there — clamping
    *                  its load contribution keeps a giant singleton hub
    *                  cluster from scaring every other player away from its
    *                  partition. Infinite by default (the pure game).
    */
  final case class Config(twoStage: Boolean = true, maxRounds: Int = 50,
                          batchSize: Int = 512, threads: Int = 1,
                          capacity: Double = Double.PositiveInfinity)

  final case class Result(c2p: Array[Int], rounds: Int, delta: Double,
                          welfare: Double, stateBytes: Long)

  /** δ = δ_max of Eq. 12: k·Σ(F(c)+|c|) / (Σ|c|)². */
  def delta(in: GameInput, k: Int): Double = {
    var num = 0.0; var den = 0.0
    var c = 0
    while (c < in.numClusters) {
      num += in.cutTotal(c) + in.size(c)
      den += in.size(c)
      c += 1
    }
    if (den == 0) 0.0 else k * num / (den * den)
  }

  /** Social welfare of Eq. 5 under placement `c2p` (Theorem 4 form: the sum
    * of all individual cluster costs, Eq. 6).
    */
  def welfare(in: GameInput, k: Int, d: Double, c2p: Array[Int]): Double = {
    val load = new Array[Double](k)
    var c = 0
    while (c < in.numClusters) { load(c2p(c)) += in.size(c); c += 1 }
    var s = 0.0
    c = 0
    while (c < in.numClusters) {
      var cut = 0L
      val ns = in.nbrs(c)
      var j = 0
      while (j < ns.length) {
        if (c2p(ns(j)) != c2p(c)) cut += in.weightOf(c, ns(j))
        j += 1
      }
      s += d / k * in.size(c) * load(c2p(c)) + (cut + in.size(c)) / k
      c += 1
    }
    s
  }

  def solve(in: GameInput, k: Int, cfg: Config = Config()): Result = {
    val n = in.numClusters
    val c2p = new Array[Int](n)
    val load = new Array[Double](k)
    def effSize(c: Int): Double = math.min(in.size(c), cfg.capacity)
    // Initialization: largest-first onto the least-loaded partition.
    val order = (0 until n).sortBy(c => -in.size(c))
    for (c <- order) {
      var best = 0; var p = 1
      while (p < k) { if (load(p) < load(best)) best = p; p += 1 }
      c2p(c) = best; load(best) += effSize(c)
    }
    val d = delta(in, k)

    /** Best response of cluster c against the current placement. */
    def bestResponse(c: Int): Int = {
      val same = new Array[Long](k)
      val ns = in.nbrs(c)
      var j = 0
      while (j < ns.length) {
        same(c2p(ns(j))) += in.weightOf(c, ns(j))
        j += 1
      }
      val cur = c2p(c)
      var best = cur
      var bestScore = Double.MaxValue
      var p = 0
      while (p < k) {
        val loadOther = load(p) - (if (p == cur) effSize(c) else 0.0)
        val score = d * effSize(c) * loadOther - same(p)
        if (score < bestScore - 1e-12) { bestScore = score; best = p }
        p += 1
      }
      // Keep the current strategy on ties (stability).
      val curLoadOther = load(cur) - effSize(c)
      if (math.abs(d * effSize(c) * curLoadOther - same(cur) - bestScore) < 1e-12) cur
      else best
    }

    def move(c: Int, p: Int): Boolean = {
      if (p == c2p(c)) false
      else {
        load(c2p(c)) -= effSize(c); load(p) += effSize(c); c2p(c) = p
        true
      }
    }

    /** One stage: best responses for `ids`, sequential or batch-parallel. */
    def stage(ids: Range): Boolean = {
      var changed = false
      if (cfg.threads <= 1) {
        for (c <- ids) if (move(c, bestResponse(c))) changed = true
      } else {
        // Batches compute against a frozen snapshot, moves apply in order —
        // the paper's thread-pool batching (§4.4 Parallelism).
        ids.grouped(cfg.batchSize).foreach { batch =>
          val proposals = Await.result(
            Future.traverse(batch.toList)(c => Future((c, bestResponse(c)))),
            Duration.Inf)
          proposals.foreach { case (c, p) => if (move(c, p)) changed = true }
        }
      }
      changed
    }

    var rounds = 0
    var changed = true
    while (changed && rounds < cfg.maxRounds) {
      changed = false
      if (cfg.twoStage) {
        if (stage(0 until in.numHead)) changed = true          // Stage 1: leaders
        if (stage(in.numHead until n)) changed = true          // Stage 2: followers
      } else {
        if (stage(0 until n)) changed = true                   // one-stage pool
      }
      rounds += 1
    }
    Result(c2p, rounds, d, welfare(in, k, d, c2p),
           in.stateBytes + n * 4L + k * 8L)
  }
}
