package repro.core

import scala.collection.mutable.ArrayBuffer
import scala.util.Random

/** The sofa algorithm (Algorithm 2): one pass over the left vertices,
  * maintaining at most `cMax` weighted centers, each with a mergeable
  * Misra–Gries sketch of the right-vertex frequencies of the vertices
  * assigned to it. Built on the importance-sampling streaming k-medians
  * of Braverman et al. (SODA'11): a vertex at distance `d` from its
  * closest center becomes a new center with probability
  * `min(w·d/f, 1)` where `f = LB/(k(1+log n))`; when the center budget
  * overflows or the accumulated cost exceeds `2·LB`, the lower bound is
  * doubled and the pass restarts on the stream made of the current
  * (weighted) centers followed by the unread suffix.
  *
  * Distances use the asymmetric weighted Hamming distance of
  * Section 5.1 with `alpha = 0.1` by default.
  */
object Sofa {

  /** Algorithm parameters.
    *
    * @param k           number of clusters to output
    * @param cMax        center budget (paper: 20k on real data)
    * @param nRight      number of right-side vertices `n`
    * @param mgCapacity  counters per Misra–Gries sketch (paper: max(3s, 0.05n))
    * @param alpha       asymmetric Hamming weight (1.0 = symmetric)
    * @param seed        RNG seed for the importance sampling
    * @param maxRestarts safety cap on LB doublings; when exhausted the
    *                    remaining stream is assigned greedily
    */
  final case class Config(
      k: Int,
      cMax: Int,
      nRight: Int,
      mgCapacity: Int,
      alpha: Double = 0.1,
      seed: Long = 42L,
      maxRestarts: Int = 64,
  ) {
    require(k >= 1, s"k must be >= 1, got $k")
    require(cMax > k, s"cMax ($cMax) must exceed k ($k)")
    require(nRight >= 1 && mgCapacity >= 1)
  }

  /** A weighted center: representative vector, total assigned weight,
    * and the merged sketch of all member neighborhoods. A fresh stream
    * vertex is a center of weight 1 whose sketch holds its own edges.
    */
  final class Center(
      val vec: SparseVec,
      var weight: Long,
      val mg: MisraGries,
  ) extends Serializable {
    def copyOf(): Center = new Center(vec, weight, mg.copy())
    override def toString: String = s"Center(nnz=${vec.nnz}, w=$weight)"
  }

  /** Wrap a raw stream vertex as a weight-1 center. */
  def freshItem(vec: SparseVec, cfg: Config): Center =
    new Center(vec, 1L, MisraGries.ofVector(vec, cfg.mgCapacity))

  /** Run the first pass over `items` and return the surviving centers
    * (at most `cMax − 1` after the final non-overflowing pass).
    *
    * `items` may mix fresh vertices and previously computed centers —
    * this is exactly how restarts work internally and how the
    * distributed version merges per-partition center sets.
    */
  def cluster(items: Iterator[Center], cfg: Config): IndexedSeq[Center] = {
    val rng = new Random(cfg.seed)
    var lb = 1.0
    var restarts = 0
    var pending: Iterator[Center] = items

    while (true) {
      val centers = ArrayBuffer.empty[Center]
      val f = lb / (cfg.k * (1.0 + math.log(cfg.nRight.toDouble)))
      var cost = 0.0
      var overflow = false

      while (pending.hasNext && !overflow) {
        val u = pending.next()
        if (centers.isEmpty) {
          centers += u
        } else {
          var best = 0; var bestD = Double.MaxValue
          var j = 0
          while (j < centers.length) {
            val d = centers(j).vec.asymDistTo(u.vec, cfg.alpha)
            if (d < bestD) { bestD = d; best = j }
            j += 1
          }
          val sampled = restarts < cfg.maxRestarts &&
            rng.nextDouble() < math.min(u.weight.toDouble * bestD / f, 1.0)
          if (sampled) {
            centers += u
            if (centers.length >= cfg.cMax) overflow = true
          } else {
            cost += u.weight.toDouble * bestD
            val c = centers(best)
            c.weight += u.weight
            c.mg.merge(u.mg)
            if (cost > 2.0 * lb) overflow = true
          }
        }
      }

      if (!overflow && !pending.hasNext) return centers.toIndexedSeq

      // Restart: double LB, re-stream current centers then the unread tail.
      // (Iterator.++ takes its argument by name — capture the current
      // tail in a val first, or the new iterator would lazily re-read
      // the reassigned `pending` var and reference itself.)
      lb *= 2.0
      restarts += 1
      val unread = pending
      pending = centers.iterator ++ unread
    }
    sys.error("unreachable")
  }

  /** Postprocessing with the static k-medians step (Lines 21–25): group
    * the centers into `k` clusters, merge each group's sketches, and
    * for every threshold `θ` emit right clusters
    * `Ṽ_i = { j : counter_i(j) ≥ θ·W_i }` where `W_i` is the group's
    * total weight. All thresholds reuse the same grouping, as in
    * Section 5.4 ("multiple thresholds").
    *
    * @return per-θ array of right clusters (index i = cluster i)
    */
  def postprocessKMedians(
      centers: IndexedSeq[Center],
      cfg: Config,
      thetas: Seq[Double],
  ): Map[Double, Array[SparseVec]] = {
    if (centers.isEmpty) return thetas.map(_ -> Array.empty[SparseVec]).toMap
    val pts = centers.map(c => KMedians.WPoint(c.vec, c.weight))
    val res = KMedians.cluster(pts, cfg.k, cfg.alpha, seed = cfg.seed)
    val groups: Map[Int, IndexedSeq[Int]] =
      centers.indices.groupBy(res.assignment)
    val merged: Seq[(MisraGries, Long)] = groups.toSeq.sortBy(_._1).map { case (_, members) =>
      val mg = MisraGries(cfg.mgCapacity)
      var w = 0L
      members.foreach { i => mg.merge(centers(i).mg); w += centers(i).weight }
      (mg, w)
    }
    thetas.map { theta =>
      theta -> merged.map { case (mg, w) => threshold(mg, theta, w) }.toArray
    }.toMap
  }

  /** Postprocessing variant of Section 5.3 (BMF): skip k-medians and
    * emit one candidate right cluster per center. May return up to
    * `cMax` clusters; the second pass scores them and keeps the top k.
    */
  def postprocessPerCenter(
      centers: IndexedSeq[Center],
      theta: Double,
  ): Array[SparseVec] =
    centers.map(c => threshold(c.mg, theta, c.weight)).toArray

  /** `{ j : estimate(j) ≥ θ·W }` as a sparse vector. */
  def threshold(mg: MisraGries, theta: Double, totalWeight: Long): SparseVec = {
    val cut = theta * totalWeight
    SparseVec.fromArray(mg.entries.collect { case (j, c) if c >= cut => j }.toArray)
  }
}

/** Algorithm 1: the greedy variant analyzed in Theorem 1. Opens a new
  * center whenever the incoming vertex is farther than `alphaDist`
  * (symmetric Hamming) from every existing center, otherwise merges it
  * into the closest one. Postprocessing thresholds each center's sketch
  * at `θ·n_c`.
  */
object GreedyBicluster {

  final case class Result(centers: IndexedSeq[Sofa.Center], clusters: Array[SparseVec])

  def run(
      stream: Iterator[SparseVec],
      alphaDist: Double,
      theta: Double,
      mgCapacity: Int,
  ): Result = {
    val centers = ArrayBuffer.empty[Sofa.Center]
    stream.foreach { x =>
      var best = -1; var bestD = Double.MaxValue
      var j = 0
      while (j < centers.length) {
        val d = centers(j).vec.hamming(x).toDouble
        if (d < bestD) { bestD = d; best = j }
        j += 1
      }
      if (best < 0 || bestD > alphaDist) {
        centers += new Sofa.Center(x, 1L, MisraGries.ofVector(x, mgCapacity))
      } else {
        val c = centers(best)
        c.weight += 1L
        c.mg.merge(MisraGries.ofVector(x, mgCapacity))
      }
    }
    val clusters = centers.map(c => Sofa.threshold(c.mg, theta, c.weight)).toArray
    Result(centers.toIndexedSeq, clusters)
  }
}
