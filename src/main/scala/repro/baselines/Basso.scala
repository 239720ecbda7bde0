package repro.baselines

import org.apache.spark.sql.{Dataset, SparkSession}

import repro.core.{LeftAssignment, LeftVertex, Metrics, SparseVec}

/** Signals that the dense association matrix would not fit the memory
  * budget — reproduces the paper's basso out-of-memory on Wiki.
  */
final class BassoOutOfMemory(msg: String) extends RuntimeException(msg)

/** basso — the Asso algorithm of Miettinen et al. (TKDE'08), the static
  * BMF baseline of Section 6.2.
  *
  * 1. Build the dense column-association matrix
  *    `assoc(i)(j) = |{rows containing both i and j}|` (Spark
  *    per-partition dense accumulation + array reduce).
  * 2. Candidate basis vectors: `B_i = { j : assoc(i,j) ≥ τ·n_i }`.
  * 3. Greedily pick `k` basis vectors maximizing the cover gain
  *    `Σ_rows max(0, score(B | Γ(u), Y_u))` (the same score as
  *    Section 4.2), with each row's covered set `Y_u` replayed from
  *    the previously chosen basis in order.
  *
  * The matrix is flipped so the *smaller* side provides the columns
  * (the paper flips when |U| > |V| for the same reason: the quadratic
  * dimension must be the small one). If the dense association matrix
  * exceeds `maxAssocCells`, a [[BassoOutOfMemory]] is thrown.
  *
  * Because Asso is greedy, the basis for `k' < k` is a prefix of the
  * basis for `k`; [[Model.evaluate]] evaluates any prefix, so one `fit`
  * serves all k values of the evaluation grid.
  */
object Basso {

  final case class Config(
      kMax: Int,
      tau: Double,
      maxAssocCells: Long = 100_000_000L,
  )

  final class Model(
      val rows: Dataset[LeftVertex],
      val nCols: Int,
      val basis: Array[SparseVec],
      val flipped: Boolean,
      val assocCells: Long,
  ) {
    /** Evaluate the first `kPrefix` basis vectors: per-row usage (Asso
      * rule: use basis t if its score is positive given the cover so
      * far, in chosen order) and reconstruction quality.
      */
    def evaluate(kPrefix: Int)(implicit spark: SparkSession): (Array[SparseVec], Dataset[LeftAssignment], Metrics.BmfQuality) = {
      import spark.implicits._
      val use = basis.take(kPrefix)
      val bc = spark.sparkContext.broadcast(use)
      val assign = rows.map(lv => LeftAssignment(lv.u, usageInOrder(lv.vec, bc.value)))
      val q =
        if (use.isEmpty) Metrics.BmfQuality(0L, 0L, totalOnes(rows))
        else Metrics.bmfQuality(rows, assign, use)
      (use, assign, q)
    }
  }

  /** Fit on the (auto-flipped) matrix. `left` is the original stream,
    * `nRight` the original number of right vertices.
    */
  def fit(
      left: Dataset[LeftVertex],
      nRight: Int,
      cfg: Config,
  )(implicit spark: SparkSession): Model = {
    val mU = left.count()
    val flip = nRight > mU
    val rows = if (flip) transpose(left, nRight) else left
    val nCols = if (flip) mU.toInt else nRight
    fitOriented(rows, nCols, cfg, flip)
  }

  def fitOriented(
      rows: Dataset[LeftVertex],
      nCols: Int,
      cfg: Config,
      flipped: Boolean,
  )(implicit spark: SparkSession): Model = {
    import spark.implicits._
    val cells = nCols.toLong * nCols.toLong
    if (cells > cfg.maxAssocCells)
      throw new BassoOutOfMemory(
        s"dense association matrix needs $cells cells > budget ${cfg.maxAssocCells} " +
          "(the paper's basso likewise ran out of memory on its largest dataset)")

    val cached = rows.cache()

    // Dense association counts, accumulated per partition then summed.
    // Few, fat partitions: each partial is an n² Int array, so keep the
    // partial count low to stay within the driver result-size budget.
    val n = nCols
    val assoc: Array[Int] = cached
      .coalesce(8)
      .mapPartitions { it =>
        val acc = new Array[Int](n * n)
        it.foreach { lv =>
          val idx = lv.nbrs
          var a = 0
          while (a < idx.length) {
            val base = idx(a) * n
            var b = 0
            while (b < idx.length) { acc(base + idx(b)) += 1; b += 1 }
            a += 1
          }
        }
        Iterator.single(acc)
      }
      .reduce { (x, y) =>
        var i = 0
        while (i < x.length) { x(i) += y(i); i += 1 }
        x
      }

    // τ-thresholded candidates (one per column with support).
    val candidates: Array[SparseVec] = (0 until n).flatMap { i =>
      val ni = assoc(i * n + i)
      if (ni <= 0) None
      else {
        val cut = cfg.tau * ni
        val members = (0 until n).filter(j => assoc(i * n + j) >= cut)
        Some(SparseVec.fromArray(members.toArray))
      }
    }.toArray

    // Greedy basis selection.
    val chosen = scala.collection.mutable.ArrayBuffer.empty[SparseVec]
    val used = scala.collection.mutable.Set.empty[Int]
    var round = 0
    var stop = candidates.isEmpty
    while (round < cfg.kMax && !stop) {
      val bcChosen = spark.sparkContext.broadcast(chosen.toArray)
      val bcCand = spark.sparkContext.broadcast(candidates)
      val gains: Array[Long] = cached
        .mapPartitions { it =>
          val cand = bcCand.value
          val prev = bcChosen.value
          val g = new Array[Long](cand.length)
          it.foreach { lv =>
            val row = lv.vec
            var y = SparseVec.empty
            // Replay this row's usage of the already-chosen basis.
            var t = 0
            while (t < prev.length) {
              if (repro.core.SecondPass.score(prev(t), row, y) > 0) y = y.union(prev(t))
              t += 1
            }
            var c = 0
            while (c < cand.length) {
              val s = repro.core.SecondPass.score(cand(c), row, y)
              if (s > 0) g(c) += s
              c += 1
            }
          }
          Iterator.single(g)
        }
        .reduce { (x, y) =>
          var i = 0
          while (i < x.length) { x(i) += y(i); i += 1 }
          x
        }
      var best = -1; var bestGain = 0L
      var c = 0
      while (c < gains.length) {
        if (!used.contains(c) && gains(c) > bestGain) { bestGain = gains(c); best = c }
        c += 1
      }
      if (best < 0) stop = true
      else {
        used += best
        chosen += candidates(best)
        round += 1
      }
    }
    new Model(cached, nCols, chosen.toArray, flipped, cells)
  }

  /** Asso usage rule: walk the basis in chosen order, use a vector iff
    * its score is positive given the cover built so far.
    */
  def usageInOrder(g: SparseVec, basis: Array[SparseVec]): Array[Int] = {
    val picked = scala.collection.mutable.ArrayBuffer.empty[Int]
    var y = SparseVec.empty
    var t = 0
    while (t < basis.length) {
      if (repro.core.SecondPass.score(basis(t), g, y) > 0) {
        picked += t
        y = y.union(basis(t))
      }
      t += 1
    }
    picked.toArray
  }

  /** Transpose the bipartite stream: rows become right vertices with
    * their incident left ids as neighbor indices. Right vertices with
    * no edges are dropped (they carry no information for BMF).
    */
  def transpose(left: Dataset[LeftVertex], nRight: Int)(implicit spark: SparkSession): Dataset[LeftVertex] = {
    import spark.implicits._
    left
      .flatMap(lv => lv.nbrs.map(v => (v, lv.u.toInt)))
      .groupByKey(_._1)
      .mapGroups { (v, it) =>
        LeftVertex(v.toLong, it.map(_._2).toArray.sorted)
      }
  }

  private def totalOnes(rows: Dataset[LeftVertex])(implicit spark: SparkSession): Long = {
    import spark.implicits._
    if (rows.isEmpty) 0L else rows.map(_.nbrs.length.toLong).reduce(_ + _)
  }
}
