package repro.core

import org.apache.spark.sql.{Dataset, SparkSession}

/** A left-side vertex of the bipartite graph as it appears on the
  * stream: its id and the (sorted, distinct) indices of its right-side
  * neighbors. This is the row type of every streamed dataset in the
  * reproduction.
  */
final case class LeftVertex(u: Long, nbrs: Array[Int]) {
  def vec: SparseVec = SparseVec.fromSortedDistinct(nbrs)
}

/** A left vertex with its (possibly multiple) cluster memberships, as
  * produced by the second pass.
  */
final case class LeftAssignment(u: Long, clusters: Array[Int])

/** Second pass over the stream (Section 4): given the right clusters
  * `Ṽ_1..Ṽ_k` from the first pass, compute the left clusters. Each left
  * vertex is processed independently, so this is an embarrassingly
  * parallel Spark map with the right clusters broadcast.
  */
object SecondPass {

  /** The covering score of Section 4.2:
    * `score(A | X, Y) = |(X∖Y) ∩ A| − |A ∖ (X∪Y)|` — newly covered
    * elements minus fresh overcover.
    */
  def score(a: SparseVec, x: SparseVec, y: SparseVec): Int = {
    var covered = 0
    var over = 0
    var i = 0
    while (i < a.idx.length) {
      val j = a.idx(i)
      val inX = x.contains(j)
      val inY = y.contains(j)
      if (inX && !inY) covered += 1
      else if (!inX && !inY) over += 1
      i += 1
    }
    covered - over
  }

  /** Section 4.1 (biclustering): assign every vertex `u` to the single
    * cluster maximizing `|Γ(u) ∩ Ṽ_i| / |Ṽ_i|` (Eq. 2). Empty clusters
    * are never chosen; ties break toward the lowest index.
    */
  def assignBicluster(
      left: Dataset[LeftVertex],
      rightClusters: Array[SparseVec],
  )(implicit spark: SparkSession): Dataset[LeftAssignment] = {
    import spark.implicits._
    val bc = spark.sparkContext.broadcast(rightClusters)
    left.map { lv =>
      val vs = bc.value
      val g = lv.vec
      var best = 0; var bestScore = -1.0
      var i = 0
      while (i < vs.length) {
        if (vs(i).nnz > 0) {
          val s = g.intersectSize(vs(i)).toDouble / vs(i).nnz
          if (s > bestScore) { bestScore = s; best = i }
        }
        i += 1
      }
      LeftAssignment(lv.u, Array(best))
    }
  }

  /** Section 4.2 (BMF): greedily cover `Γ(u)` with the right clusters,
    * assigning `u` to every cluster used. At most one use per cluster
    * (re-use always scores 0) and at most `k` rounds.
    */
  def coverVertex(g: SparseVec, rightClusters: Array[SparseVec]): Array[Int] = {
    val picked = scala.collection.mutable.ArrayBuffer.empty[Int]
    var y = SparseVec.empty
    var continue = true
    var rounds = 0
    while (continue && rounds < rightClusters.length) {
      var best = -1; var bestScore = 0
      var i = 0
      while (i < rightClusters.length) {
        val s = score(rightClusters(i), g, y)
        if (s > bestScore) { bestScore = s; best = i }
        i += 1
      }
      if (best < 0) continue = false
      else {
        picked += best
        y = y.union(rightClusters(best))
        rounds += 1
      }
    }
    picked.toArray
  }

  /** Like [[coverVertex]] but also returns the score each pick earned
    * at the moment it was taken (needed for the `s_c` accounting of
    * Section 5.3).
    */
  def coverVertexWithScores(
      g: SparseVec,
      rightClusters: Array[SparseVec],
  ): Array[(Int, Long)] = {
    val picked = scala.collection.mutable.ArrayBuffer.empty[(Int, Long)]
    var y = SparseVec.empty
    var continue = true
    var rounds = 0
    while (continue && rounds < rightClusters.length) {
      var best = -1; var bestScore = 0
      var i = 0
      while (i < rightClusters.length) {
        val s = score(rightClusters(i), g, y)
        if (s > bestScore) { bestScore = s; best = i }
        i += 1
      }
      if (best < 0) continue = false
      else {
        picked += ((best, bestScore.toLong))
        y = y.union(rightClusters(best))
        rounds += 1
      }
    }
    picked.toArray
  }

  /** Distributed BMF cover: returns the per-vertex assignments and the
    * accumulated per-cluster scores `s_c` (Section 5.3), used to keep
    * only the top-k candidate clusters.
    */
  def coverBmf(
      left: Dataset[LeftVertex],
      rightClusters: Array[SparseVec],
  )(implicit spark: SparkSession): (Dataset[LeftAssignment], Map[Int, Long]) = {
    import spark.implicits._
    val bc = spark.sparkContext.broadcast(rightClusters)
    val withScores = left.map { lv =>
      (lv.u, coverVertexWithScores(lv.vec, bc.value))
    }.cache()
    val assigned = withScores.map { case (u, picks) =>
      LeftAssignment(u, picks.map(_._1))
    }
    val scores = withScores
      .flatMap(_._2)
      .groupByKey(_._1)
      .mapValues(_._2)
      .reduceGroups(_ + _)
      .collect()
      .map { case (i, s) => (i, s) }
      .toMap
    withScores.unpersist()
    (assigned, scores)
  }

  /** Section 5.3: keep the `k` candidate clusters with the highest
    * accumulated scores and re-run the cover against only those.
    * Returns the surviving clusters and the final assignments.
    */
  def topKBmf(
      left: Dataset[LeftVertex],
      candidates: Array[SparseVec],
      k: Int,
  )(implicit spark: SparkSession): (Array[SparseVec], Dataset[LeftAssignment]) = {
    val (_, scores) = coverBmf(left, candidates)
    val keep = candidates.indices
      .sortBy(i => -scores.getOrElse(i, 0L))
      .take(k)
      .sorted
      .toArray
    val kept = keep.map(candidates)
    val (assign, _) = coverBmf(left, kept)
    (kept, assign)
  }
}
