package repro.baselines

import org.apache.spark.sql.{Dataset, SparkSession}
import scala.util.Random

import repro.core.{LeftVertex, SparseVec}

/** static sofa (Section 6.1): the offline counterpart of sofa, i.e. the
  * algorithm of Neumann (NeurIPS'18) without spectral preprocessing.
  * Clusters *all* left vertices with k-means (Lloyd with majority-vote
  * centers over binary vectors, the Hamming 1-median) and thresholds
  * the *exact* per-cluster column counts at `θ·|U_i|` — no sketching,
  * no streaming, hence an upper bound on what the streaming version can
  * achieve. Implemented as Spark aggregations so it scales to the full
  * dataset (its memory cost is O(m) assignments + O(k·n) counts, which
  * is what makes the static baseline expensive).
  */
object StaticSofa {

  final case class Result(
      rightClusters: Array[SparseVec],
      assignment: Dataset[(Long, Int)],
  )

  def run(
      left: Dataset[LeftVertex],
      nRight: Int,
      k: Int,
      theta: Double,
      alpha: Double = 0.1,
      maxIter: Int = 12,
      seed: Long = 77L,
  )(implicit spark: SparkSession): Result = {
    import spark.implicits._
    val sample = left.rdd.takeSample(withReplacement = false, num = k, seed = seed)
    var centers: Array[SparseVec] =
      if (sample.isEmpty) Array.fill(k)(SparseVec.empty)
      else Array.tabulate(k)(i => sample(i % sample.length).vec)
    val rng = new Random(seed)
    if (sample.nonEmpty && sample.length < k) {
      // Too few vertices: pad with random singletons to keep k centers.
      centers = centers.take(sample.length) ++
        Array.fill(k - sample.length)(SparseVec(rng.nextInt(math.max(1, nRight))))
    }

    var it = 0
    while (it < maxIter) {
      val bc = spark.sparkContext.broadcast(centers)
      // One aggregation: per cluster, member count + column counts.
      val perCluster: Array[(Int, (Long, Map[Int, Long]))] = left
        .map(lv => (nearest(bc.value, lv.vec, alpha), lv.nbrs))
        .groupByKey(_._1)
        .mapGroups { (c, it2) =>
          val counts = scala.collection.mutable.LongMap.empty[Long]
          var members = 0L
          it2.foreach { case (_, nbrs) =>
            members += 1
            nbrs.foreach(j => counts(j.toLong) = counts.getOrElse(j.toLong, 0L) + 1)
          }
          (c, (members, counts.map { case (j, n) => (j.toInt, n) }.toMap))
        }
        .collect()
      val next = centers.clone()
      perCluster.foreach { case (c, (members, counts)) =>
        next(c) = SparseVec.fromArray(
          counts.collect { case (j, n) if n * 2 >= members => j }.toArray)
      }
      val changed = !next.indices.forall(i => next(i) == centers(i))
      centers = next
      it += 1
      if (!changed) it = maxIter
    }

    // Final assignment + exact-count thresholding.
    val bc = spark.sparkContext.broadcast(centers)
    val assignment = left.map(lv => (lv.u, nearest(bc.value, lv.vec, alpha))).cache()
    val rights = Array.fill(k)(SparseVec.empty)
    val perCluster = left
      .map(lv => (nearest(bc.value, lv.vec, alpha), lv.nbrs))
      .groupByKey(_._1)
      .mapGroups { (c, it2) =>
        val counts = scala.collection.mutable.LongMap.empty[Long]
        var members = 0L
        it2.foreach { case (_, nbrs) =>
          members += 1
          nbrs.foreach(j => counts(j.toLong) = counts.getOrElse(j.toLong, 0L) + 1)
        }
        (c, members, counts.toSeq.map { case (j, n) => (j.toInt, n) })
      }
      .collect()
    perCluster.foreach { case (c, members, counts) =>
      rights(c) = SparseVec.fromArray(
        counts.collect { case (j, n) if n >= theta * members => j }.toArray)
    }
    Result(rights, assignment)
  }

  private def nearest(centers: Array[SparseVec], x: SparseVec, alpha: Double): Int = {
    var best = 0; var bestD = Double.MaxValue
    var i = 0
    while (i < centers.length) {
      val d = centers(i).asymDistTo(x, alpha)
      if (d < bestD) { bestD = d; best = i }
      i += 1
    }
    best
  }
}
