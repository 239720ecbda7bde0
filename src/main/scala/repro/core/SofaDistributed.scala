package repro.core

import org.apache.spark.sql.{Dataset, SparkSession}

/** Distributed first pass of sofa.
  *
  * The paper's conclusion notes that sofa's two building blocks —
  * coreset-style center sets and Misra–Gries sketches — are both
  * mergeable, which is exactly what a Spark dataflow needs: each
  * partition runs the sequential Algorithm 2 over its slice of the
  * vertex stream and emits at most `cMax` weighted centers with their
  * sketches; the driver then runs the *same* algorithm over the
  * concatenation of all per-partition center streams (this is the
  * paper's restart-on-centers mechanism used as a merge operator), and
  * finishes with the usual postprocessing. Total state is
  * `O(partitions · cMax · s)` during the map and `O(cMax · s)` at the
  * driver — sublinear in the number of edges.
  */
object SofaDistributed {

  /** First pass: vertex stream in, surviving weighted centers out. */
  def firstPass(
      left: Dataset[LeftVertex],
      cfg: Sofa.Config,
  )(implicit spark: SparkSession): IndexedSeq[Sofa.Center] = {
    val partCenters: Array[PortableCenter] = left
      .mapPartitions { it =>
        val centers = Sofa.cluster(
          it.map(lv => Sofa.freshItem(lv.vec, cfg)),
          cfg,
        )
        centers.iterator.map(PortableCenter.from)
      }(PortableCenter.encoder(spark))
      .collect()
    // Merge: replay all per-partition centers through the same
    // sequential algorithm on the driver.
    Sofa.cluster(partCenters.iterator.map(_.toCenter(cfg.mgCapacity)), cfg)
  }

  /** Full biclustering pipeline (Sections 3.2 + 4.1 + 5.2): first pass,
    * k-medians postprocessing at threshold `theta`, second pass.
    */
  def biclusterPipeline(
      left: Dataset[LeftVertex],
      cfg: Sofa.Config,
      theta: Double,
  )(implicit spark: SparkSession): (Array[SparseVec], Dataset[LeftAssignment]) = {
    val centers = firstPass(left, cfg)
    val rights = Sofa.postprocessKMedians(centers, cfg, Seq(theta))(theta)
    (rights, SecondPass.assignBicluster(left, rights))
  }

  /** Result of the BMF pipeline for one threshold. */
  final case class BmfResult(
      theta: Double,
      rightClusters: Array[SparseVec],
      assignments: Dataset[LeftAssignment],
      quality: Metrics.BmfQuality,
  )

  /** Full BMF pipeline (Sections 3.2 + 4.2 + 5.3): first pass, then for
    * every threshold in `thetas` the per-center candidate clusters,
    * top-k selection by accumulated cover score, second pass, and
    * quality evaluation. The line-searched `sofa` uses several
    * thresholds; `sofa-auto` passes the single heuristic θ.
    *
    * @return results for every θ, best (by relative Hamming gain) first
    */
  def bmfPipeline(
      left: Dataset[LeftVertex],
      cfg: Sofa.Config,
      thetas: Seq[Double],
  )(implicit spark: SparkSession): Seq[BmfResult] = {
    val centers = firstPass(left, cfg)
    thetas.map { theta =>
      val candidates = Sofa.postprocessPerCenter(centers, theta)
        .filter(_.nnz > 0)
      val (kept, assign) =
        if (candidates.isEmpty) (Array.empty[SparseVec], SecondPass.assignBicluster(left, Array(SparseVec.empty)))
        else SecondPass.topKBmf(left, candidates, cfg.k)
      val q =
        if (kept.isEmpty) Metrics.BmfQuality(0L, 0L, edgeCount(left))
        else Metrics.bmfQuality(left, assign, kept)
      BmfResult(theta, kept, assign, q)
    }.sortBy(r => -r.quality.relativeHammingGain)
  }

  /** sofa-auto (Section 5.4): fit θ with the likelihood heuristic on
    * the first-pass centers, then run the BMF pipeline at that θ only.
    */
  def bmfAutoPipeline(
      left: Dataset[LeftVertex],
      cfg: Sofa.Config,
  )(implicit spark: SparkSession): BmfResult = {
    val centers = firstPass(left, cfg)
    val theta = ThetaHeuristic.selectFromCenters(centers, cfg.nRight)
    val candidates = Sofa.postprocessPerCenter(centers, theta).filter(_.nnz > 0)
    if (candidates.isEmpty) {
      BmfResult(theta, Array.empty,
        SecondPass.assignBicluster(left, Array(SparseVec.empty)),
        Metrics.BmfQuality(0L, 0L, edgeCount(left)))
    } else {
      val (kept, assign) = SecondPass.topKBmf(left, candidates, cfg.k)
      BmfResult(theta, kept, assign, Metrics.bmfQuality(left, assign, kept))
    }
  }

  private def edgeCount(left: Dataset[LeftVertex])(implicit spark: SparkSession): Long = {
    import spark.implicits._
    if (left.isEmpty) 0L else left.map(_.nbrs.length.toLong).reduce(_ + _)
  }
}

/** Serializable wire form of a center for the shuffle back to the
  * driver: the representative's indices, the weight, and the sketch
  * entries. The sketch is rebuilt with the same capacity on arrival
  * (Misra–Gries state is exactly its counter map).
  */
final case class PortableCenter(
    vecIdx: Array[Int],
    weight: Long,
    mgItems: Array[Int],
    mgCounts: Array[Long],
    mgTotal: Long,
) {
  def toCenter(mgCapacity: Int): Sofa.Center =
    new Sofa.Center(
      SparseVec.fromSortedDistinct(vecIdx),
      weight,
      MisraGries.restore(mgCapacity, mgItems, mgCounts, mgTotal),
    )
}

object PortableCenter {
  def from(c: Sofa.Center): PortableCenter = {
    val entries = c.mg.entries.toArray
    PortableCenter(c.vec.idx, c.weight, entries.map(_._1), entries.map(_._2), c.mg.totalWeight)
  }

  def encoder(spark: SparkSession): org.apache.spark.sql.Encoder[PortableCenter] = {
    import spark.implicits._
    implicitly[org.apache.spark.sql.Encoder[PortableCenter]]
  }
}
