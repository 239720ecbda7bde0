package repro.core

import org.apache.spark.sql.SparkSession

import repro.SparkSpec
import repro.data.Bipartite

class SofaDistributedSpec extends SparkSpec {
  implicit lazy val s: SparkSession = spark

  private lazy val planted = Bipartite.planted(spark, Bipartite.PlantedParams(
    k = 5, ell = 60, n = 800, r = 15, p = 0.9, expectedNoiseDeg = 3.0, seed = 19L))
  private lazy val left = planted.left.cache()

  private def cfg(k: Int = 5): Sofa.Config =
    Sofa.Config(k = k, cMax = 6 * k, nRight = planted.nRight, mgCapacity = 400)

  test("firstPass preserves the total stream weight") {
    val centers = SofaDistributed.firstPass(left, cfg())
    assert(centers.map(_.weight).sum == left.count())
  }

  test("firstPass returns fewer than cMax centers") {
    val c = cfg()
    val centers = SofaDistributed.firstPass(left, c)
    assert(centers.length < c.cMax)
  }

  test("firstPass sketches account for every edge") {
    val centers = SofaDistributed.firstPass(left, cfg())
    val edges = Bipartite.stats(left, planted.nRight).edges
    assert(centers.map(_.mg.totalWeight).sum == edges)
  }

  test("distributed quality is close to the sequential pass") {
    val c = cfg()
    val centersDist = SofaDistributed.firstPass(left, c)
    val rightsDist = Sofa.postprocessKMedians(centersDist, c, Seq(0.5))(0.5)
    val qDist = Metrics.qualityQRight(planted.rightClusters.toSeq, rightsDist.toSeq)

    val localVectors = left.collect().sortBy(_.u).map(_.vec)
    val centersSeq = Sofa.cluster(localVectors.iterator.map(Sofa.freshItem(_, c)), c)
    val rightsSeq = Sofa.postprocessKMedians(centersSeq, c, Seq(0.5))(0.5)
    val qSeq = Metrics.qualityQRight(planted.rightClusters.toSeq, rightsSeq.toSeq)

    assert(qDist > 0.7, s"distributed Q=$qDist too low (sequential Q=$qSeq)")
    assert(qDist > qSeq - 0.25, s"distributed Q=$qDist far below sequential Q=$qSeq")
  }

  test("biclusterPipeline recovers planted clusters on both sides") {
    val (rights, assign) = SofaDistributed.biclusterPipeline(left, cfg(), theta = 0.5)
    val qRight = Metrics.qualityQRight(planted.rightClusters.toSeq, rights.toSeq)
    val qLeft = Metrics.qualityQLeft(planted.leftTruth, assign)
    assert(qRight > 0.7, s"right Q=$qRight")
    assert(qLeft > 0.7, s"left Q=$qLeft")
  }

  test("bmfPipeline returns one result per theta, best gain first") {
    val results = SofaDistributed.bmfPipeline(left, cfg(), Seq(0.4, 0.6))
    assert(results.length == 2)
    assert(results.head.quality.relativeHammingGain >=
      results.last.quality.relativeHammingGain)
    assert(results.forall(_.rightClusters.length <= cfg().k))
  }

  test("bmfPipeline achieves positive gain on planted data") {
    val results = SofaDistributed.bmfPipeline(left, cfg(), Seq(0.5))
    assert(results.head.quality.relativeHammingGain > 0.3,
      s"gain=${results.head.quality.relativeHammingGain}")
  }

  test("bmfAutoPipeline picks a workable theta automatically") {
    val res = SofaDistributed.bmfAutoPipeline(left, cfg())
    assert(res.theta > 0.0 && res.theta < 1.0)
    assert(res.quality.relativeHammingGain > 0.2,
      s"auto θ=${res.theta} gain=${res.quality.relativeHammingGain}")
  }

  test("PortableCenter round-trips a center") {
    val c = cfg()
    val center = Sofa.freshItem(SparseVec(1, 5, 9), c)
    center.weight = 7
    val back = PortableCenter.from(center).toCenter(c.mgCapacity)
    assert(back.vec == center.vec)
    assert(back.weight == 7)
    assert(back.mg.entries.toMap == center.mg.entries.toMap)
  }
}
