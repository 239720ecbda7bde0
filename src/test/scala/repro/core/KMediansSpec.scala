package repro.core

import scala.util.Random

import repro.SparkSpec
import repro.core.KMedians.WPoint

class KMediansSpec extends SparkSpec {

  private def pts(vs: SparseVec*): IndexedSeq[WPoint] =
    vs.map(WPoint(_, 1L)).toIndexedSeq

  test("empty input yields empty result") {
    val r = KMedians.cluster(IndexedSeq.empty, 3)
    assert(r.assignment.isEmpty && r.centers.isEmpty && r.cost == 0.0)
  }

  test("k >= points: every point can get its own cluster (zero cost)") {
    val r = KMedians.cluster(pts(SparseVec(1), SparseVec(2), SparseVec(3)), 5)
    assert(r.assignment.length == 3)
    assert(r.cost == 0.0)
  }

  test("two well-separated groups are split by k=2") {
    val groupA = (0 until 5).map(i => SparseVec((0 until 10).toArray ++ Array(100 + i)))
    val groupB = (0 until 5).map(i => SparseVec((50 until 60).toArray ++ Array(200 + i)))
    val r = KMedians.cluster(pts(groupA ++ groupB: _*), 2, alpha = 1.0)
    val aClusters = r.assignment.take(5).toSet
    val bClusters = r.assignment.drop(5).toSet
    assert(aClusters.size == 1 && bClusters.size == 1)
    assert(aClusters != bClusters)
  }

  test("weighted points dominate the seeding and assignment") {
    val heavy = WPoint(SparseVec(0, 1, 2), 1000L)
    val light = (0 until 3).map(i => WPoint(SparseVec(50 + i), 1L))
    val r = KMedians.cluster(IndexedSeq(heavy) ++ light, 2)
    // Heavy point must sit alone or dominate its own cluster center.
    val heavyCluster = r.assignment(0)
    assert(r.centers(heavyCluster).intersectSize(SparseVec(0, 1, 2)) == 3)
  }

  test("majority vote keeps columns supported by at least the fraction") {
    val members = Seq(
      WPoint(SparseVec(1, 2), 1L),
      WPoint(SparseVec(1, 3), 1L),
      WPoint(SparseVec(1, 2), 1L),
    )
    val med = KMedians.majority(members, 0.5)
    assert(med.contains(1))      // 3/3
    assert(med.contains(2))      // 2/3 >= 0.5
    assert(!med.contains(3))     // 1/3 < 0.5
  }

  test("majority respects weights") {
    val members = Seq(
      WPoint(SparseVec(1), 10L),
      WPoint(SparseVec(2), 1L),
    )
    val med = KMedians.majority(members, 0.5)
    assert(med.contains(1) && !med.contains(2))
  }

  test("assignment indices are within [0, k)") {
    val rng = new Random(31)
    val points = (0 until 40).map(_ =>
      WPoint(SparseVec.fromArray(Array.fill(5)(rng.nextInt(30))), 1L + rng.nextInt(3)))
    val r = KMedians.cluster(points, 6)
    assert(r.assignment.forall(a => a >= 0 && a < 6))
    assert(r.assignment.length == 40)
  }

  test("clustering is deterministic in the seed") {
    val rng = new Random(32)
    val points = (0 until 30).map(_ =>
      WPoint(SparseVec.fromArray(Array.fill(6)(rng.nextInt(40))), 1L))
    val a = KMedians.cluster(points, 4, seed = 99)
    val b = KMedians.cluster(points, 4, seed = 99)
    assert(a.assignment.toSeq == b.assignment.toSeq)
    assert(a.cost == b.cost)
  }

  test("planted blocks are recovered exactly at k=3") {
    val rng = new Random(33)
    val blocks = Seq(0 until 10, 20 until 30, 40 until 50)
    val points = for (b <- 0 until 3; _ <- 0 until 8) yield {
      // Each point holds its whole block minus one random element.
      val drop = blocks(b)(rng.nextInt(10))
      WPoint(SparseVec.fromArray(blocks(b).filter(_ != drop).toArray), 1L)
    }
    val r = KMedians.cluster(points.toIndexedSeq, 3, alpha = 0.1)
    val found = (0 until 3).map(b => r.assignment.slice(b * 8, (b + 1) * 8).toSet)
    assert(found.forall(_.size == 1), s"each block in one cluster: $found")
    assert(found.flatten.toSet.size == 3, "blocks in distinct clusters")
  }

  test("cost decreases (or holds) as k grows") {
    val rng = new Random(34)
    val points = (0 until 50).map(_ =>
      WPoint(SparseVec.fromArray(Array.fill(8)(rng.nextInt(60))), 1L))
    val costs = Seq(1, 2, 4, 8).map(k => KMedians.cluster(points, k, seed = 5).cost)
    // Not strictly monotone for a heuristic, but k=8 must beat k=1 clearly.
    assert(costs.last <= costs.head)
  }
}
