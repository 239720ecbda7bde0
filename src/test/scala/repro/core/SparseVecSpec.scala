package repro.core

import scala.util.Random

import repro.SparkSpec

class SparseVecSpec extends SparkSpec {

  test("empty vector has nnz 0 and contains nothing") {
    assert(SparseVec.empty.nnz == 0)
    assert(!SparseVec.empty.contains(0))
    assert(SparseVec.empty.isEmpty)
  }

  test("fromArray sorts and deduplicates") {
    val v = SparseVec.fromArray(Array(5, 1, 3, 1, 5, 5))
    assert(v.idx.toSeq == Seq(1, 3, 5))
    assert(v.nnz == 3)
  }

  test("apply varargs builds the same vector as fromArray") {
    assert(SparseVec(3, 1, 2) == SparseVec.fromArray(Array(1, 2, 3)))
  }

  test("contains finds exactly the stored indices") {
    val v = SparseVec(2, 4, 8, 16)
    Seq(2, 4, 8, 16).foreach(j => assert(v.contains(j)))
    Seq(0, 1, 3, 5, 17).foreach(j => assert(!v.contains(j)))
  }

  test("hamming distance of identical vectors is 0") {
    val v = SparseVec(1, 5, 9)
    assert(v.hamming(v) == 0)
  }

  test("hamming distance of disjoint vectors is sum of sizes") {
    assert(SparseVec(1, 2).hamming(SparseVec(3, 4, 5)) == 5)
  }

  test("hamming matches brute-force symmetric difference") {
    val rng = new Random(1)
    for (_ <- 1 to 50) {
      val a = SparseVec.fromArray(Array.fill(rng.nextInt(30))(rng.nextInt(100)))
      val b = SparseVec.fromArray(Array.fill(rng.nextInt(30))(rng.nextInt(100)))
      val expected = (a.toSet diff b.toSet).size + (b.toSet diff a.toSet).size
      assert(a.hamming(b) == expected)
    }
  }

  test("hamming is symmetric") {
    val rng = new Random(2)
    for (_ <- 1 to 30) {
      val a = SparseVec.fromArray(Array.fill(rng.nextInt(20))(rng.nextInt(50)))
      val b = SparseVec.fromArray(Array.fill(rng.nextInt(20))(rng.nextInt(50)))
      assert(a.hamming(b) == b.hamming(a))
    }
  }

  test("hamming satisfies the triangle inequality") {
    val rng = new Random(3)
    for (_ <- 1 to 30) {
      val a = SparseVec.fromArray(Array.fill(rng.nextInt(15))(rng.nextInt(40)))
      val b = SparseVec.fromArray(Array.fill(rng.nextInt(15))(rng.nextInt(40)))
      val c = SparseVec.fromArray(Array.fill(rng.nextInt(15))(rng.nextInt(40)))
      assert(a.hamming(c) <= a.hamming(b) + b.hamming(c))
    }
  }

  test("asymDistTo with alpha=1 equals symmetric hamming") {
    val rng = new Random(4)
    for (_ <- 1 to 30) {
      val c = SparseVec.fromArray(Array.fill(rng.nextInt(20))(rng.nextInt(60)))
      val u = SparseVec.fromArray(Array.fill(rng.nextInt(20))(rng.nextInt(60)))
      assert(math.abs(c.asymDistTo(u, 1.0) - c.hamming(u)) < 1e-9)
    }
  }

  test("asymDistTo reproduces the paper's Section 5.1 example") {
    // x_c1 = (1,1,1,1,0), x_c2 = (0,0,0,0,1), x_u = (1,0,0,0,0), α=0.1:
    // d(c1,u) = 0.3, d(c2,u) = 1.1 → u goes to the dense center c1.
    val c1 = SparseVec(0, 1, 2, 3)
    val c2 = SparseVec(4)
    val u = SparseVec(0)
    assert(math.abs(c1.asymDistTo(u, 0.1) - 0.3) < 1e-9)
    assert(math.abs(c2.asymDistTo(u, 0.1) - 1.1) < 1e-9)
    // With symmetric Hamming, u would (wrongly) prefer c2.
    assert(c2.hamming(u) < c1.hamming(u))
  }

  test("asymDistTo penalizes point-only entries at weight 1") {
    val c = SparseVec(0)
    val u = SparseVec(0, 1, 2)
    assert(math.abs(c.asymDistTo(u, 0.1) - 2.0) < 1e-9)
  }

  test("asymDistTo penalizes center-only entries at weight alpha") {
    val c = SparseVec(0, 1, 2)
    val u = SparseVec(0)
    assert(math.abs(c.asymDistTo(u, 0.25) - 0.5) < 1e-9)
  }

  test("intersectSize matches set intersection") {
    val rng = new Random(5)
    for (_ <- 1 to 50) {
      val a = SparseVec.fromArray(Array.fill(rng.nextInt(25))(rng.nextInt(80)))
      val b = SparseVec.fromArray(Array.fill(rng.nextInt(25))(rng.nextInt(80)))
      assert(a.intersectSize(b) == a.toSet.intersect(b.toSet).size)
    }
  }

  test("union matches set union and stays sorted-distinct") {
    val rng = new Random(6)
    for (_ <- 1 to 50) {
      val a = SparseVec.fromArray(Array.fill(rng.nextInt(25))(rng.nextInt(80)))
      val b = SparseVec.fromArray(Array.fill(rng.nextInt(25))(rng.nextInt(80)))
      val u = a.union(b)
      assert(u.toSet == a.toSet.union(b.toSet))
      assert(u.idx.toSeq == u.idx.toSeq.sorted.distinct)
    }
  }

  test("diff matches set difference") {
    val rng = new Random(7)
    for (_ <- 1 to 50) {
      val a = SparseVec.fromArray(Array.fill(rng.nextInt(25))(rng.nextInt(80)))
      val b = SparseVec.fromArray(Array.fill(rng.nextInt(25))(rng.nextInt(80)))
      assert(a.diff(b).toSet == a.toSet.diff(b.toSet))
    }
  }

  test("union with empty is identity") {
    val a = SparseVec(3, 7)
    assert(a.union(SparseVec.empty) == a)
    assert(SparseVec.empty.union(a) == a)
  }

  test("diff with self is empty") {
    val a = SparseVec(3, 7, 9)
    assert(a.diff(a).isEmpty)
  }

  test("equals and hashCode agree on structurally equal vectors") {
    val a = SparseVec.fromArray(Array(9, 1, 4))
    val b = SparseVec(1, 4, 9)
    assert(a == b && a.hashCode == b.hashCode)
    assert(a != SparseVec(1, 4))
  }

  test("fromSortedDistinct trusts its input (round-trips idx)") {
    val arr = Array(1, 2, 10)
    assert(SparseVec.fromSortedDistinct(arr).idx.toSeq == arr.toSeq)
  }
}
