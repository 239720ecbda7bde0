package repro.baselines

import scala.util.Random

import repro.SparkSpec
import repro.baselines.LinAlg._

class LinAlgSpec extends SparkSpec {

  private def dense(rows: Array[Array[Double]]): SparseMatrix = {
    val idx = rows.map(r => r.indices.filter(j => r(j) != 0.0).toArray)
    val vl = rows.zip(idx).map { case (r, is) => is.map(r) }
    SparseMatrix(rows.length, rows.headOption.map(_.length).getOrElse(0), idx, vl)
  }

  test("mult computes A x") {
    val a = dense(Array(Array(1.0, 2.0), Array(0.0, 3.0)))
    assert(a.mult(Array(1.0, 1.0)).toSeq == Seq(3.0, 3.0))
  }

  test("multT computes A^T x") {
    val a = dense(Array(Array(1.0, 2.0), Array(0.0, 3.0)))
    assert(a.multT(Array(1.0, 1.0)).toSeq == Seq(1.0, 5.0))
  }

  test("dot, norm2, axpy, scale basics") {
    assert(dot(Array(1.0, 2.0), Array(3.0, 4.0)) == 11.0)
    assert(norm2(Array(3.0, 4.0)) == 5.0)
    val y = Array(1.0, 1.0)
    axpy(2.0, Array(1.0, 2.0), y)
    assert(y.toSeq == Seq(3.0, 5.0))
    scale(0.5, y)
    assert(y.toSeq == Seq(1.5, 2.5))
  }

  test("orthonormalize produces an orthonormal basis") {
    val rng = new Random(1)
    val cols = Array.fill(4)(Array.fill(10)(rng.nextGaussian()))
    orthonormalize(cols)
    for (i <- cols.indices; j <- cols.indices) {
      val d = dot(cols(i), cols(j))
      if (i == j) assert(math.abs(d - 1.0) < 1e-9)
      else assert(math.abs(d) < 1e-9)
    }
  }

  test("orthonormalize survives duplicate columns") {
    val c = Array.fill(3)(Array(1.0, 0.0, 0.0))
    orthonormalize(c)
    for (i <- c.indices) assert(math.abs(norm2(c(i)) - 1.0) < 1e-6)
  }

  test("truncatedSvd recovers the singular values of a diagonal matrix") {
    val a = dense(Array(
      Array(5.0, 0.0, 0.0),
      Array(0.0, 3.0, 0.0),
      Array(0.0, 0.0, 1.0),
    ))
    val svd = truncatedSvd(a, 2)
    assert(math.abs(svd.s(0) - 5.0) < 1e-6)
    assert(math.abs(svd.s(1) - 3.0) < 1e-6)
  }

  test("truncatedSvd singular vectors satisfy A v = s u") {
    val rng = new Random(2)
    val a = dense(Array.fill(8)(Array.fill(6)(rng.nextGaussian())))
    val svd = truncatedSvd(a, 3)
    for (i <- 0 until 3) {
      val av = a.mult(svd.v(i))
      val su = svd.u(i).map(_ * svd.s(i))
      av.zip(su).foreach { case (x, y) => assert(math.abs(x - y) < 1e-6) }
    }
  }

  test("truncatedSvd leading value matches power iteration on a rank-1 matrix") {
    // A = 2 * u v^T with ||u||=||v||=1 → σ1 = 2.
    val u = Array(0.6, 0.8)
    val v = Array(0.8, 0.6)
    val a = dense(Array.tabulate(2, 2)((i, j) => 2.0 * u(i) * v(j)).map(_.toArray))
    val svd = truncatedSvd(a, 1)
    assert(math.abs(svd.s(0) - 2.0) < 1e-6)
  }

  test("truncatedSvd is deterministic in the seed") {
    val rng = new Random(3)
    val a = dense(Array.fill(6)(Array.fill(5)(rng.nextGaussian())))
    val s1 = truncatedSvd(a, 2, seed = 7).s.toSeq
    val s2 = truncatedSvd(a, 2, seed = 7).s.toSeq
    assert(s1 == s2)
  }

  test("kmeans splits two obvious blobs") {
    val pts = Array.tabulate(20) { i =>
      if (i < 10) Array(0.0 + i * 0.01, 0.0) else Array(10.0 + i * 0.01, 10.0)
    }
    val assign = kmeans(pts, 2)
    assert(assign.take(10).toSet.size == 1)
    assert(assign.drop(10).toSet.size == 1)
    assert(assign.take(10).head != assign.drop(10).head)
  }

  test("kmeans handles k greater than the number of points") {
    val pts = Array(Array(0.0), Array(1.0))
    val assign = kmeans(pts, 5)
    assert(assign.length == 2)
    assert(assign.forall(a => a >= 0 && a < 2))
  }

  test("kmeans on empty input returns empty") {
    assert(kmeans(Array.empty[Array[Double]], 3).isEmpty)
  }
}
