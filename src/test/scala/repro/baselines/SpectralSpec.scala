package repro.baselines

import scala.util.Random

import repro.SparkSpec
import repro.core.{Metrics, SparseVec}

class SpectralSpec extends SparkSpec {

  /** Block-diagonal bipartite graph: k blocks of rows each fully
    * connected to its own block of columns, plus light noise.
    */
  private def blockGraph(k: Int, rowsPerBlock: Int, colsPerBlock: Int,
                         noise: Double, seed: Long): (Array[SparseVec], Int, Seq[Set[Int]]) = {
    val rng = new Random(seed)
    val nCols = k * colsPerBlock
    val rows = Array.tabulate(k * rowsPerBlock) { i =>
      val b = i / rowsPerBlock
      val mine = (b * colsPerBlock) until ((b + 1) * colsPerBlock)
      val kept = mine.filter(_ => rng.nextDouble() < 0.9)
      val extra = (0 until nCols).filter(j => !mine.contains(j) && rng.nextDouble() < noise)
      SparseVec.fromArray((kept ++ extra).toArray)
    }
    val truth = (0 until k).map(b => ((b * colsPerBlock) until ((b + 1) * colsPerBlock)).toSet)
    (rows, nCols, truth)
  }

  private def q(found: Array[Array[Int]], truth: Seq[Set[Int]]): Double =
    Metrics.qualityQ(
      truth.map(_.map(_.toLong)),
      found.toSeq.map(_.map(_.toLong).toSet))

  test("dhillon recovers clean block-diagonal column clusters") {
    val (rows, nCols, truth) = blockGraph(3, 30, 10, noise = 0.005, seed = 1)
    val found = Spectral.dhillon(rows, nCols, 3)
    assert(q(found, truth) > 0.8, s"Q=${q(found, truth)}")
  }

  test("zha recovers clean block-diagonal column clusters") {
    val (rows, nCols, truth) = blockGraph(3, 30, 10, noise = 0.005, seed = 2)
    val found = Spectral.zha(rows, nCols, 3)
    assert(q(found, truth) > 0.8, s"Q=${q(found, truth)}")
  }

  test("dhillon returns exactly k clusters covering a subset of columns") {
    val (rows, nCols, _) = blockGraph(4, 20, 8, noise = 0.02, seed = 3)
    val found = Spectral.dhillon(rows, nCols, 4)
    assert(found.length == 4)
    val all = found.flatten
    assert(all.length == all.distinct.length, "clusters must be disjoint")
    assert(all.forall(j => j >= 0 && j < nCols))
  }

  test("zha returns a partition of all columns") {
    val (rows, nCols, _) = blockGraph(4, 20, 8, noise = 0.02, seed = 4)
    val found = Spectral.zha(rows, nCols, 4)
    assert(found.flatten.sorted.toSeq == (0 until nCols).toSeq)
  }

  test("both handle empty input gracefully") {
    assert(Spectral.dhillon(Array.empty, 0, 3).length == 3)
    assert(Spectral.zha(Array.empty, 0, 3).length == 3)
  }

  test("both tolerate isolated columns (zero degree)") {
    val rows = Array(SparseVec(0, 1), SparseVec(0, 1), SparseVec(3, 4), SparseVec(3, 4))
    // Column 2 is isolated.
    val d = Spectral.dhillon(rows, 5, 2)
    val z = Spectral.zha(rows, 5, 2)
    assert(d.flatten.forall(j => j >= 0 && j < 5))
    assert(z.flatten.forall(j => j >= 0 && j < 5))
  }

  test("dhillon separates blocks with unbalanced sizes") {
    val rng = new Random(5)
    val rows =
      Array.tabulate(40)(_ => SparseVec.fromArray((0 until 12).filter(_ => rng.nextDouble() < 0.9).toArray)) ++
      Array.tabulate(10)(_ => SparseVec.fromArray((12 until 16).filter(_ => rng.nextDouble() < 0.9).map(identity).toArray))
    val found = Spectral.dhillon(rows, 16, 2)
    val truth = Seq((0 until 12).toSet, (12 until 16).toSet)
    assert(q(found, truth) > 0.7)
  }
}
