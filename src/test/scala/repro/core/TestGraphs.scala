package repro.core

import scala.util.Random

/** Small in-memory planted bipartite graphs for unit tests (the Spark
  * generator in `repro.data.Bipartite` has its own suite; these keep
  * the algorithm unit tests driver-only and fast).
  */
object TestGraphs {

  final case class Instance(
      vectors: Vector[SparseVec],   // left vertices in stream order
      leftTruth: Vector[Int],       // planted left cluster per vertex
      rightClusters: Vector[SparseVec],
      n: Int,
  )

  /** The Section 2.1 model: k blocks of ell left vertices, right
    * clusters of size r drawn from [0, n), edge prob p inside, q
    * outside.
    */
  def planted(
      k: Int, ell: Int, n: Int, r: Int,
      p: Double, q: Double, seed: Long = 1L,
  ): Instance = {
    val rng = new Random(seed)
    val rights = Vector.fill(k) {
      val s = scala.collection.mutable.LinkedHashSet.empty[Int]
      while (s.size < r) s += rng.nextInt(n)
      SparseVec.fromArray(s.toArray)
    }
    val vectors = Vector.tabulate(k * ell) { u =>
      val c = u / ell
      val nbrs = scala.collection.mutable.ArrayBuffer.empty[Int]
      rights(c).idx.foreach(v => if (rng.nextDouble() < p) nbrs += v)
      (0 until n).foreach { v =>
        if (!rights(c).contains(v) && rng.nextDouble() < q) nbrs += v
      }
      SparseVec.fromArray(nbrs.toArray)
    }
    Instance(vectors, Vector.tabulate(k * ell)(_ / ell), rights, n)
  }

  /** Shuffle stream order deterministically (keeps truth aligned). */
  def shuffled(inst: Instance, seed: Long): Instance = {
    val rng = new Random(seed)
    val perm = rng.shuffle(inst.vectors.indices.toVector)
    Instance(
      perm.map(inst.vectors),
      perm.map(inst.leftTruth),
      inst.rightClusters,
      inst.n,
    )
  }
}
