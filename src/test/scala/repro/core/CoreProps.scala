package repro.core

import org.scalacheck.{Gen, Prop, Properties}
import org.scalacheck.Prop.forAll

/** ScalaCheck property suites for the two core substrates. These run
  * under sbt via ScalaCheck's own test framework.
  */
object SparseVecProps extends Properties("SparseVec") {

  private val genVec: Gen[SparseVec] =
    Gen.listOf(Gen.choose(0, 120)).map(l => SparseVec.fromArray(l.toArray))

  property("hamming is symmetric") = forAll(genVec, genVec) { (a, b) =>
    a.hamming(b) == b.hamming(a)
  }

  property("hamming(a,a) == 0") = forAll(genVec)(a => a.hamming(a) == 0)

  property("hamming equals |A△B|") = forAll(genVec, genVec) { (a, b) =>
    a.hamming(b) == (a.toSet diff b.toSet).size + (b.toSet diff a.toSet).size
  }

  property("triangle inequality") = forAll(genVec, genVec, genVec) { (a, b, c) =>
    a.hamming(c) <= a.hamming(b) + b.hamming(c)
  }

  property("union is commutative") = forAll(genVec, genVec) { (a, b) =>
    a.union(b) == b.union(a)
  }

  property("union/diff/intersect set semantics") = forAll(genVec, genVec) { (a, b) =>
    Prop(a.union(b).toSet == (a.toSet union b.toSet)) &&
      Prop(a.diff(b).toSet == (a.toSet diff b.toSet)) &&
      Prop(a.intersectSize(b) == (a.toSet intersect b.toSet).size)
  }

  property("asym distance with alpha=1 is hamming") = forAll(genVec, genVec) { (c, u) =>
    math.abs(c.asymDistTo(u, 1.0) - c.hamming(u)) < 1e-9
  }

  property("asym distance is nonnegative and bounded by hamming for alpha<=1") =
    forAll(genVec, genVec, Gen.choose(0.0, 1.0)) { (c, u, alpha) =>
      val d = c.asymDistTo(u, alpha)
      d >= -1e-12 && d <= c.hamming(u) + 1e-9
    }
}

object MisraGriesProps extends Properties("MisraGries") {

  private val genStream: Gen[List[Int]] =
    Gen.listOf(Gen.frequency(5 -> Gen.choose(0, 5), 1 -> Gen.choose(6, 50)))

  property("estimate <= true frequency (no overcount)") =
    forAll(genStream, Gen.choose(2, 20)) { (xs, cap) =>
      val mg = MisraGries(cap)
      xs.foreach(mg.add(_))
      val truth = xs.groupBy(identity).view.mapValues(_.size.toLong)
      truth.forall { case (j, f) => mg.estimate(j) <= f }
    }

  property("undercount bounded by N/(cap+1)") =
    forAll(genStream, Gen.choose(2, 20)) { (xs, cap) =>
      val mg = MisraGries(cap)
      xs.foreach(mg.add(_))
      val err = mg.totalWeight / (cap + 1L)
      val truth = xs.groupBy(identity).view.mapValues(_.size.toLong)
      truth.forall { case (j, f) => mg.estimate(j) >= f - err }
    }

  property("merge keeps the combined guarantee") =
    forAll(genStream, genStream, Gen.choose(2, 16)) { (xs, ys, cap) =>
      val a = MisraGries(cap); xs.foreach(a.add(_))
      val b = MisraGries(cap); ys.foreach(b.add(_))
      a.merge(b)
      val err = a.totalWeight / (cap + 1L)
      val truth = (xs ++ ys).groupBy(identity).view.mapValues(_.size.toLong)
      a.totalWeight == xs.length + ys.length &&
        truth.forall { case (j, f) => a.estimate(j) <= f && a.estimate(j) >= f - err }
    }

  property("size never exceeds capacity") =
    forAll(genStream, Gen.choose(1, 10)) { (xs, cap) =>
      val mg = MisraGries(cap)
      xs.foreach(mg.add(_))
      mg.size <= cap
    }
}
