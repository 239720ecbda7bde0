package repro.core

import scala.util.Random

import repro.SparkSpec

class MisraGriesSpec extends SparkSpec {

  test("estimates are exact while under capacity") {
    val mg = MisraGries(10)
    Seq(1, 2, 3, 1, 2, 1).foreach(mg.add(_))
    assert(mg.estimate(1) == 3)
    assert(mg.estimate(2) == 2)
    assert(mg.estimate(3) == 1)
    assert(mg.estimate(4) == 0)
    assert(mg.totalWeight == 6)
  }

  test("size never exceeds capacity") {
    val mg = MisraGries(5)
    (0 until 100).foreach(j => mg.add(j))
    assert(mg.size <= 5)
  }

  test("weighted add counts weight, not occurrences") {
    val mg = MisraGries(4)
    mg.add(7, 10)
    mg.add(7, 5)
    assert(mg.estimate(7) == 15)
    assert(mg.totalWeight == 15)
  }

  test("zero weight is a no-op") {
    val mg = MisraGries(4)
    mg.add(1, 0)
    assert(mg.totalWeight == 0 && mg.size == 0)
  }

  test("negative weight is rejected") {
    val mg = MisraGries(4)
    intercept[IllegalArgumentException](mg.add(1, -1))
  }

  test("estimate never exceeds the true frequency") {
    val rng = new Random(11)
    val mg = MisraGries(8)
    val truth = scala.collection.mutable.Map.empty[Int, Long].withDefaultValue(0L)
    for (_ <- 1 to 2000) {
      val j = rng.nextInt(40)
      mg.add(j)
      truth(j) += 1
    }
    truth.keys.foreach(j => assert(mg.estimate(j) <= truth(j)))
  }

  test("undercount is bounded by totalWeight/(capacity+1)") {
    val rng = new Random(12)
    for (cap <- Seq(4, 8, 16, 64)) {
      val mg = MisraGries(cap)
      val truth = scala.collection.mutable.Map.empty[Int, Long].withDefaultValue(0L)
      for (_ <- 1 to 3000) {
        // Zipf-ish skew so there are real heavy hitters.
        val j = (math.pow(rng.nextDouble(), 2.0) * 50).toInt
        mg.add(j)
        truth(j) += 1
      }
      val err = mg.totalWeight / (cap + 1L)
      truth.foreach { case (j, f) =>
        assert(mg.estimate(j) >= f - err,
          s"cap=$cap item=$j true=$f est=${mg.estimate(j)} err=$err")
      }
    }
  }

  test("a heavy hitter above N/(cap+1) always survives") {
    val mg = MisraGries(5)
    // 1000 of item 0, 10 each of items 1..50.
    (1 to 1000).foreach(_ => mg.add(0))
    for (j <- 1 to 50; _ <- 1 to 10) mg.add(j)
    assert(mg.estimate(0) > 0)
    assert(mg.estimate(0) >= 1000 - mg.totalWeight / 6)
  }

  test("merge preserves the additive error guarantee") {
    val rng = new Random(13)
    for (trial <- 1 to 5) {
      val cap = 10
      val a = MisraGries(cap)
      val b = MisraGries(cap)
      val truth = scala.collection.mutable.Map.empty[Int, Long].withDefaultValue(0L)
      for (_ <- 1 to 1500) {
        val j = (math.pow(rng.nextDouble(), 2.0) * 60).toInt
        a.add(j); truth(j) += 1
      }
      for (_ <- 1 to 1500) {
        val j = (math.pow(rng.nextDouble(), 2.0) * 60).toInt
        b.add(j); truth(j) += 1
      }
      a.merge(b)
      val err = a.totalWeight / (cap + 1L)
      assert(a.totalWeight == 3000)
      truth.foreach { case (j, f) =>
        assert(a.estimate(j) <= f, s"trial=$trial overcount on $j")
        assert(a.estimate(j) >= f - err, s"trial=$trial undercount on $j")
      }
    }
  }

  test("merge result size stays within capacity") {
    val a = MisraGries(6)
    val b = MisraGries(6)
    (0 until 6).foreach(j => a.add(j, 5))
    (6 until 12).foreach(j => b.add(j, 5))
    a.merge(b)
    assert(a.size <= 6)
    assert(a.totalWeight == 60)
  }

  test("merging an empty sketch changes nothing") {
    val a = MisraGries(4)
    a.add(1, 3); a.add(2, 2)
    val before = a.entries.toMap
    a.merge(MisraGries(4))
    assert(a.entries.toMap == before)
  }

  test("addAll inserts every index of a vector") {
    val mg = MisraGries(10)
    mg.addAll(SparseVec(1, 3, 5), 2)
    assert(mg.estimate(1) == 2 && mg.estimate(3) == 2 && mg.estimate(5) == 2)
    assert(mg.totalWeight == 6)
  }

  test("ofVector builds a singleton sketch") {
    val mg = MisraGries.ofVector(SparseVec(2, 4), capacity = 8, w = 3)
    assert(mg.estimate(2) == 3 && mg.estimate(4) == 3)
    assert(mg.totalWeight == 6)
  }

  test("copy is independent of the original") {
    val a = MisraGries(4)
    a.add(1, 5)
    val b = a.copy()
    b.add(1, 5)
    assert(a.estimate(1) == 5 && b.estimate(1) == 10)
  }

  test("restore round-trips serialized state") {
    val a = MisraGries(6)
    Seq(1, 1, 2, 3, 3, 3).foreach(a.add(_))
    val entries = a.entries.toArray
    val b = MisraGries.restore(6, entries.map(_._1), entries.map(_._2), a.totalWeight)
    assert(b.entries.toMap == a.entries.toMap)
    assert(b.totalWeight == a.totalWeight)
  }

  test("merge is order-insensitive for the surviving heavy hitters") {
    def build(streams: Seq[Seq[Int]]): MisraGries = {
      val parts = streams.map { s =>
        val mg = MisraGries(8); s.foreach(mg.add(_)); mg
      }
      parts.reduce((x, y) => x.merge(y))
    }
    val s1 = Seq.fill(200)(1) ++ Seq.tabulate(50)(identity)
    val s2 = Seq.fill(150)(2) ++ Seq.tabulate(50)(i => i + 100)
    val ab = build(Seq(s1, s2))
    val ba = build(Seq(s2, s1))
    // Heavy hitters 1 and 2 survive in both merge orders.
    assert(ab.estimate(1) > 0 && ba.estimate(1) > 0)
    assert(ab.estimate(2) > 0 && ba.estimate(2) > 0)
    assert(ab.totalWeight == ba.totalWeight)
  }
}
