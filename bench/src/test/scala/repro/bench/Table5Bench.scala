package repro.bench

import repro.SparkSpec
import repro.exp.Tables

/** Table 5: memory. We report estimated live-state size (DESIGN.md §4)
  * rather than process RSS, so the reproduced claims are again ratios:
  *  - basso's state exceeds sofa's everywhere it runs, by a large
  *    factor on its hard datasets (paper: 10.81 GB vs 0.10 GB on
  *    Book), and it cannot allocate at all on Wiki;
  *  - the RS baselines carry the densified sampled subgraph and sit
  *    above sofa on the sparse text-like datasets (a scale artifact
  *    keeps this from holding on the densest surrogates — see the
  *    in-test note and EXPERIMENTS.md).
  */
class Table5Bench extends SparkSpec {

  test("Table 5: memory (paper vs measured)") {
    val cells = BenchGrid.cells
    println(Tables.render("Table 5: memory (paper: GB, measured: state MB)",
      cells, Tables.PaperMemoryGB, _.stateMB, v => f"$v%.2f"))

    val byKey = cells.map(c => ((c.dataset, c.k, c.algo), c)).toMap
    val ks = BenchGrid.config.ks
    val datasets = BenchGrid.config.datasets

    for (d <- datasets; k <- ks) {
      val sofa = byKey((d, k, "sofa"))
      assert(sofa.stateMB > 0.0, s"$d k=$k: sofa state not accounted")
      val basso = byKey((d, k, "basso"))
      if (basso.ok)
        assert(basso.stateMB >= sofa.stateMB,
          s"$d k=$k: basso state ${basso.stateMB}MB below sofa ${sofa.stateMB}MB")
    }

    // RS ≥ sofa on the sparse text-like datasets. (At 1/50 scale the RS
    // sample shrinks with the data while sofa's 3·s counter term does
    // not — the average degree is scale-invariant — so on the densest
    // surrogates sofa's estimated state can exceed the tiny sampled
    // subgraph; at paper scale RS is larger everywhere. See
    // EXPERIMENTS.md.)
    for (d <- Seq("20News", "Reuters", "Book") if datasets.contains(d); k <- ks) {
      val sofa = byKey((d, k, "sofa"))
      for (a <- Seq("RSdhillon", "RSzhaEtAl")) {
        val c = byKey((d, k, a))
        if (c.ok)
          assert(c.stateMB >= sofa.stateMB,
            s"$d k=$k: $a state ${c.stateMB}MB below sofa ${sofa.stateMB}MB")
      }
    }

    // basso ≫ sofa on its memory-hard datasets.
    for (d <- Seq("Book", "Flickr") if datasets.contains(d); k <- Seq(ks.head)) {
      val basso = byKey((d, k, "basso"))
      val sofa = byKey((d, k, "sofa"))
      if (basso.ok)
        assert(basso.stateMB > 5.0 * sofa.stateMB,
          s"$d: basso ${basso.stateMB}MB should dwarf sofa ${sofa.stateMB}MB")
    }

    // Wiki: basso cannot allocate (the paper's "—").
    if (datasets.contains("Wiki"))
      assert(byKey.get(("Wiki", ks.head, "basso")).exists(!_.ok))
  }
}
