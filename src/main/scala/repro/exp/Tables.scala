package repro.exp

/** Formatting of the evaluation tables, with the paper's published
  * numbers inlined so every bench prints paper-vs-measured rows
  * side by side (also recorded in EXPERIMENTS.md).
  *
  * The paper's k ∈ {50, 100, 200} maps to our scaled k ∈ {10, 20, 40}
  * (DESIGN.md §4).
  */
object Tables {

  val Datasets: Seq[String] = Seq("20News", "Reuters", "Book", "Movie", "Flickr", "Wiki")
  val PaperKs: Seq[Int] = Seq(50, 100, 200)
  val OurKs: Seq[Int] = Seq(10, 20, 40)
  def paperK(ourK: Int): Int = PaperKs(OurKs.indexOf(ourK))

  /** paper values keyed by (k_paper, algo) → per-dataset values in
    * [[Datasets]] order; NaN marks the paper's "—" (basso OOM on Wiki).
    */
  type PaperTable = Map[(Int, String), Seq[Double]]

  private val NA = Double.NaN

  /** Table 2: relative Hamming gain. */
  val PaperGain: PaperTable = Map(
    (50, "sofa-auto")  -> Seq(0.0298, 0.0450, 0.0198, 0.0805, 0.0380, 0.0617),
    (50, "sofa")       -> Seq(0.0424, 0.0454, 0.0212, 0.1188, 0.0453, 0.0695),
    (50, "basso")      -> Seq(0.0545, 0.1005, 0.1226, 0.1394, 0.0719, NA),
    (50, "RSdhillon")  -> Seq(0.0042, 0.0273, 0.0008, 0.1056, 0.0040, 0.0001),
    (50, "RSzhaEtAl")  -> Seq(0.0001, 0.0274, 0.0008, 0.0297, 0.0000, 0.0000),
    (100, "sofa-auto") -> Seq(0.0411, 0.0792, 0.0298, 0.1028, 0.0486, 0.0730),
    (100, "sofa")      -> Seq(0.0574, 0.0777, 0.0333, 0.1367, 0.0668, 0.0824),
    (100, "basso")     -> Seq(0.0793, 0.1097, 0.1783, 0.1739, 0.1068, NA),
    (100, "RSdhillon") -> Seq(0.0059, 0.0307, 0.0028, 0.1378, 0.0137, 0.0262),
    (100, "RSzhaEtAl") -> Seq(0.0006, 0.0342, 0.0030, 0.0696, 0.0000, 0.0000),
    (200, "sofa-auto") -> Seq(0.0624, 0.1253, 0.0427, 0.1247, 0.0663, 0.0861),
    (200, "sofa")      -> Seq(0.0930, 0.1254, 0.0472, 0.1598, 0.0817, 0.1061),
    (200, "basso")     -> Seq(0.1171, 0.1334, 0.2531, 0.2376, 0.1556, NA),
    (200, "RSdhillon") -> Seq(0.0092, 0.0402, 0.0024, 0.1771, 0.0203, 0.0270),
    (200, "RSzhaEtAl") -> Seq(0.0014, 0.0291, 0.0017, 0.1104, 0.0007, 0.0001),
  )

  /** Table 3: recall. */
  val PaperRecall: PaperTable = Map(
    (50, "sofa-auto")  -> Seq(0.0446, 0.0649, 0.0201, 0.1262, 0.0480, 0.0657),
    (50, "sofa")       -> Seq(0.0483, 0.0652, 0.0214, 0.1779, 0.0474, 0.0700),
    (50, "basso")      -> Seq(0.0683, 0.1677, 0.1226, 0.2855, 0.0760, NA),
    (50, "RSdhillon")  -> Seq(0.0069, 0.0316, 0.0009, 0.1999, 0.0088, 0.0001),
    (50, "RSzhaEtAl")  -> Seq(0.0004, 0.0447, 0.0014, 0.0614, 0.0001, 0.0000),
    (100, "sofa-auto") -> Seq(0.0570, 0.0991, 0.0307, 0.1597, 0.0636, 0.0777),
    (100, "sofa")      -> Seq(0.0649, 0.0987, 0.0341, 0.2030, 0.0721, 0.0840),
    (100, "basso")     -> Seq(0.0959, 0.1907, 0.1783, 0.3143, 0.1124, NA),
    (100, "RSdhillon") -> Seq(0.0103, 0.0430, 0.0060, 0.2400, 0.0246, 0.0302),
    (100, "RSzhaEtAl") -> Seq(0.0017, 0.0500, 0.0040, 0.1182, 0.0002, 0.0000),
    (200, "sofa-auto") -> Seq(0.0788, 0.1441, 0.0435, 0.1926, 0.0837, 0.0924),
    (200, "sofa")      -> Seq(0.0991, 0.1442, 0.0479, 0.2353, 0.0906, 0.1087),
    (200, "basso")     -> Seq(0.1321, 0.2100, 0.2532, 0.3521, 0.1603, NA),
    (200, "RSdhillon") -> Seq(0.0159, 0.0619, 0.0030, 0.2812, 0.0317, 0.0299),
    (200, "RSzhaEtAl") -> Seq(0.0022, 0.0454, 0.0027, 0.1644, 0.0021, 0.0002),
  )

  /** Table 4: run-time in CPU minutes. */
  val PaperMinutes: PaperTable = Map(
    (50, "sofa-auto")  -> Seq(2.1, 3.2, 1.7, 45.9, 9.7, 14.1),
    (50, "sofa")       -> Seq(6.2, 10.3, 5.5, 120.0, 24.0, 42.9),
    (50, "basso")      -> Seq(22.7, 13.2, 2951.8, 598.1, 4667.8, NA),
    (50, "RSdhillon")  -> Seq(28.1, 23.1, 16.4, 27.8, 21.0, 49.7),
    (50, "RSzhaEtAl")  -> Seq(36.0, 75.2, 75.4, 35.9, 98.5, 76.3),
    (100, "sofa-auto") -> Seq(5.2, 8.3, 4.7, 102.2, 19.9, 25.8),
    (100, "sofa")      -> Seq(15.6, 25.4, 16.5, 311.6, 52.7, 70.4),
    (100, "basso")     -> Seq(24.6, 13.6, 3003.8, 932.3, 5066.0, NA),
    (100, "RSdhillon") -> Seq(26.9, 23.7, 18.1, 31.2, 23.0, 55.5),
    (100, "RSzhaEtAl") -> Seq(41.6, 81.2, 80.7, 39.7, 172.3, 63.7),
    (200, "sofa-auto") -> Seq(12.2, 34.8, 14.2, 229.1, 63.7, 57.1),
    (200, "sofa")      -> Seq(43.5, 142.8, 60.4, 959.0, 161.4, 157.5),
    (200, "basso")     -> Seq(26.7, 14.3, 3097.4, 1441.2, 5574.1, NA),
    (200, "RSdhillon") -> Seq(25.3, 23.1, 20.8, 42.2, 25.8, 68.3),
    (200, "RSzhaEtAl") -> Seq(39.4, 90.0, 68.6, 51.5, 350.8, 100.9),
  )

  /** Table 5: memory in GB. */
  val PaperMemoryGB: PaperTable = Map(
    (50, "sofa-auto")  -> Seq(0.15, 0.12, 0.10, 0.24, 0.21, 0.20),
    (50, "sofa")       -> Seq(0.16, 0.13, 0.10, 0.24, 0.20, 0.22),
    (50, "basso")      -> Seq(0.40, 0.66, 10.81, 1.80, 11.48, NA),
    (50, "RSdhillon")  -> Seq(8.95, 8.70, 6.12, 8.99, 7.16, 5.61),
    (50, "RSzhaEtAl")  -> Seq(10.72, 10.43, 7.26, 10.73, 8.63, 6.57),
    (100, "sofa-auto") -> Seq(0.19, 0.14, 0.11, 0.33, 0.27, 0.30),
    (100, "sofa")      -> Seq(0.20, 0.17, 0.13, 0.33, 0.26, 0.30),
    (100, "basso")     -> Seq(0.40, 0.67, 10.95, 1.80, 11.79, NA),
    (100, "RSdhillon") -> Seq(8.96, 8.70, 6.09, 8.99, 7.20, 5.54),
    (100, "RSzhaEtAl") -> Seq(10.71, 10.40, 7.26, 10.73, 8.58, 6.63),
    (200, "sofa-auto") -> Seq(0.25, 0.18, 0.13, 0.49, 0.36, 0.43),
    (200, "sofa")      -> Seq(0.26, 0.22, 0.17, 0.50, 0.36, 0.42),
    (200, "basso")     -> Seq(0.40, 0.67, 10.99, 1.80, 12.22, NA),
    (200, "RSdhillon") -> Seq(8.96, 8.68, 6.00, 8.98, 7.18, 5.57),
    (200, "RSzhaEtAl") -> Seq(10.72, 10.46, 7.30, 10.73, 8.54, 6.63),
  )

  /** Render one table: per (k, algo) a "paper" row and a "measured"
    * row over the dataset columns.
    */
  def render(
      title: String,
      cells: Seq[RealWorldGrid.Cell],
      paper: PaperTable,
      measured: RealWorldGrid.Cell => Double,
      fmt: Double => String = v => f"$v%.4f",
  ): String = {
    val byKey = cells.map(c => ((c.k, c.algo, c.dataset), c)).toMap
    val sb = new StringBuilder
    sb ++= s"== $title ==\n"
    sb ++= f"${"k"}%-4s ${"algorithm"}%-10s ${"row"}%-9s"
    Datasets.foreach(d => sb ++= f" ${d}%10s")
    sb ++= "\n"
    for (ourK <- OurKs; algo <- RealWorldGrid.Algos) {
      val pk = paperK(ourK)
      val paperRow = paper.getOrElse((pk, algo), Seq.fill(Datasets.size)(Double.NaN))
      sb ++= f"$pk%-4d $algo%-10s ${"paper"}%-9s"
      paperRow.foreach(v => sb ++= f" ${na(v, fmt)}%10s")
      sb ++= "\n"
      sb ++= f"$ourK%-4d $algo%-10s ${"measured"}%-9s"
      Datasets.foreach { d =>
        val v = byKey.get((ourK, algo, d))
          .map(c => if (c.ok) measured(c) else Double.NaN)
          .getOrElse(Double.NaN)
        sb ++= f" ${na(v, fmt)}%10s"
      }
      sb ++= "\n"
    }
    sb.result()
  }

  private def na(v: Double, fmt: Double => String): String =
    if (v.isNaN) "--" else fmt(v)
}
