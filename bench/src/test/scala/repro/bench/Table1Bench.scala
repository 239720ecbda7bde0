package repro.bench

import org.apache.spark.sql.SparkSession

import repro.SparkSpec
import repro.data.Bipartite

/** Table 1: dataset properties, paper vs the 1/50-scale surrogates.
  *
  * Reproduced claims: every dataset is extremely sparse, left degrees
  * (even at P99) are small relative to |V|, and the average degree of
  * each surrogate tracks the paper's (the 1/50 scale preserves |E|/|U|
  * by construction).
  */
class Table1Bench extends SparkSpec {
  implicit lazy val s: SparkSession = spark

  test("Table 1: dataset properties (paper vs measured)") {
    val names = BenchGrid.config.datasets
    val sb = new StringBuilder
    sb ++= "== Table 1: dataset properties (paper -> measured at 1/50 scale) ==\n"
    sb ++= f"${"dataset"}%-8s ${"|U|"}%19s ${"|V|"}%19s ${"|E|"}%21s ${"avg deg"}%13s ${"P99"}%13s\n"
    names.foreach { name =>
      val spec = Bipartite.Surrogates(name)
      val planted = Bipartite.surrogate(spark, name)
      val st = Bipartite.stats(planted.left, planted.nRight)
      sb ++= f"$name%-8s ${spec.paperU}%9d->${st.mU}%8d ${spec.paperV}%9d->${st.nV}%8d " +
        f"${spec.paperE}%11d->${st.edges}%8d ${spec.paperAvgDeg}%5d->${st.avgDeg}%6.1f " +
        f"${spec.paperP99}%5d->${st.p99Deg}%6d\n"

      // Sanity: shape properties the paper relies on.
      assert(st.mU == spec.mU && st.nV == spec.nV)
      assert(st.avgDeg > spec.paperAvgDeg / 2.0 && st.avgDeg < spec.paperAvgDeg * 2.0,
        s"$name: avg degree ${st.avgDeg} drifted from paper ${spec.paperAvgDeg}")
      assert(st.p99Deg < st.nV, s"$name: P99 must stay far below |V|")
    }
    println(sb.result())
  }
}
