package repro.bench

import repro.SparkSpec
import repro.exp.Experiments

/** Fig. 6 (§6.2.2): % of next-query fragments captured by the previous
  * query's sub-table on CY, width 3..7. Paper: SubTab 14% (w=3) to 38%
  * (w=7), clearly above RAN and NC at every width, improving with width.
  */
class F6SimulationBench extends SparkSpec {
  test("Fig. 6: next-query fragment capture on CY") {
    val (rows, txt) = Experiments.fig6(spark)
    println(txt)
    def avg(algo: String): Double = {
      val rs = rows.filter(_.algo == algo)
      rs.map(_.captured).sum.toDouble / math.max(1, rs.map(_.total).sum)
    }
    val st = avg("SubTab"); val nc = avg("NC")
    assert(st > nc, s"SubTab capture ($st) should beat NC ($nc)")
    // capture improves with width for SubTab and lands in the paper's
    // 14%-38% envelope (paper: 14% at w=3 -> 38% at w=7).
    val st3 = rows.find(r => r.algo == "SubTab" && r.width == 3).get.pct
    val st7 = rows.find(r => r.algo == "SubTab" && r.width == 7).get.pct
    assert(st7 > st3, s"SubTab capture should grow with width: $st3 -> $st7")
    assert(st7 > 0.25 && st7 < 0.6, s"SubTab w=7 capture out of plausible range: $st7")
  }
}
