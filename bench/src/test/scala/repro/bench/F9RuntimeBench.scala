package repro.bench

import repro.SparkSpec
import repro.exp.Experiments

/** Fig. 9 (§6.3): SubTab pre-processing vs selection time per dataset.
  * Paper: pre-processing up to 90s (CC worst); selection a few seconds for
  * every dataset and insensitive to the sub-table size — pre-processing
  * reuse is what makes query-time display interactive.
  */
class F9RuntimeBench extends SparkSpec {
  test("Fig. 9: pre-processing vs selection time on all six datasets") {
    val (rows, txt) = Experiments.fig9(spark, scale = 0.5)
    println(txt)
    assert(rows.map(_.dataset) == Seq("FL", "CY", "SP", "CC", "USF", "BL"))
    rows.foreach { r =>
      // Selection reuses the cached embedding: it must be much cheaper than
      // pre-processing, for the full table and for query results alike.
      assert(r.selectMillis < r.prepMillis,
        s"${r.dataset}: select (${r.selectMillis}ms) should be < prep (${r.prepMillis}ms)")
      assert(r.querySelectMillis < r.prepMillis,
        s"${r.dataset}: query select should be < prep")
    }
    // Wide/numeric tables pay the largest pre-processing bill (paper: CC).
    val prep = rows.map(r => r.dataset -> r.prepMillis).toMap
    assert(prep("USF") > prep("CY"),
      "the 298-column USF should out-cost the 15-column CY in pre-processing")
  }
}
