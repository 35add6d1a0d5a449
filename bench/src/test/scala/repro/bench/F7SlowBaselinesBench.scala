package repro.bench

import repro.SparkSpec
import repro.exp.Experiments

/** Fig. 7 (§6.2.3): quality vs total running time on FL against the slow
  * baselines. Paper: Greedy best quality but 48h; EmbDI ≈ SubTab quality
  * but 40min vs 1.5min; MAB worst quality despite >24h. Budgets here are
  * container-scale (60s for MAB/Greedy).
  */
class F7SlowBaselinesBench extends SparkSpec {
  test("Fig. 7: SubTab vs EmbDI vs MAB vs Greedy on FL") {
    val (rows, txt) = Experiments.fig7(spark)
    println(txt)
    val by = rows.map(r => r.algo -> r).toMap
    val st = by("SubTab"); val em = by("EmbDI"); val mab = by("MAB"); val gr = by("Greedy")

    // Greedy directly optimizes cell coverage: it must be at the top.
    assert(gr.cellCov >= st.cellCov - 0.02,
      s"Greedy cellCov (${gr.cellCov}) should top SubTab (${st.cellCov})")
    assert(gr.cellCov >= mab.cellCov - 0.02)
    // SubTab's full pipeline is faster than the EmbDI pipeline (paper:
    // 1.5 min vs 40 min) and faster than the budgeted Greedy.
    assert(st.timeMillis < em.timeMillis,
      s"SubTab (${st.timeMillis}ms) should be faster than EmbDI (${em.timeMillis}ms)")
    assert(st.timeMillis < gr.timeMillis,
      s"SubTab (${st.timeMillis}ms) should be faster than Greedy (${gr.timeMillis}ms)")
    // SubTab matches EmbDI's quality at a fraction of the cost (the
    // paper's headline comparison). NOTE: unlike the paper, our MAB is not
    // the worst scorer — a minute of microsecond-cost evaluations is a far
    // larger effective search than the paper's >24h of Python evaluations;
    // see EXPERIMENTS.md.
    assert(math.abs(st.combined - em.combined) < 0.08,
      s"SubTab (${st.combined}) should match EmbDI (${em.combined})")
  }
}
