package repro.bench

import repro.SparkSpec
import repro.exp.Experiments

/** Fig. 8 (§6.2.3): cell coverage / diversity / combined for the
  * interactive algorithms on FL, SP and CY. Paper: SubTab has the highest
  * combined score on all three (e.g. SP: 0.68 vs RAN 0.47, NC 0.51); on SP
  * RAN has slightly better diversity but far worse coverage.
  */
class F8QualityBench extends SparkSpec {
  test("Fig. 8: intrinsic quality per dataset") {
    val (rows, txt) = Experiments.fig8(spark)
    println(txt)
    def get(d: String, a: String) = rows.find(r => r.dataset == d && r.algo == a).get

    // SubTab beats NC on the combined metric on every dataset (the paper's
    // clearest separation — NC's raw one-hot clustering is uninformative).
    Seq("FL", "SP", "CY").foreach { d =>
      assert(get(d, "SubTab").combined > get(d, "NC").combined,
        s"$d: SubTab combined should beat NC")
    }
    // On the pattern-rich SP and CY, SubTab's coverage crushes NC's.
    assert(get("SP", "SubTab").cellCov > get("SP", "NC").cellCov + 0.2)
    assert(get("CY", "SubTab").cellCov > get("CY", "NC").cellCov + 0.1)
    // SubTab matches the paper-calibrated RAN search (within a small
    // margin; see EXPERIMENTS.md for why RAN is stronger here than in the
    // paper: its per-evaluation cost collapses at container scale).
    Seq("FL", "SP", "CY").foreach { d =>
      assert(get(d, "SubTab").combined >= get(d, "RAN").combined - 0.08,
        s"$d: SubTab should be within 0.08 of RAN")
    }
    assert(get("SP", "SubTab").cellCov >= get("SP", "RAN").cellCov - 0.05)
    def avg(a: String) = Seq("FL", "SP", "CY").map(get(_, a).combined).sum / 3
    assert(avg("SubTab") > avg("NC") + 0.1)
  }
}
