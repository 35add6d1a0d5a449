package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.rules.Rule

/** The paper's informativeness metrics (§3.2), computed distributedly.
  *
  * - cell coverage (Def. 3.6): |union of cell(R,T) over rules covered by the
  *   sub-table| / upcov, where upcov is the same union over *all* rules;
  * - diversity (Def. 3.7): 1 − average pairwise Jaccard similarity of the
  *   sub-table rows (similar = same bin, i.e. same token);
  * - combined score (Eq. 3): α·cellCov + (1−α)·divers.
  *
  * Coverage is a single Spark pass per evaluation: the (small) rule set is
  * broadcast, each row computes the set of its columns touched by a matching
  * rule, and the cell counts are summed. The sub-table side (which rules are
  * covered) is driver-side — sub-tables are k×l with k,l ≈ 10.
  */
object Metrics {

  /** Rules from `rules` covered by the sub-table (Def. 3.6 d1): all rule
    * columns selected, and at least one selected row satisfies the rule.
    * `subRows` are the sub-table's binned rows as token sets (over the full
    * schema or any superset of `subCols` — extra tokens are harmless since a
    * covered rule's columns must lie inside `subCols`).
    */
  def coveredRules(rules: Seq[Rule], subRows: Seq[Set[String]],
                   subCols: Set[String]): Seq[Rule] =
    rules.filter(r => r.columns.subsetOf(subCols) && subRows.exists(r.holdsFor))

  /** |union over `rules` of cell(R,T)| — the number of cells of the binned
    * table described by at least one of the given rules. One distributed
    * pass; cost O(rows × rules).
    */
  def describedCellCount(binned: DataFrame, cols: Seq[String], rules: Seq[Rule]): Long = {
    import binned.sparkSession.implicits._
    if (rules.isEmpty) return 0L
    val colIdx = cols.zipWithIndex.toMap
    // Per rule: parallel arrays of (column index, required token).
    val compiled: Array[(Array[Int], Array[String])] = rules.iterator.map { r =>
      val idx = r.items.map(t => colIdx(Binning.tokenCol(t))).toArray
      (idx, r.items.toArray)
    }.toArray
    val ds = binned.select(array(cols.map(col): _*).as("toks")).as[Seq[String]]
    val perPartition = ds.mapPartitions { it =>
      var total = 0L
      val covered = new java.util.BitSet(cols.size)
      it.foreach { toksSeq =>
        val toks = toksSeq.toArray
        covered.clear()
        var ri = 0
        while (ri < compiled.length) {
          val (idxs, items) = compiled(ri)
          var j = 0; var ok = true
          while (ok && j < idxs.length) { ok = toks(idxs(j)) == items(j); j += 1 }
          if (ok) { var j2 = 0; while (j2 < idxs.length) { covered.set(idxs(j2)); j2 += 1 } }
          ri += 1
        }
        total += covered.cardinality()
      }
      Iterator.single(total)
    }
    perPartition.reduce(_ + _)
  }

  /** Binned rows of the sub-table as aligned token vectors over `sub.cols`
    * (row order = rid order).
    */
  def subTableTokens(binned: DataFrame, sub: SubTable): Seq[Seq[String]] =
    Tables.materialize(binned, sub).collect()
      .map(r => sub.cols.indices.map(i => r.getString(i + 1))).toSeq

  /** Cell coverage of a sub-table w.r.t. the (already target-filtered) rule
    * set. If no rule describes any cell (upcov = 0) coverage is vacuously 1.
    */
  def cellCoverage(binned: DataFrame, cols: Seq[String], rules: Seq[Rule],
                   sub: SubTable): Double = {
    val up = describedCellCount(binned, cols, rules)
    if (up == 0L) 1.0
    else {
      val subRows = subTableTokens(binned, sub).map(_.toSet)
      val cov = coveredRules(rules, subRows, sub.cols.toSet)
      describedCellCount(binned, cols, cov).toDouble / up
    }
  }

  /** Pairwise Jaccard-like similarity (Def. 3.7): fraction of columns on
    * which the two rows fall in the same bin.
    */
  def jaccard(a: Seq[String], b: Seq[String]): Double = {
    require(a.size == b.size, "rows must be aligned over the same columns")
    if (a.isEmpty) 0.0
    else a.iterator.zip(b.iterator).count { case (x, y) => x == y }.toDouble / a.size
  }

  /** Diversity = 1 − average pairwise (unordered, distinct) similarity.
    * A single-row sub-table has no pairs and is maximally diverse (1.0).
    */
  def diversity(subRowsTokens: Seq[Seq[String]]): Double = {
    val rows = subRowsTokens.toIndexedSeq
    val k = rows.size
    if (k < 2) 1.0
    else {
      var sum = 0.0; var pairs = 0
      var i = 0
      while (i < k) {
        var j = i + 1
        while (j < k) { sum += jaccard(rows(i), rows(j)); pairs += 1; j += 1 }
        i += 1
      }
      1.0 - sum / pairs
    }
  }

  /** Diversity of a sub-table measured on its binned rows. */
  def diversity(binned: DataFrame, sub: SubTable): Double =
    diversity(subTableTokens(binned, sub))

  /** Combined score (Eq. 3) over a target-filtered rule set. */
  def combined(binned: DataFrame, cols: Seq[String], rules: Seq[Rule],
               sub: SubTable, alpha: Double = 0.5): Double =
    alpha * cellCoverage(binned, cols, rules, sub) +
      (1 - alpha) * diversity(binned, sub)

  /** All three scores at once (coverage shares the upcov pass). */
  final case class Scores(cellCov: Double, divers: Double, combined: Double)

  def scores(binned: DataFrame, cols: Seq[String], rules: Seq[Rule],
             sub: SubTable, alpha: Double = 0.5): Scores = {
    val cc = cellCoverage(binned, cols, rules, sub)
    val dv = diversity(binned, sub)
    Scores(cc, dv, alpha * cc + (1 - alpha) * dv)
  }
}
