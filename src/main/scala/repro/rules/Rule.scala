package repro.rules

import repro.core.Binning

/** An association rule over binned tokens (paper Def. 3.4).
  *
  * Items are tokens `"col=binLabel"` (see [[repro.core.Binning]]); because a
  * row has exactly one token per column, a rule *holds* for a row iff every
  * item token appears in the row's token set. `lhs -> rhs`; the hardness
  * constructions in §4 use empty right-hand sides, which we allow, while the
  * miner only emits rules with non-empty sides.
  */
final case class Rule(lhs: Seq[String], rhs: Seq[String],
                      support: Double, confidence: Double) {

  /** All items, sorted — the rule's identity for dedup/printing. */
  val items: Vector[String] = (lhs ++ rhs).sorted.toVector

  require(items.distinct.size == items.size, s"duplicate items in rule: $items")

  /** U_R: the set of columns the rule mentions. */
  val columns: Set[String] = items.iterator.map(Binning.tokenCol).toSet

  /** Number of items (the paper's "rule size"). */
  def size: Int = items.size

  /** Does the rule hold for a row given its token set? */
  def holdsFor(rowTokens: collection.Set[String]): Boolean =
    items.forall(rowTokens.contains)

  override def toString: String =
    s"{${lhs.mkString(", ")}} -> {${rhs.mkString(", ")}} " +
      f"(supp=$support%.3f, conf=$confidence%.3f)"
}

object Rule {
  /** R* of the paper: if targets are given, keep only rules whose column set
    * intersects them; otherwise keep all rules.
    */
  def targetFilter(rules: Seq[Rule], targets: Set[String]): Seq[Rule] =
    if (targets.isEmpty) rules
    else rules.filter(_.columns.exists(targets.contains))
}
