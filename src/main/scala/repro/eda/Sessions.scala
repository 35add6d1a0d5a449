package repro.eda

import repro.core.Binning
import repro.rules.Rule

import scala.util.Random

/** EDA-session generator — the stand-in for the 122 real analysis sessions
  * of [Milo & Somech, KDD'18] used in the paper's simulation study (§6.2.2,
  * Fig. 6). See DESIGN.md §3.
  *
  * The generative assumption mirrors how the study is scored: an analyst's
  * *next* step follows something *prominent in the data* — a cell belonging
  * to a strong association rule (selection on its bin), or one of a rule's
  * columns (group-by). Sessions therefore sample each step's predicate from
  * the mined rule items, weighted by rule support, with occasional "off
  * pattern" steps drawn uniformly from the vocabulary so that not every
  * fragment is capturable even in principle.
  */
object Sessions {

  final case class Session(queries: Seq[Query])

  final case class Params(
      nSessions: Int = 30,
      queriesPerSession: Int = 5,
      offPatternProb: Double = 0.25,
      groupByProb: Double = 0.4,
      seed: Long = 43,
  )

  def generate(model: Binning.BinModel, rules: Seq[Rule], p: Params = Params()): Seq[Session] = {
    require(rules.nonEmpty, "need mined rules to seed sessions")
    val rng = new Random(p.seed)
    // Support-weighted rule sampler.
    val weights = rules.map(_.support).toArray
    val cumW = weights.scanLeft(0.0)(_ + _).tail
    val total = cumW.last
    def sampleRule(): Rule = {
      val x = rng.nextDouble() * total
      val i = cumW.indexWhere(x < _)
      rules(if (i < 0) rules.size - 1 else i)
    }
    val vocab = model.vocabulary.toIndexedSeq

    def sampleToken(): String =
      if (rng.nextDouble() < p.offPatternProb) vocab(rng.nextInt(vocab.size))
      else {
        val r = sampleRule()
        r.items(rng.nextInt(r.items.size))
      }

    (0 until p.nSessions).map { _ =>
      val queries = (0 until p.queriesPerSession).map { qi =>
        val tok = sampleToken()
        val pred = Query.predicateFor(model, tok)
        val gb =
          if (rng.nextDouble() < p.groupByProb) {
            val r = sampleRule()
            Some(Binning.tokenCol(r.items(rng.nextInt(r.items.size))))
          } else None
        Query(Seq(pred), project = None, groupBy = gb)
      }
      Session(queries)
    }
  }

  /** Fragment-capture check (the Fig. 6 measurement): is `f` present in a
    * sub-table given as (selected columns, binned rows as aligned token
    * vectors over those columns)?
    */
  def captured(f: Fragment, subCols: Seq[String], subRows: Seq[Seq[String]]): Boolean =
    f match {
      case ColFragment(c) => subCols.contains(c)
      case ValueFragment(c, tok) =>
        val i = subCols.indexOf(c)
        i >= 0 && subRows.exists(r => r(i) == tok)
    }
}
