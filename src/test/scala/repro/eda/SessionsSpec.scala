package repro.eda

import repro.SparkSpec
import repro.core.Binning
import repro.data.Datasets
import repro.rules.Apriori

class SessionsSpec extends SparkSpec {

  lazy val (df, meta) = Datasets.cyber(spark, 0.07)
  lazy val (model, binned) = Binning.bin(df, 5)
  lazy val rules = Apriori.mine(binned, model.cols,
    Apriori.Params(minSupport = 0.08))

  test("mined CY rules exist to seed sessions") {
    assert(rules.nonEmpty)
  }

  test("sessions have the requested shape") {
    val p = Sessions.Params(nSessions = 7, queriesPerSession = 4, seed = 1)
    val ss = Sessions.generate(model, rules, p)
    assert(ss.size == 7)
    assert(ss.forall(_.queries.size == 4))
  }

  test("session queries reference existing columns and run on the table") {
    val ss = Sessions.generate(model, rules, Sessions.Params(nSessions = 3, seed = 2))
    ss.flatMap(_.queries).foreach { q =>
      q.columnsUsed.foreach(c => assert(model.cols.contains(c)))
      q(df).count() // must execute
    }
  }

  test("generation is deterministic in the seed") {
    val a = Sessions.generate(model, rules, Sessions.Params(seed = 3))
    val b = Sessions.generate(model, rules, Sessions.Params(seed = 3))
    assert(a == b)
  }

  test("most fragments come from rule items (pattern-following analyst)") {
    val p = Sessions.Params(nSessions = 20, queriesPerSession = 5,
      offPatternProb = 0.0, groupByProb = 0.0, seed = 4)
    val ss = Sessions.generate(model, rules, p)
    val ruleTokens = rules.flatMap(_.items).toSet
    val valueFrags = ss.flatMap(_.queries).flatMap(_.fragments).collect {
      case ValueFragment(_, tok) => tok
    }
    assert(valueFrags.nonEmpty)
    assert(valueFrags.forall(ruleTokens.contains))
  }

  test("captured: column fragment needs the column, value fragment a same-bin cell") {
    val subCols = Seq("protocol", "packets")
    val subRows = Seq(
      Seq(Binning.token("protocol", "UDP"), Binning.token("packets", "b4")),
      Seq(Binning.token("protocol", "TCP"), Binning.token("packets", "b0")))
    assert(Sessions.captured(ColFragment("protocol"), subCols, subRows))
    assert(!Sessions.captured(ColFragment("severity"), subCols, subRows))
    assert(Sessions.captured(
      ValueFragment("packets", Binning.token("packets", "b4")), subCols, subRows))
    assert(!Sessions.captured(
      ValueFragment("packets", Binning.token("packets", "b2")), subCols, subRows))
    assert(!Sessions.captured(
      ValueFragment("severity", Binning.token("severity", "high")), subCols, subRows))
  }

  test("generate requires a non-empty rule set") {
    intercept[IllegalArgumentException] {
      Sessions.generate(model, Nil)
    }
  }
}
