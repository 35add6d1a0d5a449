package repro.eda

import repro.SparkSpec
import repro.core.{Binning, Tables}

import scala.util.Random

class InsightOracleSpec extends SparkSpec {

  val cols = Seq("a", "b", "c")
  def tok(c: String, v: String): String = Binning.token(c, v)

  /** Full binned table: a=1 and b=1 co-occur strongly (lift >> 1); c noise. */
  lazy val binned = {
    import spark.implicits._
    val rng = new Random(23)
    (0L until 500L).map { i =>
      if (i < 150) (i, tok("a", "1"), tok("b", "1"), tok("c", "x" + rng.nextInt(4)))
      else (i, tok("a", (2 + rng.nextInt(3)).toString),
        tok("b", (2 + rng.nextInt(3)).toString), tok("c", "x" + rng.nextInt(4)))
    }.toDF((Tables.Rid +: cols): _*)
  }

  test("analyst reports pairs repeated in at least two sub-table rows") {
    val subRows = Seq(
      Seq(tok("a", "1"), tok("b", "1"), tok("c", "x0")),
      Seq(tok("a", "1"), tok("b", "1"), tok("c", "x1")),
      Seq(tok("a", "2"), tok("b", "3"), tok("c", "x2")))
    val ins = InsightOracle.analyst(cols, subRows, maxInsights = 5, userSeed = 1)
    assert(ins.map(_.items).contains(Vector(tok("a", "1"), tok("b", "1")).sorted))
    // the a=2/b=3 pair appears once only -> not reported
    assert(!ins.map(_.items).contains(Vector(tok("a", "2"), tok("b", "3")).sorted))
  }

  test("analyst never reports a jointly-missing pair") {
    val nul = Binning.NullLabel
    val subRows = Seq(
      Seq(tok("a", nul), tok("b", nul), tok("c", "x0")),
      Seq(tok("a", nul), tok("b", nul), tok("c", "x0")))
    val ins = InsightOracle.analyst(cols, subRows, 5, userSeed = 2)
    ins.foreach { i =>
      assert(!i.items.forall(_.endsWith(Binning.Sep + nul)), s"null-null insight $i")
    }
    // but value-with-∅ is reportable
    assert(ins.exists(_.items.contains(tok("c", "x0"))))
  }

  test("maxInsights caps the report") {
    val subRows = (0 until 6).map(i => cols.map(c => tok(c, "same")))
    val ins = InsightOracle.analyst(cols, subRows, maxInsights = 2, userSeed = 3)
    assert(ins.size <= 2)
  }

  test("grading: genuine co-occurrence is correct, chance pair is not") {
    val genuine = InsightOracle.Insight(Vector(tok("a", "1"), tok("b", "1")).sorted)
    val chance = InsightOracle.Insight(Vector(tok("a", "2"), tok("c", "x0")).sorted)
    val graded = InsightOracle.grade(binned, cols, Seq(genuine, chance))
    assert(graded == Seq(true, false))
  }

  test("grading an unseen pair is incorrect (zero support)") {
    val ghost = InsightOracle.Insight(Vector(tok("a", "1"), tok("b", "2")).sorted)
    assert(InsightOracle.grade(binned, cols, Seq(ghost)) == Seq(false))
  }

  test("simulateUser counts written and correct insights") {
    val subRows = Seq(
      Seq(tok("a", "1"), tok("b", "1"), tok("c", "x0")),
      Seq(tok("a", "1"), tok("b", "1"), tok("c", "x1")),
      Seq(tok("a", "2"), tok("b", "2"), tok("c", "x2")),
      Seq(tok("a", "2"), tok("b", "2"), tok("c", "x3")))
    val r = InsightOracle.simulateUser(binned, cols, cols, subRows, userSeed = 4)
    assert(r.written >= 1)
    assert(r.correct >= 1) // a=1 & b=1 is genuinely correlated
    assert(r.correct <= r.written)
    assert(r.hasInsight)
  }

  test("different users notice different tie-broken insights") {
    // 6 equally-frequent pairs, cap at 2 -> different seeds may differ
    val subRows = Seq(
      Seq(tok("a", "1"), tok("b", "1"), tok("c", "x0")),
      Seq(tok("a", "1"), tok("b", "1"), tok("c", "x0")))
    val picks = (1 to 10).map(s =>
      InsightOracle.analyst(cols, subRows, 1, userSeed = s).map(_.items).toSet)
    assert(picks.distinct.size > 1, "tie-breaking did not vary across users")
  }

  test("grade of empty insight list is empty") {
    assert(InsightOracle.grade(binned, cols, Nil).isEmpty)
  }

  test("highlight-aware analyst reads pairs off the covered rules") {
    val rule = repro.rules.Rule(
      Seq(tok("a", "1")), Seq(tok("b", "1")), support = 0.3, confidence = 0.9)
    val subRows = Seq(
      Seq(tok("a", "4"), tok("b", "4"), tok("c", "x0")),
      Seq(tok("a", "3"), tok("b", "2"), tok("c", "x1")))
    val ins = InsightOracle.analystWithHighlights(cols, subRows, Seq(rule), 5, userSeed = 7)
    assert(ins.map(_.items).contains(Vector(tok("a", "1"), tok("b", "1")).sorted))
  }

  test("highlight-aware analyst skips trivial near-universal rules") {
    val trivial = repro.rules.Rule(
      Seq(tok("a", "1")), Seq(tok("b", "1")), support = 0.95, confidence = 1.0)
    val subRows = Seq(Seq(tok("a", "2"), tok("b", "2"), tok("c", "x0")))
    val ins = InsightOracle.analystWithHighlights(cols, subRows, Seq(trivial), 5, userSeed = 8)
    assert(!ins.map(_.items).contains(Vector(tok("a", "1"), tok("b", "1")).sorted))
  }

  test("simulateUser with highlights grades rule-derived insights correct") {
    val rule = repro.rules.Rule(
      Seq(tok("a", "1")), Seq(tok("b", "1")), support = 0.3, confidence = 0.9)
    val subRows = Seq(
      Seq(tok("a", "1"), tok("b", "1"), tok("c", "x0")),
      Seq(tok("a", "2"), tok("b", "3"), tok("c", "x1")))
    val r = InsightOracle.simulateUser(binned, cols, cols, subRows,
      userSeed = 9, highlighted = Seq(rule))
    assert(r.correct >= 1) // the highlighted (a=1, b=1) pair is genuine
  }
}
