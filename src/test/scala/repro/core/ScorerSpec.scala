package repro.core

import org.apache.spark.sql.DataFrame
import repro.SparkSpec
import repro.rules.Rule

import scala.util.Random

/** The driver-side Scorer must agree exactly with the distributed Metrics —
  * they are independent implementations of Def. 3.6/3.7.
  */
class ScorerSpec extends SparkSpec {

  val cols = Seq("a", "b", "c", "d")

  /** Random binned table, rules and sub-tables; deterministic in seed. */
  def randomCase(seed: Int): (DataFrame, Seq[(Long, Seq[String])], Seq[Rule]) = {
    val rng = new Random(seed)
    val n = 20 + rng.nextInt(30)
    val rows = (0L until n).map { rid =>
      rid -> cols.map(c => Binning.token(c, "v" + rng.nextInt(3)))
    }
    import spark.implicits._
    val df = rows.map { case (rid, vs) => (rid, vs(0), vs(1), vs(2), vs(3)) }
      .toDF((Tables.Rid +: cols): _*)
    val rules = (0 until 10).map { _ =>
      val k = 1 + rng.nextInt(3)
      val rcols = rng.shuffle(cols).take(k + 1)
      val items = rcols.map(c => Binning.token(c, "v" + rng.nextInt(3)))
      Rule(items.init, Seq(items.last), 0.1, 0.6)
    }
    (df, rows, rules.distinctBy(_.items))
  }

  test("scorer cellCov/diversity/combined equal distributed Metrics on random cases") {
    (1 to 5).foreach { seed =>
      val (df, rows, rules) = randomCase(seed)
      val scorer = new Scorer(BinnedMatrix.collect(df, cols), rules)
      val rng = new Random(seed + 100)
      (1 to 8).foreach { _ =>
        val k = 1 + rng.nextInt(5)
        val l = 1 + rng.nextInt(4)
        val rowIdxs = rng.shuffle(rows.indices.toList).take(k).sorted.toArray
        val colIdxs = rng.shuffle(cols.indices.toList).take(l).sorted.toArray
        val sub = scorer.toSubTable(rowIdxs, colIdxs)
        val expected = Metrics.scores(df, cols, rules, sub)
        assert(math.abs(scorer.cellCov(rowIdxs, colIdxs) - expected.cellCov) < 1e-12,
          s"cellCov mismatch seed=$seed sub=$sub")
        assert(math.abs(scorer.diversity(rowIdxs, colIdxs) - expected.divers) < 1e-12,
          s"diversity mismatch seed=$seed sub=$sub")
        assert(math.abs(scorer.combined(rowIdxs, colIdxs) - expected.combined) < 1e-12,
          s"combined mismatch seed=$seed sub=$sub")
      }
    }
  }

  test("upcov equals distributed describedCellCount") {
    (1 to 5).foreach { seed =>
      val (df, _, rules) = randomCase(seed)
      val scorer = new Scorer(BinnedMatrix.collect(df, cols), rules)
      assert(scorer.upcov == Metrics.describedCellCount(df, cols, rules))
    }
  }

  test("rules that reference unseen tokens match no rows") {
    val (df, _, _) = randomCase(1)
    val ghost = Rule(Seq(Binning.token("a", "zz"), Binning.token("b", "v0")),
      Seq(Binning.token("c", "v0")), 0.1, 0.6)
    val scorer = new Scorer(BinnedMatrix.collect(df, cols), Seq(ghost))
    assert(scorer.rules.head.matchRows.isEmpty)
    assert(scorer.upcov == 0L)
    assert(scorer.cellCov(Array(0), Array(0, 1, 2)) == 1.0) // vacuous
  }

  test("row/col index translation round-trips") {
    val (df, rows, rules) = randomCase(2)
    val scorer = new Scorer(BinnedMatrix.collect(df, cols), rules)
    val rids = Seq(rows(3)._1, rows(7)._1)
    assert(scorer.rowIndices(rids).toSeq == Seq(3, 7))
    assert(scorer.colIndices(Seq("c", "a")).toSeq == Seq(2, 0))
    val sub = scorer.toSubTable(Array(3, 7), Array(0, 2))
    assert(sub.rowIds == rids && sub.cols == Seq("a", "c"))
  }

  test("matchRows are exactly the rows the rule holds for") {
    val (df, rows, rules) = randomCase(3)
    val scorer = new Scorer(BinnedMatrix.collect(df, cols), rules)
    scorer.rules.foreach { cr =>
      val expected = rows.zipWithIndex.collect {
        case ((_, vs), i) if cr.rule.holdsFor(vs.toSet) => i
      }
      assert(cr.matchRows.toSeq == expected, s"rule ${cr.rule}")
    }
  }

  test("BinnedMatrix.collect preserves rid order and shape") {
    val (df, rows, _) = randomCase(4)
    val mat = BinnedMatrix.collect(df, cols)
    assert(mat.n == rows.size && mat.m == 4)
    assert(mat.rids.toSeq == rows.map(_._1))
    assert(mat.rows(5).toSeq == rows(5)._2)
  }
}
