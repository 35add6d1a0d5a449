package repro.select

import org.apache.spark.sql.DataFrame
import repro.SparkSpec
import repro.core.{Binning, BinnedMatrix, Scorer, Tables}
import repro.rules.Rule

import scala.util.Random

class GreedySpec extends SparkSpec {

  val cols = Seq("a", "b", "c", "d")
  def tok(c: String, v: String): String = Binning.token(c, v)

  def table(seed: Int, n: Int = 40): (DataFrame, Seq[Seq[String]]) = {
    import spark.implicits._
    val rng = new Random(seed)
    val rows = (0 until n).map { _ =>
      cols.map(c => tok(c, "v" + rng.nextInt(3)))
    }
    val df = rows.zipWithIndex.map { case (vs, i) =>
      (i.toLong, vs(0), vs(1), vs(2), vs(3))
    }.toDF((Tables.Rid +: cols): _*)
    (df, rows)
  }

  def randomRules(seed: Int, count: Int = 8): Seq[Rule] = {
    val rng = new Random(seed + 1000)
    (0 until count).map { _ =>
      val rcols = rng.shuffle(cols).take(2 + rng.nextInt(2))
      val items = rcols.map(c => tok(c, "v" + rng.nextInt(3)))
      Rule(items.init, Seq(items.last), 0.1, 0.6)
    }.distinctBy(_.items)
  }

  /** Exhaustive optimum of Max-Cell-Cover for tiny instances. */
  def bruteOpt(scorer: Scorer, k: Int, l: Int): Double = {
    val n = scorer.n
    val best = for {
      cs <- (0 until scorer.m).combinations(l)
      rs <- (0 until n).combinations(k)
    } yield scorer.cellCov(rs.toArray, cs.toArray)
    best.max
  }

  test("greedy achieves at least (1 - 1/e) of the optimum (Prop. 4.3)") {
    (1 to 4).foreach { seed =>
      val (df, _) = table(seed, n = 12)
      val rules = randomRules(seed)
      val scorer = new Scorer(BinnedMatrix.collect(df, cols), rules)
      if (scorer.upcov > 0) {
        val opt = bruteOpt(scorer, k = 3, l = 3)
        val res = Greedy.run(scorer, k = 3, l = 3, exhaustive = true)
        assert(res.cellCov >= (1 - 1 / math.E) * opt - 1e-9,
          s"seed=$seed greedy=${res.cellCov} opt=$opt")
      }
    }
  }

  test("exhaustive greedy actually attains the optimum on easy instances") {
    // One dominant rule: selecting its columns + one matching row is optimal.
    import spark.implicits._
    val rows = (0L until 20L).map { i =>
      if (i < 10) (i, tok("a", "p"), tok("b", "p"), tok("c", "p"), tok("d", "x" + i))
      else (i, tok("a", "q" + i % 3), tok("b", "q" + i % 2), tok("c", "q"), tok("d", "y"))
    }
    val df = rows.toDF((Tables.Rid +: cols): _*)
    val rule = Rule(Seq(tok("a", "p"), tok("b", "p")), Seq(tok("c", "p")), 0.5, 1.0)
    val scorer = new Scorer(BinnedMatrix.collect(df, cols), Seq(rule))
    val res = Greedy.run(scorer, k = 1, l = 3, exhaustive = true)
    assert(res.cellCov == 1.0)
    assert(res.sub.cols == Seq("a", "b", "c"))
    assert(res.sub.rowIds.head < 10)
  }

  test("greedy respects the column-set budget") {
    val (df, _) = table(5)
    val scorer = new Scorer(BinnedMatrix.collect(df, cols), randomRules(5))
    val res = Greedy.run(scorer, k = 3, l = 2, maxColSets = 3)
    assert(res.colSetsTried <= 3)
  }

  test("targets are always included in the selected columns") {
    val (df, _) = table(6)
    val scorer = new Scorer(BinnedMatrix.collect(df, cols), randomRules(6))
    val res = Greedy.run(scorer, k = 3, l = 2, targets = Seq("d"), maxColSets = 5)
    assert(res.sub.cols.contains("d"))
    assert(res.sub.cols.size == 2)
  }

  test("greedy returns exactly k distinct rows") {
    val (df, _) = table(7)
    val scorer = new Scorer(BinnedMatrix.collect(df, cols), randomRules(7))
    val res = Greedy.run(scorer, k = 5, l = 3, maxColSets = 2)
    assert(res.sub.rowIds.size == 5)
    assert(res.sub.rowIds.distinct.size == 5)
  }

  test("greedy is monotone in k (more rows never hurt coverage)") {
    val (df, _) = table(8)
    val scorer = new Scorer(BinnedMatrix.collect(df, cols), randomRules(8))
    val cov = (1 to 5).map { k =>
      Greedy.run(scorer, k, l = 3, exhaustive = true).cellCov
    }
    cov.sliding(2).foreach { case Seq(a, b) => assert(b >= a - 1e-12); case _ => () }
  }

  test("semi-greedy (random order) is deterministic in the seed") {
    val (df, _) = table(9)
    val scorer = new Scorer(BinnedMatrix.collect(df, cols), randomRules(9))
    val r1 = Greedy.run(scorer, 3, 2, maxColSets = 4, seed = 77)
    val r2 = Greedy.run(scorer, 3, 2, maxColSets = 4, seed = 77)
    assert(r1.sub == r2.sub && r1.cellCov == r2.cellCov)
  }

  test("with no rules coverage is vacuous and greedy still fills k rows") {
    val (df, _) = table(10)
    val scorer = new Scorer(BinnedMatrix.collect(df, cols), Nil)
    val res = Greedy.run(scorer, 4, 2, maxColSets = 1)
    assert(res.sub.rowIds.size == 4)
    assert(res.cellCov == 1.0)
  }
}
