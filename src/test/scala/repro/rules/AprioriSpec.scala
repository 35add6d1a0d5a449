package repro.rules

import org.apache.spark.sql.DataFrame
import repro.core.{Binning, Tables}
import repro.{Oracle, SparkSpec}

import scala.util.Random

class AprioriSpec extends SparkSpec {

  val cols = Seq("x", "y", "z")

  def tok(c: String, v: String): String = Binning.token(c, v)

  /** Small binned table with a planted co-occurrence {x=a, y=a, z=a}. */
  lazy val planted: DataFrame = {
    import spark.implicits._
    val rng = new Random(7)
    val rows = (0L until 200L).map { rid =>
      if (rid < 60) (rid, tok("x", "a"), tok("y", "a"), tok("z", "a"))
      else (rid, tok("x", "v" + rng.nextInt(3)), tok("y", "w" + rng.nextInt(3)),
        tok("z", "u" + rng.nextInt(3)))
    }
    rows.toDF((Tables.Rid +: cols): _*)
  }

  /** Driver-side brute-force frequent itemsets for verification. */
  def bruteForce(df: DataFrame, minSupport: Double, maxLen: Int): Map[Vector[String], Long] = {
    val rows = df.select(cols.map(org.apache.spark.sql.functions.col): _*)
      .collect().map(r => cols.indices.map(r.getString).toSet)
    val n = rows.length
    val minCount = math.ceil(minSupport * n).toLong
    val allTokens = rows.flatten.distinct.toSeq.sorted
    (1 to maxLen).flatMap { k =>
      allTokens.combinations(k).map { c =>
        c.toVector -> rows.count(r => c.forall(r.contains)).toLong
      }.filter(_._2 >= minCount)
    }.toMap
  }

  test("frequent itemsets match brute force") {
    val p = Apriori.Params(minSupport = 0.2, maxItemsetSize = 3,
      miningSampleRows = 100000)
    val freq = Apriori.frequentItemsets(planted, cols, p)
    val expected = bruteForce(planted, 0.2, 3)
    val got = freq.itemsets.map(s => s.items -> s.count).toMap
    assert(got == expected)
    assert(freq.nRows == 200L)
  }

  test("the planted triple is found with correct count") {
    val p = Apriori.Params(minSupport = 0.2, maxItemsetSize = 3)
    val freq = Apriori.frequentItemsets(planted, cols, p)
    val triple = Vector(tok("x", "a"), tok("y", "a"), tok("z", "a")).sorted
    assert(freq.countOf.get(triple).contains(60L))
  }

  test("support is anti-monotone: subsets count at least as much") {
    val p = Apriori.Params(minSupport = 0.1, maxItemsetSize = 3)
    val freq = Apriori.frequentItemsets(planted, cols, p)
    val counts = freq.countOf
    for ((items, c) <- counts if items.size > 1; d <- items.indices) {
      val sub = items.patch(d, Nil, 1)
      assert(counts(sub) >= c, s"anti-monotonicity violated: $sub < $items")
    }
  }

  test("itemset support counts match DuckDB (oracle)") {
    val p = Apriori.Params(minSupport = 0.2, maxItemsetSize = 3)
    val freq = Apriori.frequentItemsets(planted, cols, p)
    val triple = Vector(tok("x", "a"), tok("y", "a"), tok("z", "a")).sorted
    import spark.implicits._
    val sparkCount = Seq(freq.countOf(triple)).toDF("n")
      .select(org.apache.spark.sql.functions.col("n").cast("long").as("n"))
    Oracle.assertEquivalent(sparkCount,
      s"SELECT CAST(COUNT(*) AS BIGINT) AS n FROM t " +
        s"WHERE x = '${tok("x", "a")}' AND y = '${tok("y", "a")}' AND z = '${tok("z", "a")}'",
      "t" -> planted.drop(Tables.Rid))
  }

  test("countItemsets agrees with frequentItemsets on frequent sets") {
    val p = Apriori.Params(minSupport = 0.2, maxItemsetSize = 3)
    val freq = Apriori.frequentItemsets(planted, cols, p)
    val counts = Apriori.countItemsets(planted, cols, freq.itemsets.map(_.items))
    freq.itemsets.foreach { is =>
      assert(counts(is.items) == is.count, s"mismatch on ${is.items}")
    }
  }

  test("countItemsets counts infrequent and unseen itemsets too") {
    val counts = Apriori.countItemsets(planted, cols,
      Seq(Seq(tok("x", "nope")), Seq(tok("x", "a"), tok("y", "w0"))))
    assert(counts(Vector(tok("x", "nope"))) == 0L)
    assert(counts(Vector(tok("x", "a"), tok("y", "w0")).sorted) == 0L)
  }

  test("rule generation: confidence and sizes are correct") {
    val p = Apriori.Params(minSupport = 0.2, minConfidence = 0.5,
      minRuleSize = 3, maxItemsetSize = 3)
    val rules = Apriori.mine(planted, cols, p)
    assert(rules.nonEmpty)
    rules.foreach { r =>
      assert(r.size >= 3)
      assert(r.lhs.nonEmpty && r.rhs.nonEmpty)
      assert(r.confidence >= 0.5 && r.confidence <= 1.0 + 1e-12)
      assert(r.support >= 0.2 - 1e-12)
    }
    // The planted triple yields rules like {x=a, y=a} -> {z=a} with conf 1.0.
    val perfect = rules.find(r =>
      r.lhs.toSet == Set(tok("x", "a"), tok("y", "a")) && r.rhs == Seq(tok("z", "a")))
    assert(perfect.nonEmpty)
    assert(math.abs(perfect.get.confidence - 1.0) < 1e-9)
    assert(math.abs(perfect.get.support - 0.3) < 1e-9)
  }

  test("confidence filters out weak directions") {
    // {z=u0} -> {x=a...} style rules have low confidence and must be absent.
    val p = Apriori.Params(minSupport = 0.2, minConfidence = 0.9,
      minRuleSize = 3, maxItemsetSize = 3)
    val rules = Apriori.mine(planted, cols, p)
    rules.foreach(r => assert(r.confidence >= 0.9))
  }

  test("minRuleSize excludes small itemsets from rule generation") {
    // Only 3 columns -> no itemset of size 4 exists -> no rules.
    val p = Apriori.Params(minSupport = 0.2, minConfidence = 0.0,
      minRuleSize = 4, maxItemsetSize = 4)
    assert(Apriori.mine(planted, cols, p).isEmpty)
    // With minRuleSize 3 the same table does produce rules.
    val p3 = p.copy(minRuleSize = 3, maxItemsetSize = 3)
    assert(Apriori.mine(planted, cols, p3).nonEmpty)
  }

  test("mining sample cap is honored") {
    val p = Apriori.Params(minSupport = 0.2, miningSampleRows = 50)
    val freq = Apriori.frequentItemsets(planted, cols, p)
    assert(freq.nRows <= 80, s"expected ~50 rows in sample, got ${freq.nRows}")
  }

  test("genCandidates joins on shared prefix and prunes") {
    // L2 = {01, 02, 12, 13}: join gives 012 (kept: all subsets frequent)
    // and 123 (pruned: 23 missing).
    val level = Array(Array(0, 1), Array(0, 2), Array(1, 2), Array(1, 3))
    val cands = Apriori.genCandidates(level).map(_.toSeq)
    assert(cands.toSet == Set(Seq(0, 1, 2)))
  }

  test("genCandidates on singletons yields all pairs") {
    val level = Array(Array(0), Array(1), Array(2))
    val cands = Apriori.genCandidates(level).map(_.toSeq).toSet
    assert(cands == Set(Seq(0, 1), Seq(0, 2), Seq(1, 2)))
  }

  test("params are validated") {
    intercept[IllegalArgumentException] { Apriori.Params(minSupport = 0.0) }
    intercept[IllegalArgumentException] { Apriori.Params(minConfidence = 1.5) }
    intercept[IllegalArgumentException] {
      Apriori.Params(minRuleSize = 3, maxItemsetSize = 2)
    }
  }
}
