package repro.select

import org.apache.spark.sql.DataFrame
import org.scalacheck.{Gen, Prop}
import repro.core.{Binning, BinnedMatrix, Scorer, Tables}
import repro.rules.Rule
import repro.{PropSupport, SparkSpec}

import scala.util.Random

/** RAN and MAB baselines over the shared driver-side scorer. */
class BaselinesSpec extends SparkSpec with PropSupport {

  val cols = Seq("a", "b", "c", "d", "e")
  def tok(c: String, v: String): String = Binning.token(c, v)

  lazy val scorer: Scorer = {
    import spark.implicits._
    val rng = new Random(11)
    val rows = (0L until 60L).map { i =>
      (i, tok("a", "v" + rng.nextInt(3)), tok("b", "v" + rng.nextInt(3)),
        tok("c", "v" + rng.nextInt(3)), tok("d", "v" + rng.nextInt(3)),
        tok("e", "v" + rng.nextInt(2)))
    }
    val df: DataFrame = rows.toDF((Tables.Rid +: cols): _*)
    val rules = Seq(
      Rule(Seq(tok("a", "v0"), tok("b", "v0")), Seq(tok("c", "v0")), 0.1, 0.6),
      Rule(Seq(tok("c", "v1"), tok("d", "v1")), Seq(tok("e", "v1")), 0.1, 0.6),
      Rule(Seq(tok("b", "v2"), tok("d", "v0")), Seq(tok("a", "v1")), 0.1, 0.6),
    )
    new Scorer(BinnedMatrix.collect(df, cols), rules)
  }

  // ------------------------------------------------------------- RAN -----
  test("RAN returns a k×l sub-table with targets included") {
    val r = RandomBaseline.run(scorer, k = 5, l = 3, targets = Seq("e"),
      maxIters = 25, seed = 1)
    assert(r.sub.rowIds.size == 5 && r.sub.rowIds.distinct.size == 5)
    assert(r.sub.cols.size == 3 && r.sub.cols.contains("e"))
    assert(r.iterations == 25)
  }

  test("RAN is deterministic in the seed") {
    val a = RandomBaseline.run(scorer, 5, 3, maxIters = 20, seed = 9)
    val b = RandomBaseline.run(scorer, 5, 3, maxIters = 20, seed = 9)
    assert(a.sub == b.sub && a.score == b.score)
  }

  test("RAN's reported score equals the scorer's score of the returned sub-table") {
    val r = RandomBaseline.run(scorer, 5, 3, maxIters = 15, seed = 3)
    val rows = scorer.rowIndices(r.sub.rowIds)
    val cs = scorer.colIndices(r.sub.cols)
    assert(math.abs(scorer.combined(rows, cs) - r.score) < 1e-12)
  }

  test("more RAN iterations never yield a worse best score") {
    val small = RandomBaseline.run(scorer, 5, 3, maxIters = 5, seed = 4).score
    val big = RandomBaseline.run(scorer, 5, 3, maxIters = 50, seed = 4).score
    assert(big >= small)
  }

  test("RAN clamps k to the table size") {
    val r = RandomBaseline.run(scorer, k = 1000, l = 2, maxIters = 3, seed = 5)
    assert(r.sub.rowIds.size == scorer.n)
  }

  test("sampleDistinct draws k distinct values in range (property)") {
    checkProp(Prop.forAll(Gen.chooseNum(1, 50), Gen.chooseNum(1L, 10000L)) { (k, seed) =>
      val rng = new Random(seed)
      val n = 60
      val got = RandomBaseline.sampleDistinct(rng, n, math.min(k, n))
      got.length == math.min(k, n) && got.distinct.length == got.length &&
        got.forall(i => i >= 0 && i < n)
    })
  }

  // ------------------------------------------------------------- MAB -----
  test("MAB returns a valid sub-table and iterates within budget") {
    val r = MAB.run(scorer, k = 5, l = 3, targets = Seq("e"),
      maxIters = 40, seed = 6)
    assert(r.sub.rowIds.size == 5)
    assert(r.sub.cols.size == 3 && r.sub.cols.contains("e"))
    assert(r.iterations == 40)
  }

  test("MAB is deterministic in the seed") {
    val a = MAB.run(scorer, 5, 3, maxIters = 30, seed = 8)
    val b = MAB.run(scorer, 5, 3, maxIters = 30, seed = 8)
    assert(a.sub == b.sub && a.score == b.score)
  }

  test("MAB best score is monotone in iterations") {
    val small = MAB.run(scorer, 5, 3, maxIters = 5, seed = 10).score
    val big = MAB.run(scorer, 5, 3, maxIters = 60, seed = 10).score
    assert(big >= small)
  }

  test("MAB visits untried arms first (forced exploration sweep)") {
    // After n/k iterations every row arm has been tried at least once if
    // iterations >= ceil(n/k): with n=60, k=5 -> 12 iterations.
    val r = MAB.run(scorer, 5, 5, maxIters = 12, seed = 12)
    assert(r.iterations == 12) // sweep completes without error
  }

  test("baselines reject more targets than columns") {
    intercept[IllegalArgumentException] {
      RandomBaseline.run(scorer, 3, 1, targets = Seq("a", "b"), maxIters = 1)
    }
    intercept[IllegalArgumentException] {
      MAB.run(scorer, 3, 1, targets = Seq("a", "b"), maxIters = 1)
    }
  }
}
