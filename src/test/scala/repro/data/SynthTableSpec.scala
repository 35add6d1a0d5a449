package repro.data

import org.apache.spark.sql.functions._
import repro.SparkSpec
import repro.core.Tables

class SynthTableSpec extends SparkSpec {

  val cols = Seq[ColSpec](
    NumCol("n1", 0, 100),
    NumCol("n2", -10, 10, nullFrac = 0.2),
    CatCol("c1", Seq("a", "b", "c")),
    CatCol("c2", Seq("x", "y"), weights = Some(Seq(0.8, 0.2))),
    NumCol("g1", 0, 1), NumCol("g2", 0, 1),
  )
  val patterns = Seq(
    Pattern("p0", 0.3, Map("n1" -> NumCell(55, 55), "c1" -> CatCell("a"))),
    Pattern("p1", 0.2, Map("n1" -> NumCell(7, 7), "c1" -> CatCell("c"))),
  )
  val overlays = Seq(NullOverlay("g", Seq("g1", "g2"), 0.4))

  def build(n: Long = 5000, fuzz: Double = 0.05) =
    SynthTable.build(spark, n, cols, patterns, fuzz, "sts", overlays)

  test("generation is deterministic: two builds are cell-identical") {
    val a = build().collect().map(_.toSeq)
    val b = build().collect().map(_.toSeq)
    assert(a.toSeq == b.toSeq)
  }

  test("row count and rid range") {
    val df = build(1234)
    assert(df.count() == 1234)
    val rids = df.select(Tables.Rid).collect().map(_.getLong(0))
    assert(rids.min == 0L && rids.max == 1233L && rids.distinct.length == 1234)
  }

  test("pattern frequencies approximate their weights") {
    val df = build()
    val p0 = df.where(col("n1") === 55.0 && col("c1") === "a").count()
    val p1 = df.where(col("n1") === 7.0 && col("c1") === "c").count()
    // weight * (1-fuzz)^2 with some slack
    assert(p0 > 5000 * 0.3 * 0.8 && p0 < 5000 * 0.3 * 1.2, s"p0=$p0")
    assert(p1 > 5000 * 0.2 * 0.8 && p1 < 5000 * 0.2 * 1.2, s"p1=$p1")
  }

  test("fuzz controls how often pattern cells revert to base") {
    val noFuzz = build(fuzz = 0.0)
    val heavyFuzz = SynthTable.build(spark, 5000, cols, patterns, 0.5, "sts", overlays)
    val a = noFuzz.where(col("n1") === 55.0).count()
    val b = heavyFuzz.where(col("n1") === 55.0).count()
    assert(b < a * 0.75, s"fuzz had no effect: $a vs $b")
  }

  test("numeric base values stay in range; nullFrac produces nulls") {
    val df = build()
    val bad = df.where(col("n2").isNotNull && (col("n2") < -10 || col("n2") > 10)).count()
    assert(bad == 0)
    val nulls = df.where(col("n2").isNull).count()
    assert(nulls > 5000 * 0.12 && nulls < 5000 * 0.3, s"nulls=$nulls")
  }

  test("categorical weights shape the base distribution") {
    val df = build()
    val x = df.where(col("c2") === "x").count().toDouble / 5000
    assert(x > 0.7 && x < 0.9, s"weighted category off: $x")
  }

  test("null overlay nulls its columns jointly") {
    val df = build()
    val g1Null = df.where(col("g1").isNull)
    val both = g1Null.where(col("g2").isNull).count()
    // g1 and g2 are not claimed by any pattern -> always jointly null
    assert(both == g1Null.count())
    val frac = g1Null.count().toDouble / 5000
    assert(frac > 0.3 && frac < 0.5, s"overlay fraction $frac")
  }

  test("patterns win over overlays for the cells they claim") {
    val cols2 = Seq[ColSpec](NumCol("g1", 0, 1), NumCol("g2", 0, 1))
    val pats2 = Seq(Pattern("pp", 0.5, Map("g1" -> NumCell(0.5, 0.5))))
    val df = SynthTable.build(spark, 4000, cols2, pats2, 0.0, "ov",
      Seq(NullOverlay("g", Seq("g1", "g2"), 0.9)))
    // pattern rows keep g1 = 0.5 even when the overlay fires on g2
    val patRows = df.where(col("g1") === 0.5)
    assert(patRows.count() > 4000 * 0.4)
    assert(patRows.where(col("g2").isNull).count() > 0)
  }

  test("layers must claim disjoint columns") {
    val l1 = Seq(Pattern("a", 0.2, Map("n1" -> NumCell(1, 1))))
    val l2 = Seq(Pattern("b", 0.2, Map("n1" -> NumCell(2, 2))))
    intercept[IllegalArgumentException] {
      SynthTable.buildLayered(spark, 100, cols, Seq(l1, l2))
    }
  }

  test("layer draws are independent: joint pattern frequency factorizes") {
    val l1 = Seq(Pattern("a", 0.4, Map("n1" -> NumCell(55, 55))))
    val l2 = Seq(Pattern("b", 0.5, Map("c1" -> CatCell("a"))))
    val df = SynthTable.buildLayered(spark, 20000, cols, Seq(l1, l2), fuzz = 0.0, tag = "ind")
    val pa = df.where(col("n1") === 55.0).count().toDouble / 20000
    val pb = df.where(col("c1") === "a").count().toDouble / 20000
    val pab = df.where(col("n1") === 55.0 && col("c1") === "a").count().toDouble / 20000
    assert(math.abs(pab - pa * pb) < 0.02, s"layers correlated: $pab vs ${pa * pb}")
  }

  test("unknown pattern columns are rejected") {
    intercept[IllegalArgumentException] {
      SynthTable.build(spark, 10, cols, Seq(Pattern("bad", 0.1, Map("nope" -> CatCell("v")))))
    }
  }

  test("pattern weights must sum to at most 1") {
    intercept[IllegalArgumentException] {
      SynthTable.build(spark, 10, cols,
        Seq(Pattern("a", 0.7, Map.empty), Pattern("b", 0.6, Map.empty)))
    }
  }
}
