package repro.data

import org.apache.spark.sql.{Column, DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types.{DoubleType, StringType}
import repro.core.Tables

import scala.util.hashing.MurmurHash3

/** Deterministic synthetic-table builder with *planted patterns*.
  *
  * Every cell is a pure function of (`__rid`, column name, dataset tag) via
  * Murmur3 hashing, so tables are bit-identical across re-computation,
  * partitioning and sessions — required both for the DuckDB oracle and for
  * `__rid`-addressed sub-tables.
  *
  * A [[Pattern]] is a latent row class: with probability `weight` a row
  * belongs to it, and then each of the pattern's cells is drawn from the
  * pattern's generator instead of the column's base distribution (except
  * with probability `fuzz`, which caps rule confidence below 1). Patterns
  * are the ground-truth association rules of the dataset — the "prominent
  * rules" regime the paper's embedding implicitly captures.
  */
sealed trait CellGen
/** Uniform draw in [lo, hi). lo == hi pins a constant. */
final case class NumCell(lo: Double, hi: Double) extends CellGen
/** Uniform draw among the given category values. */
final case class CatCell(values: Seq[String]) extends CellGen
object CatCell { def apply(v: String): CatCell = CatCell(Seq(v)) }
/** The pattern forces a missing value (NaN-cluster patterns, e.g. FL). */
case object NullCell extends CellGen

final case class Pattern(name: String, weight: Double, cells: Map[String, CellGen])

/** Jointly-missing column group: with probability `nullFrac` (drawn once per
  * row) ALL the group's columns are null together — the real-data structure
  * of e.g. the five FL delay-breakdown columns, which are NaN unless the
  * flight was delayed. Pattern-set cells win over the overlay so planted
  * rules survive.
  */
final case class NullOverlay(name: String, cols: Seq[String], nullFrac: Double)

sealed trait ColSpec { def name: String }
final case class NumCol(name: String, lo: Double, hi: Double,
                        nullFrac: Double = 0.0) extends ColSpec
final case class CatCol(name: String, values: Seq[String],
                        weights: Option[Seq[Double]] = None,
                        nullFrac: Double = 0.0) extends ColSpec

object SynthTable {

  /** Uniform [0,1) deterministic in (rid, tag). */
  private def u(tag: String): Column =
    pmod(hash(col(Tables.Rid), lit(MurmurHash3.stringHash(tag))), lit(1000003))
      .cast(DoubleType) / 1000003.0

  /** Chained-when pick of `values` by cumulative `weights` over draw `d`. */
  private def pick(d: Column, values: Seq[String], weights: Seq[Double]): Column = {
    val total = weights.sum
    val cum = weights.scanLeft(0.0)(_ + _).tail.map(_ / total)
    values.zip(cum).init.foldRight(lit(values.last): Column) {
      case ((v, c), acc) => when(d < c, lit(v)).otherwise(acc)
    }
  }

  /** Single-layer convenience overload. */
  def build(spark: SparkSession, nRows: Long, cols: Seq[ColSpec],
            patterns: Seq[Pattern], fuzz: Double,
            tag: String, overlays: Seq[NullOverlay]): DataFrame =
    buildLayered(spark, nRows, cols, Seq(patterns), fuzz, tag, overlays)

  def build(spark: SparkSession, nRows: Long, cols: Seq[ColSpec],
            patterns: Seq[Pattern], fuzz: Double = 0.05,
            tag: String = "t"): DataFrame =
    buildLayered(spark, nRows, cols, Seq(patterns), fuzz, tag, Nil)

  /** Layered build: each layer is an independent latent draw with its own
    * mutually-exclusive patterns; different layers must claim disjoint
    * column sets. Layers model the fact that real tables have several
    * independent correlation structures (operational, geographic, temporal,
    * ...) spread over different column groups — which also spreads the
    * mined-rule mass across the schema instead of concentrating it on one
    * jackpot column subset.
    */
  def buildLayered(spark: SparkSession, nRows: Long, cols: Seq[ColSpec],
                   layers: Seq[Seq[Pattern]], fuzz: Double = 0.05,
                   tag: String = "t", overlays: Seq[NullOverlay] = Nil): DataFrame = {
    layers.foreach { patterns =>
      require(patterns.map(_.weight).sum <= 1.0 + 1e-9,
        "pattern weights in a layer must sum to <= 1")
    }
    val claims = layers.map(_.flatMap(_.cells.keys).toSet)
    claims.combinations(2).foreach { pair =>
      val a = pair(0); val b = pair(1)
      require((a & b).isEmpty, s"layers must claim disjoint columns; overlap: ${a & b}")
    }
    layers.flatten.foreach(p => p.cells.keys.foreach { c =>
      require(cols.exists(_.name == c), s"pattern ${p.name} uses unknown column $c")
    })
    overlays.foreach(o => o.cols.foreach { c =>
      require(cols.exists(_.name == c), s"overlay ${o.name} uses unknown column $c")
    })

    val base = spark.range(nRows).withColumnRenamed("id", Tables.Rid)

    // Latent pattern index per layer: -1 = background noise row.
    val patIdxByLayer: Seq[Column] = layers.zipWithIndex.map { case (patterns, li) =>
      val patDraw = u(s"$tag/pat/$li")
      val cum = patterns.map(_.weight).scanLeft(0.0)(_ + _).tail
      patterns.indices.foldRight(lit(-1): Column) {
        case (i, acc) => when(patDraw < cum(i), lit(i)).otherwise(acc)
      }
    }
    // Column -> (layer index, patterns of that layer).
    val layerOfCol: Map[String, Int] =
      layers.zipWithIndex.flatMap { case (ps, li) =>
        ps.flatMap(_.cells.keys).distinct.map(_ -> li)
      }.toMap

    def baseExpr(c: ColSpec): Column = c match {
      case NumCol(name, lo, hi, nf) =>
        val v = lit(lo) + u(s"$tag/b/$name") * (hi - lo)
        if (nf > 0) when(u(s"$tag/n/$name") < nf, lit(null).cast(DoubleType)).otherwise(v)
        else v
      case CatCol(name, values, ws, nf) =>
        val v = pick(u(s"$tag/b/$name"), values,
          ws.getOrElse(Seq.fill(values.size)(1.0)))
        if (nf > 0) when(u(s"$tag/n/$name") < nf, lit(null).cast(StringType)).otherwise(v)
        else v
    }

    def cellExpr(g: CellGen, c: ColSpec, pi: Int): Column = g match {
      case NumCell(lo, hi) => lit(lo) + u(s"$tag/c/$pi/${c.name}") * (hi - lo)
      case CatCell(vs)     => pick(u(s"$tag/c/$pi/${c.name}"), vs, Seq.fill(vs.size)(1.0))
      case NullCell        =>
        val t = c match { case _: NumCol => DoubleType; case _: CatCol => StringType }
        lit(null).cast(t)
    }

    val outCols: Seq[Column] = cols.map { c =>
      val liOpt = layerOfCol.get(c.name)
      val li = liOpt.getOrElse(-1)
      val patterns = liOpt.map(layers).getOrElse(Nil)
      val patIdx = liOpt.map(patIdxByLayer).getOrElse(lit(-1))
      // Joint-null overlays under everything; a pattern that sets this cell
      // wins over the overlay (checked via patIdx, ignoring fuzz — fuzz
      // only perturbs the pattern's *value*, not its presence).
      val overlaid = overlays.filter(_.cols.contains(c.name)).foldLeft(baseExpr(c)) {
        case (acc, o) =>
          val t = c match { case _: NumCol => DoubleType; case _: CatCol => StringType }
          val patternSets = patterns.zipWithIndex.collect {
            case (p, i) if p.cells.contains(c.name) => patIdx === i
          }.foldLeft(lit(false))(_ || _)
          when(u(s"$tag/o/${o.name}") < o.nullFrac && !patternSets,
            lit(null).cast(t)).otherwise(acc)
      }
      val withPatterns = patterns.zipWithIndex.foldLeft(overlaid) {
        case (acc, (p, i)) =>
          p.cells.get(c.name) match {
            case None => acc
            case Some(g) =>
              when(patIdx === i && u(s"$tag/f/$li/$i/${c.name}") >= fuzz,
                cellExpr(g, c, i)).otherwise(acc)
          }
      }
      withPatterns.as(c.name)
    }

    base.select(col(Tables.Rid) +: outCols: _*)
  }
}
