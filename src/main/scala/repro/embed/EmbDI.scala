package repro.embed

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.core.{Binning, Tables}

import scala.collection.mutable
import scala.util.Random

/** EmbDI-style baseline embedding [Cappuzzo et al., SIGMOD'20], rebuilt from
  * its core mechanism (DESIGN.md §3): the binned table becomes a tripartite
  * graph with row nodes (`R#rid`), token nodes and column nodes (`C#name`);
  * truncated random walks over the graph form the corpus; Word2Vec over the
  * walks yields token vectors usable by the same centroid selection as
  * SubTab.
  *
  * The walk generation materializes the cell list and an inverted
  * token -> rows index on the driver — deliberately the heavyweight
  * comparator, matching the paper's finding that EmbDI pre-processing is an
  * order of magnitude slower than SubTab's (40 min vs 90 s there).
  */
object EmbDI {

  final case class Params(
      walksPerRow: Int = 2,
      walkLength: Int = 8,
      embed: CellEmbedding.Params = CellEmbedding.Params(),
      seed: Long = 41,
  )

  /** Train token vectors via graph random walks. Returns the cell-to-vector
    * model restricted to *token* nodes (row/column nodes are training
    * scaffolding, as in EmbDI).
    */
  def train(binned: DataFrame, cols: Seq[String], p: Params = Params()): CellEmbedding.Model = {
    val spark = binned.sparkSession
    // Materialize the graph on the driver (the slow part, by construction).
    val rows: Array[Array[String]] = binned
      .select((Tables.Rid +: cols).map(col): _*)
      .orderBy(col(Tables.Rid))
      .collect()
      .map(r => cols.indices.map(i => r.getString(i + 1)).toArray)

    val n = rows.length
    val m = cols.length
    // Inverted index token -> row ids, and token -> column.
    val tokRows = mutable.HashMap[String, mutable.ArrayBuffer[Int]]()
    rows.zipWithIndex.foreach { case (r, i) =>
      r.foreach(t => tokRows.getOrElseUpdate(t, mutable.ArrayBuffer[Int]()) += i)
    }
    val tokensByCol: Array[Array[String]] =
      cols.indices.map(j => rows.iterator.map(_(j)).toArray.distinct).toArray

    val rng = new Random(p.seed)
    val walks = mutable.ArrayBuffer[Array[String]]()
    var i = 0
    while (i < n) {
      var w = 0
      while (w < p.walksPerRow) {
        val walk = new Array[String](p.walkLength)
        var row = i
        var s = 0
        while (s < p.walkLength) {
          // row node -> random token of the row
          val colPick = rng.nextInt(m)
          val tok = rows(row)(colPick)
          walk(s) = tok
          // token node -> either another row containing it, or via its
          // column node to a sibling token (EmbDI's structural hop).
          if (rng.nextBoolean()) {
            val rs = tokRows(tok)
            row = rs(rng.nextInt(rs.length))
          } else {
            val sibs = tokensByCol(colPick)
            val sib = sibs(rng.nextInt(sibs.length))
            val rs = tokRows(sib)
            row = rs(rng.nextInt(rs.length))
          }
          s += 1
        }
        walks += walk
        w += 1
      }
      i += 1
    }

    val corpus = TabularCorpus.fromWalks(spark, walks.toSeq)
    CellEmbedding.train(corpus, p.embed)
  }
}
