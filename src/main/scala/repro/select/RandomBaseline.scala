package repro.select

import repro.core.{Scorer, SubTable}

import scala.util.Random

/** RAN baseline (paper §6.1): repeatedly draw a uniform k×l sub-table and
  * keep the best by combined score, until an iteration cap or a wall-clock
  * budget is hit (the paper iterates for one minute). Target columns are
  * always forced into the draw.
  */
object RandomBaseline {

  final case class Result(sub: SubTable, score: Double, iterations: Int)

  def run(scorer: Scorer, k: Int, l: Int, targets: Seq[String] = Nil,
          budgetMillis: Long = 60000, maxIters: Int = Int.MaxValue,
          seed: Long = 23): Result = {
    val rng = new Random(seed)
    val n = scorer.n
    val targetIdxs = scorer.colIndices(targets)
    val freeCols = (0 until scorer.m).filterNot(targetIdxs.contains).toArray
    val kk = math.min(k, n)
    val wantFree = math.min(l - targetIdxs.length, freeCols.length)
    require(wantFree >= 0, s"more targets (${targets.size}) than columns ($l)")

    val deadline = Budgets.saturatingDeadline(System.nanoTime(), budgetMillis)
    var best: (Array[Int], Array[Int]) = null
    var bestScore = Double.NegativeInfinity
    var iters = 0
    while (iters < maxIters && (iters == 0 || System.nanoTime() < deadline)) {
      val rows = sampleDistinct(rng, n, kk)
      val cols = (targetIdxs ++ shuffleTake(rng, freeCols, wantFree)).sorted
      val s = scorer.combined(rows, cols)
      if (s > bestScore) { bestScore = s; best = (rows, cols) }
      iters += 1
    }
    Result(scorer.toSubTable(best._1, best._2), bestScore, iters)
  }

  /** k distinct ints from [0, n) — Floyd's algorithm. */
  private[select] def sampleDistinct(rng: Random, n: Int, k: Int): Array[Int] = {
    val chosen = scala.collection.mutable.LinkedHashSet[Int]()
    var j = n - k
    while (j < n) {
      val t = rng.nextInt(j + 1)
      if (chosen.contains(t)) chosen += j else chosen += t
      j += 1
    }
    chosen.toArray.sorted
  }

  private def shuffleTake(rng: Random, from: Array[Int], k: Int): Array[Int] =
    rng.shuffle(from.toSeq).take(k).toArray
}
