package repro.core

import org.apache.spark.ml.clustering.KMeans
import org.apache.spark.ml.linalg.{Vector, Vectors}
import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** Clustering + centroid-representative selection (paper Alg. 2, lines
  * 11-12 and 16-17): KMeans the vectors into `k` clusters, then pick, per
  * cluster, the *actual element* nearest the cluster center — sub-tables
  * must contain real rows/columns, not synthetic means.
  */
object CentroidSelect {

  /** Select up to `k` row ids from a (`__rid`, `features`) frame. If fewer
    * rows than `k` exist, all are returned; if KMeans leaves clusters empty,
    * the selection is padded with the lowest unselected rids (deterministic).
    */
  def selectRows(vecs: DataFrame, k: Int, seed: Long = 17): Seq[Long] = {
    if (k <= 0) return Seq.empty
    val n = vecs.count()
    if (n <= k) return vecs.select(Tables.Rid).collect().map(_.getLong(0)).toSeq.sorted

    // MLlib's blockified KMeans mishandles inputs where most partitions are
    // empty (small query results over many shuffle partitions): compact
    // small inputs first.
    val compacted =
      if (n < 5000) vecs.coalesce(math.max(1, (n / 500).toInt))
      else vecs
    if (k == 1) {
      // MLlib KMeans requires k >= 2: return the row nearest the mean.
      val dim = compacted.select("features").head().getAs[Vector](0).size
      val summed = compacted.select("features").collect()
        .map(_.getAs[Vector](0).toArray)
      val mean = new Array[Double](dim)
      summed.foreach(v => (0 until dim).foreach(d => mean(d) += v(d)))
      (0 until dim).foreach(d => mean(d) /= summed.length)
      val mv = Vectors.dense(mean)
      val dist = udf { (v: Vector) => Vectors.sqdist(v, mv) }
      return Seq(compacted.withColumn("dist", dist(col("features")))
        .orderBy(col("dist"), col(Tables.Rid))
        .select(Tables.Rid).head().getLong(0))
    }
    val km = new KMeans().setK(k).setSeed(seed)
      .setFeaturesCol("features").setPredictionCol("cluster")
      .setMaxIter(20)
      // The 4.x blockified solver crashes with ArrayIndexOutOfBounds when
      // k-means|| initialization yields fewer distinct centers than k
      // (small or duplicate-heavy inputs); the row solver handles it.
      .setSolver("row")
    val model = km.fit(compacted)
    val centers = model.clusterCenters
    val dist = udf { (v: Vector, c: Int) => Vectors.sqdist(v, centers(c)) }
    val assigned = model.transform(vecs)
      .withColumn("dist", dist(col("features"), col("cluster")))
    val picked = assigned.groupBy(col("cluster"))
      .agg(min_by(col(Tables.Rid), struct(col("dist"), col(Tables.Rid))).as("rid"))
      .select(col("rid")).collect().map(_.getLong(0)).toSeq

    if (picked.size >= k) picked.sorted
    else {
      val have = picked.toSet
      val pad = vecs.select(Tables.Rid).orderBy(col(Tables.Rid))
        .collect().iterator.map(_.getLong(0))
        .filterNot(have).take(k - picked.size).toSeq
      (picked ++ pad).sorted
    }
  }

  /** Select up to `k` named items (columns) from driver-side vectors. The
    * item count is tiny (m columns), so this still runs through MLlib
    * KMeans for uniformity with row selection.
    */
  def selectNamed(spark: SparkSession, items: Seq[(String, Array[Float])],
                  k: Int, seed: Long = 19): Seq[String] = {
    if (k <= 0) return Seq.empty
    if (items.size <= k) return items.map(_._1)
    import spark.implicits._
    // Tiny input (one row per column): a single partition sidesteps MLlib's
    // blockified KMeans, which mishandles mostly-empty partitions.
    val df = items.map { case (name, v) =>
      (name, Vectors.dense(v.map(_.toDouble)))
    }.toDF("name", "features").coalesce(1)
    if (k == 1) {
      // MLlib KMeans requires k >= 2: pick the item nearest the mean.
      val dim = items.head._2.length
      val mean = new Array[Double](dim)
      items.foreach(i => (0 until dim).foreach(d => mean(d) += i._2(d)))
      (0 until dim).foreach(d => mean(d) /= items.size)
      val mv = Vectors.dense(mean)
      return Seq(items.minBy { case (name, v) =>
        (Vectors.sqdist(Vectors.dense(v.map(_.toDouble)), mv), name)
      }._1)
    }
    val km = new KMeans().setK(k).setSeed(seed)
      .setFeaturesCol("features").setPredictionCol("cluster")
      .setMaxIter(20)
      // The 4.x blockified solver crashes with ArrayIndexOutOfBounds when
      // k-means|| initialization yields fewer distinct centers than k
      // (small or duplicate-heavy inputs); the row solver handles it.
      .setSolver("row")
    val model = km.fit(df)
    val centers = model.clusterCenters
    val dist = udf { (v: Vector, c: Int) => Vectors.sqdist(v, centers(c)) }
    val picked = model.transform(df)
      .withColumn("dist", dist(col("features"), col("cluster")))
      .groupBy(col("cluster"))
      .agg(min_by(col("name"), struct(col("dist"), col("name"))).as("name"))
      .select("name").collect().map(_.getString(0)).toSeq
    if (picked.size >= k) picked
    else picked ++ items.map(_._1).filterNot(picked.toSet).take(k - picked.size)
  }
}
