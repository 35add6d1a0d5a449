package repro.core

import org.apache.spark.ml.linalg.Vectors
import repro.SparkSpec

import scala.util.Random

class CentroidSelectSpec extends SparkSpec {

  /** Three well-separated blobs of 2-d points. */
  def blobs(perBlob: Int = 20): Seq[(Long, Array[Double], Int)] = {
    val rng = new Random(5)
    val centers = Seq((0.0, 0.0), (100.0, 0.0), (0.0, 100.0))
    centers.zipWithIndex.flatMap { case ((cx, cy), b) =>
      (0 until perBlob).map { i =>
        val rid = (b * perBlob + i).toLong
        (rid, Array(cx + rng.nextGaussian(), cy + rng.nextGaussian()), b)
      }
    }
  }

  def vecsDf(points: Seq[(Long, Array[Double], Int)]) = {
    import spark.implicits._
    points.map { case (rid, v, _) => (rid, Vectors.dense(v)) }
      .toDF(Tables.Rid, "features")
  }

  test("selectRows picks one representative per well-separated cluster") {
    val pts = blobs()
    val picked = CentroidSelect.selectRows(vecsDf(pts), 3, seed = 1)
    assert(picked.size == 3)
    val blobsOf = picked.map(rid => pts.find(_._1 == rid).get._3)
    assert(blobsOf.toSet == Set(0, 1, 2), s"picked $picked from blobs $blobsOf")
  }

  test("selected representatives are near their blob centers") {
    val pts = blobs()
    val centers = Map(0 -> (0.0, 0.0), 1 -> (100.0, 0.0), 2 -> (0.0, 100.0))
    val picked = CentroidSelect.selectRows(vecsDf(pts), 3, seed = 1)
    picked.foreach { rid =>
      val (_, v, b) = pts.find(_._1 == rid).get
      val (cx, cy) = centers(b)
      val d = math.hypot(v(0) - cx, v(1) - cy)
      assert(d < 5.0, s"representative $rid too far from its center: $d")
    }
  }

  test("selectRows returns all rows when k >= n") {
    val pts = blobs(perBlob = 2)
    val picked = CentroidSelect.selectRows(vecsDf(pts), 100)
    assert(picked.sorted == pts.map(_._1).sorted)
  }

  test("selectRows with k <= 0 returns nothing") {
    assert(CentroidSelect.selectRows(vecsDf(blobs(2)), 0).isEmpty)
  }

  test("selectRows is deterministic in the seed") {
    val df = vecsDf(blobs())
    val a = CentroidSelect.selectRows(df, 3, seed = 42)
    val b = CentroidSelect.selectRows(df, 3, seed = 42)
    assert(a == b)
  }

  test("selectRows returns k distinct rows even with duplicate vectors") {
    import spark.implicits._
    val df = (0L until 10L).map(i => (i, Vectors.dense(1.0, 1.0)))
      .toDF(Tables.Rid, "features")
    val picked = CentroidSelect.selectRows(df, 4)
    assert(picked.size == 4 && picked.distinct.size == 4)
  }

  test("selectNamed picks one column per separated group") {
    val items = Seq(
      "x1" -> Array(0f, 0f), "x2" -> Array(0.1f, 0f),
      "y1" -> Array(50f, 0f), "y2" -> Array(50.2f, 0f),
      "z1" -> Array(0f, 50f),
    )
    val picked = CentroidSelect.selectNamed(spark, items, 3, seed = 2)
    assert(picked.size == 3)
    val groups = picked.map(_.head) // 'x', 'y', 'z'
    assert(groups.toSet == Set('x', 'y', 'z'))
  }

  test("selectNamed returns everything when k >= size") {
    val items = Seq("a" -> Array(0f), "b" -> Array(1f))
    assert(CentroidSelect.selectNamed(spark, items, 5) == Seq("a", "b"))
  }
}
