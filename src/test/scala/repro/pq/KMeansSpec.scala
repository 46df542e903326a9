package repro.pq

import repro.SparkSpec
import repro.util.{Rng, VecOps}

class KMeansSpec extends SparkSpec {

  test("nearest picks the closest centroid, ties to the lower index") {
    val cb = Array(Array(0f, 0f), Array(10f, 0f), Array(0f, 10f))
    assert(KMeans.nearest(cb, Array(1f, 1f)) == 0)
    assert(KMeans.nearest(cb, Array(9f, 0f)) == 1)
    assert(KMeans.nearest(cb, Array(5f, 0f)) == 0) // equidistant: first wins
  }

  /** Two tight, well-separated blobs per subspace. */
  private def blobs(n: Int, P: Int, m: Int): Seq[Array[Float]] =
    (0 until n).map { i =>
      val v = new Array[Float](P * m)
      for (p <- 0 until P) {
        val centre = if (Rng.uniform(i.toLong, p.toLong) < 0.5) -5f else 5f
        for (j <- 0 until m)
          v(p * m + j) = centre + (0.1 * Rng.gaussian(Rng.mix(i.toLong, p.toLong), j.toLong)).toFloat
      }
      v
    }

  test("trainProduct recovers separated blob centres") {
    val P = 2; val m = 3; val M = 2
    val data = blobs(400, P, m)
    val rdd = spark.sparkContext.parallelize(data, 4)
    val cb = KMeans.trainProduct(rdd, P, m, M, iters = 6)
    assert(cb.length == P && cb.forall(_.length == M) && cb.forall(_.forall(_.length == m)))
    for (p <- 0 until P) {
      val centres = cb(p).map(_(0).toDouble).sorted
      assert(math.abs(centres(0) - (-5.0)) < 0.5, s"subspace $p low centre ${centres(0)}")
      assert(math.abs(centres(1) - 5.0) < 0.5, s"subspace $p high centre ${centres(1)}")
    }
  }

  test("training is deterministic in the seed") {
    val data = blobs(200, 2, 2)
    val rdd = spark.sparkContext.parallelize(data, 3)
    val a = KMeans.trainProduct(rdd, 2, 2, 4, iters = 3, seed = 9L)
    val b = KMeans.trainProduct(rdd, 2, 2, 4, iters = 3, seed = 9L)
    assert(a.flatten.flatten.toSeq == b.flatten.flatten.toSeq)
  }

  test("more centroids than points pads deterministically without NaN") {
    val data = blobs(3, 1, 2)
    val rdd = spark.sparkContext.parallelize(data, 1)
    val cb = KMeans.trainProduct(rdd, 1, 2, 8, iters = 2)
    assert(cb(0).length == 8)
    assert(cb(0).forall(_.forall(f => !f.isNaN)))
  }

  test("quantization error decreases with more centroids") {
    val P = 1; val m = 4
    val data = (0 until 500).map(i =>
      Array.tabulate(m)(j => Rng.gaussian(i.toLong, j.toLong).toFloat))
    val rdd = spark.sparkContext.parallelize(data, 4)
    def err(M: Int): Double = {
      val cb = KMeans.trainProduct(rdd, P, m, M, iters = 6)
      data.map(v => VecOps.l2(cb(0)(KMeans.nearest(cb(0), v)), v)).sum / data.size
    }
    val e2 = err(2); val e16 = err(16)
    assert(e16 < e2, s"err(16)=$e16 should beat err(2)=$e2")
  }

  test("iters must be positive") {
    val rdd = spark.sparkContext.parallelize(blobs(10, 1, 2), 1)
    intercept[IllegalArgumentException] { KMeans.trainProduct(rdd, 1, 2, 2, iters = 0) }
  }
}
