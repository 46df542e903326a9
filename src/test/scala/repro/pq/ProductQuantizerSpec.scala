package repro.pq

import repro.SparkSpec
import repro.util.{Rng, VecOps}

class ProductQuantizerSpec extends SparkSpec {

  private val P = 4; private val m = 2; private val M = 4

  /** A hand-built quantizer with known codebooks. */
  private def handPq: ProductQuantizer = {
    val cb = Array.tabulate(P, M)((p, c) =>
      Array.tabulate(m)(j => (c + 0.1 * p + 0.01 * j).toFloat))
    ProductQuantizer(P, m, M, cb)
  }

  test("constructor validates codebook shape") {
    intercept[IllegalArgumentException] {
      ProductQuantizer(P, m, M, Array.fill(P - 1, M, m)(0f))
    }
    intercept[IllegalArgumentException] {
      ProductQuantizer(P, m, M, Array.fill(P, M + 1, m)(0f))
    }
  }

  test("encode picks the nearest centroid per subspace") {
    val pq = handPq
    // subvector ~ (2.05, 2.06) in every subspace -> code 2
    val v = Array.tabulate(P * m)(i => (2.05 + 0.01 * (i % m)).toFloat)
    assert(pq.encode(v).toSeq == Seq(2, 2, 2, 2))
  }

  test("cellId and decodeCell are inverse bijections") {
    val pq = handPq
    for (a <- 0 until M; b <- 0 until M; c <- 0 until M; d <- 0 until M) {
      val codes = Array(a, b, c, d)
      assert(pq.decodeCell(pq.cellId(codes)).toSeq == codes.toSeq)
    }
  }

  test("cellId is injective over the code space") {
    val pq = handPq
    val cells = for (a <- 0 until M; b <- 0 until M; c <- 0 until M; d <- 0 until M)
      yield pq.cellId(Array(a, b, c, d))
    assert(cells.distinct.size == cells.size)
  }

  test("cellId rejects out-of-range codes") {
    intercept[IllegalArgumentException] { handPq.cellId(Array(0, 0, 0, M)) }
    intercept[IllegalArgumentException] { handPq.decodeCell(-1L) }
  }

  test("adcScore over LUT equals dot with the reconstruction") {
    val pq = handPq
    val q = Array.tabulate(P * m)(i => (0.3 * Rng.gaussian(1L, i.toLong)).toFloat)
    val v = Array.tabulate(P * m)(i => (1.5 + 0.2 * Rng.gaussian(2L, i.toLong)).toFloat)
    val codes = pq.encode(v)
    val viaLut = pq.adcScore(pq.lut(q), codes)
    val viaRec = VecOps.dot(q, pq.reconstruct(codes))
    assert(math.abs(viaLut - viaRec) < 1e-5)
  }

  test("reconstruct concatenates the chosen centroids") {
    val pq = handPq
    val rec = pq.reconstruct(Array(1, 2, 3, 0))
    assert(VecOps.subvector(rec, 0, m).toSeq == pq.codebooks(0)(1).toSeq)
    assert(VecOps.subvector(rec, 2, m).toSeq == pq.codebooks(2)(3).toSeq)
  }

  test("residual + reconstruction recovers the vector") {
    val pq = handPq
    val v = Array.tabulate(P * m)(i => (1.2 + 0.3 * Rng.gaussian(5L, i.toLong)).toFloat)
    val rec = pq.reconstruct(pq.encode(v))
    val res = pq.residual(v)
    val back = VecOps.add(rec, res)
    assert(VecOps.l2(back, v) < 1e-5)
  }

  test("trained quantizer reduces residual norm vs vector norm") {
    val data = (0 until 800).map(i =>
      VecOps.normalize(Array.tabulate(8)(j => Rng.gaussian(i.toLong, j.toLong).toFloat)))
    val rdd = spark.sparkContext.parallelize(data, 4)
    val pq = ProductQuantizer.train(rdd, P = 4, m = 2, M = 8, iters = 6)
    val meanResidual = data.map(v => VecOps.norm(pq.residual(v))).sum / data.size
    assert(meanResidual < 0.6, s"mean residual norm $meanResidual (unit vectors)")
  }

  test("lut rejects wrong query dim") {
    intercept[IllegalArgumentException] { handPq.lut(new Array[Float](3)) }
  }
}
