package repro.pq

import org.apache.spark.rdd.RDD
import repro.util.VecOps

/** Product Quantization (paper §V-B, Jégou et al. [31]).
  *
  * The D'-dimensional class-embedding space is split into P subspaces of
  * dim m; each subspace has its own M-centroid codebook. A vector encodes
  * to P codes; the Cartesian product of codes addresses a cell of the
  * inverted multi-index. Queries score candidates asymmetrically (ADC):
  * a per-subspace lookup table of q·centroid dot products makes the
  * approximate score a table sum.
  */
final case class ProductQuantizer(
    P: Int,
    m: Int,
    M: Int,
    codebooks: Array[Array[Array[Float]]]) {

  require(codebooks.length == P, s"expected $P codebooks, got ${codebooks.length}")
  require(codebooks.forall(_.length == M), s"every codebook must hold $M centroids")
  require(codebooks.forall(_.forall(_.length == m)), s"centroids must have dim $m")

  /** Full vector dimension D' = P * m. */
  def dim: Int = P * m

  /** Per-subspace nearest-centroid codes of a vector. */
  def encode(v: Array[Float]): Array[Int] = {
    require(v.length == dim, s"expected dim $dim, got ${v.length}")
    Array.tabulate(P)(p => KMeans.nearest(codebooks(p), VecOps.subvector(v, p, m)))
  }

  /** Pack codes into the multi-index cell id (base-M positional). */
  def cellId(codes: Array[Int]): Long = {
    require(codes.length == P, s"expected $P codes")
    codes.foldLeft(0L) { (acc, c) =>
      require(c >= 0 && c < M, s"code $c out of [0, $M)")
      acc * M + c
    }
  }

  /** Inverse of [[cellId]]. */
  def decodeCell(cell: Long): Array[Int] = {
    require(cell >= 0, s"cell id $cell out of range")
    val out = new Array[Int](P)
    var rest = cell
    var p = P - 1
    while (p >= 0) { out(p) = (rest % M).toInt; rest /= M; p -= 1 }
    require(rest == 0, s"cell id $cell out of range for M=$M, P=$P")
    out
  }

  /** ADC lookup table: lut(p)(c) = q_p · centroid_{c,p}. */
  def lut(q: Array[Float]): Array[Array[Double]] = {
    require(q.length == dim, s"expected dim $dim, got ${q.length}")
    Array.tabulate(P) { p =>
      val qp = VecOps.subvector(q, p, m)
      Array.tabulate(M)(c => VecOps.dot(qp, codebooks(p)(c)))
    }
  }

  /** Approximate (quantized) inner-product score from codes + LUT. */
  def adcScore(table: Array[Array[Double]], codes: Array[Int]): Double = {
    var s = 0.0; var p = 0
    while (p < P) { s += table(p)(codes(p)); p += 1 }
    s
  }

  /** Centroid reconstruction of a code word (quantization image). */
  def reconstruct(codes: Array[Int]): Array[Float] = {
    val out = new Array[Float](dim)
    var p = 0
    while (p < P) {
      System.arraycopy(codebooks(p)(codes(p)), 0, out, p * m, m)
      p += 1
    }
    out
  }

  /** Residual of a vector against its assigned centroids (paper Alg. 1). */
  def residual(v: Array[Float]): Array[Float] = {
    val rec = reconstruct(encode(v))
    Array.tabulate(dim)(i => v(i) - rec(i))
  }
}

object ProductQuantizer {
  /** Train codebooks with the distributed joint Lloyd pass. */
  def train(vecs: RDD[Array[Float]], P: Int, m: Int, M: Int,
            iters: Int = 8, seed: Long = 42L): ProductQuantizer =
    ProductQuantizer(P, m, M, KMeans.trainProduct(vecs, P, m, M, iters, seed))
}
