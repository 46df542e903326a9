package repro.pq

import org.apache.spark.rdd.RDD
import repro.util.{Rng, VecOps}

/** Lloyd's iteration (paper §V-B, [32]) over Spark.
  *
  * Trains the P product-quantization codebooks *jointly*: one
  * `treeAggregate` pass per iteration computes, for every subspace, the
  * per-cluster vector sums and counts, so the full index build costs
  * `iters` Spark jobs regardless of P. Assignment uses Euclidean distance
  * in each m-dimensional subspace, as in the paper.
  */
object KMeans {

  /** Per-iteration accumulator: sums(p)(c)(i) and counts(p)(c). */
  private final class Acc(val P: Int, val M: Int, val m: Int) extends Serializable {
    val sums: Array[Array[Array[Double]]] = Array.fill(P, M, m)(0.0)
    val counts: Array[Array[Long]] = Array.fill(P, M)(0L)
    def merge(o: Acc): Acc = {
      var p = 0
      while (p < P) {
        var c = 0
        while (c < M) {
          counts(p)(c) += o.counts(p)(c)
          var i = 0
          while (i < m) { sums(p)(c)(i) += o.sums(p)(c)(i); i += 1 }
          c += 1
        }
        p += 1
      }
      this
    }
  }

  /** Index of the L2-nearest centroid for an m-dim subvector. */
  def nearest(codebook: Array[Array[Float]], v: Array[Float]): Int = {
    var best = 0; var bestD = Double.MaxValue; var c = 0
    while (c < codebook.length) {
      val d = VecOps.l2(codebook(c), v)
      if (d < bestD) { bestD = d; best = c }
      c += 1
    }
    best
  }

  /** Train P codebooks of M centroids each over `vecs` (dim = P*m).
    *
    * Initialization takes a deterministic sample of M vectors (jittered
    * copies pad out degenerate inputs with fewer than M points).
    */
  def trainProduct(vecs: RDD[Array[Float]], P: Int, m: Int, M: Int,
                   iters: Int = 8, seed: Long = 42L): Array[Array[Array[Float]]] = {
    require(iters >= 1, "need at least one Lloyd iteration")
    val dim = P * m
    val sample = vecs.takeSample(withReplacement = false, M, seed)
    require(sample.forall(_.length == dim), s"expected vectors of dim $dim")
    val init: Array[Array[Float]] =
      if (sample.length >= M) sample
      else {
        val pad = Array.tabulate(M - sample.length) { i =>
          val base = sample(i % math.max(1, sample.length))
          Array.tabulate(dim)(j =>
            (base(j) + 0.01 * Rng.gaussian(Rng.mix(seed, i.toLong), j.toLong)).toFloat)
        }
        sample ++ pad
      }

    var centroids: Array[Array[Array[Float]]] =
      Array.tabulate(P, M)((p, c) => VecOps.subvector(init(c), p, m))

    val sc = vecs.sparkContext
    var it = 0
    while (it < iters) {
      val bc = sc.broadcast(centroids)
      val acc = vecs.treeAggregate(new Acc(P, M, m))(
        seqOp = (a, v) => {
          val cb = bc.value
          var p = 0
          while (p < P) {
            val sub = VecOps.subvector(v, p, m)
            val c = nearest(cb(p), sub)
            a.counts(p)(c) += 1
            var i = 0
            while (i < m) { a.sums(p)(c)(i) += sub(i); i += 1 }
            p += 1
          }
          a
        },
        combOp = (a, b) => a.merge(b))
      bc.destroy()
      centroids = Array.tabulate(P, M) { (p, c) =>
        if (acc.counts(p)(c) == 0L) centroids(p)(c) // keep empty clusters in place
        else Array.tabulate(m)(i => (acc.sums(p)(c)(i) / acc.counts(p)(c)).toFloat)
      }
      it += 1
    }
    centroids
  }
}
