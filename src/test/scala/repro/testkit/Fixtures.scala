package repro.testkit

import repro.SparkSpec
import repro.eval.{Bundle, Harness}
import repro.util.Rng
import repro.vit.PatchRec

/** Shared small-scale fixtures, built once per test JVM (the build uses
  * one forked JVM for the whole run, so these lazies amortize across
  * suites).
  */
object Fixtures {

  /** Cityscapes at 4% scale: ~59 keyframes, ~2.8k stored vectors. */
  lazy val cityscapes: Bundle =
    Harness.bundle(SparkSpec.shared, "cityscapes", scale = 0.04)

  /** Bellevue at 3% scale. */
  lazy val bellevue: Bundle =
    Harness.bundle(SparkSpec.shared, "bellevue", scale = 0.03)

  /** Synthetic clustered patch records: `perCluster` noisy copies of each
    * of `nClusters` unit centres — ground truth for recall tests.
    */
  def clusteredPatches(nClusters: Int, perCluster: Int, dim: Int,
                       noise: Double = 0.15): Seq[PatchRec] = {
    val centres = (0 until nClusters).map(c =>
      repro.util.VecOps.normalize(
        Array.tabulate(dim)(j => Rng.gaussian(Rng.mix(77L, c.toLong), j.toLong).toFloat)))
    for {
      c <- 0 until nClusters
      i <- 0 until perCluster
    } yield {
      val id = (c * perCluster + i).toLong
      val v = repro.util.VecOps.normalize(Array.tabulate(dim)(j =>
        (centres(c)(j) + noise * Rng.gaussian(Rng.mix(id, 5L), j.toLong)).toFloat))
      PatchRec(id, id / 4, c.toLong, isObject = true, 0, 0, 0, 0, 8, 8, v)
    }
  }

  def clusterCentre(nClusters: Int, dim: Int, c: Int): Array[Float] =
    repro.util.VecOps.normalize(
      Array.tabulate(dim)(j => Rng.gaussian(Rng.mix(77L, c.toLong), j.toLong).toFloat))
}
