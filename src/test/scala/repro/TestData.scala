package repro

import java.util.SplittableRandom
import repro.graph.VecStore

/** Deterministic in-memory datasets for pure-algorithm tests (no Spark). */
object TestData {

  /** Uniform random vectors in [0, 1)^dim. */
  def randomVs(n: Int, dim: Int, seed: Long = 1L): VecStore = {
    val rnd = new SplittableRandom(seed)
    val data = Array.fill(n * dim)(rnd.nextDouble().toFloat)
    new VecStore(dim, n, data)
  }

  /** Gaussian-mixture vectors (clustered, like real embedding sets). */
  def clusteredVs(n: Int, dim: Int, clusters: Int, seed: Long = 2L): VecStore = {
    val rnd = new SplittableRandom(seed)
    val centers = Array.fill(clusters, dim)((rnd.nextDouble() - 0.5) * 8.0)
    val data = new Array[Float](n * dim)
    var i = 0
    while (i < n) {
      val c = centers(rnd.nextInt(clusters))
      var j = 0
      while (j < dim) {
        data(i * dim + j) = (c(j) + nextGaussian(rnd)).toFloat
        j += 1
      }
      i += 1
    }
    new VecStore(dim, n, data)
  }

  private def nextGaussian(rnd: SplittableRandom): Double = {
    // Box-Muller; SplittableRandom has no nextGaussian before JDK 17's RandomGenerator.
    val u1 = math.max(rnd.nextDouble(), 1e-12)
    val u2 = rnd.nextDouble()
    math.sqrt(-2.0 * math.log(u1)) * math.cos(2.0 * math.Pi * u2)
  }

  /** Random query vectors from the same uniform cube. */
  def randomQueries(nq: Int, dim: Int, seed: Long = 3L): Array[Array[Float]] = {
    val rnd = new SplittableRandom(seed)
    Array.fill(nq)(Array.fill(dim)(rnd.nextDouble().toFloat))
  }

  /** Queries near dataset points (realistic ANN workload for clustered data). */
  def nearQueries(vs: VecStore, nq: Int, seed: Long = 4L): Array[Array[Float]] = {
    val rnd = new SplittableRandom(seed)
    Array.fill(nq) {
      val base = vs.vector(rnd.nextInt(vs.n))
      base.map(x => x + (rnd.nextDouble() - 0.5).toFloat * 0.2f)
    }
  }
}
