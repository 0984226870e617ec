package repro.core

import org.apache.spark.sql.SparkSession
import repro.graph.CsrGraph
import repro.util.Rng

/** Monte Carlo fan-out engine.
  *
  * All randomized estimators (AMC, TP, TPC, MC, MC2, HAY) reduce to "draw
  * `count` i.i.d. samples, each a deterministic function of a [[Rng]]
  * stream, and sum them". This engine runs that fan-out either locally or
  * as a Spark RDD job over a broadcast CSR graph — sample `k` always uses
  * the stream `Rng(seed, k)`, so the two paths draw identical samples and
  * results are independent of partitioning (sums differ only by FP
  * association order).
  *
  * The distributed path is used when the total expected work
  * (`count × walkLen`) exceeds [[WalkEngine.localStepThreshold]]; below it
  * a Spark job's fixed scheduling overhead (tens of ms) would dominate the
  * actual sampling (this mirrors any production driver: tiny batches stay
  * on the driver). Both paths are covered by tests.
  */
final class WalkEngine(spark: SparkSession, g: CsrGraph,
                       val localStepThreshold: Long = 1L << 18) extends Serializable {

  @transient private lazy val bcast = spark.sparkContext.broadcast(g)

  /** Number of partitions for distributed sampling. */
  private def slices: Int = spark.sparkContext.defaultParallelism

  /** Σ f and Σ f² of `count` samples; `stepsPerSample` is only a cost hint
    * for choosing the execution path.
    */
  def sumAndSumSq(count: Long, seed: Long, stepsPerSample: Long)
                 (sample: (CsrGraph, Rng) => Double): (Double, Double) = {
    if (count * math.max(stepsPerSample, 1L) <= localStepThreshold) {
      var s = 0.0; var s2 = 0.0
      var k = 0L
      while (k < count) {
        val z = sample(g, Rng(seed, k))
        s += z; s2 += z * z
        k += 1
      }
      (s, s2)
    } else {
      val b = bcast
      spark.sparkContext.range(0L, count, numSlices = slices)
        .mapPartitions { it =>
          val graph = b.value
          var s = 0.0; var s2 = 0.0
          it.foreach { k =>
            val z = sample(graph, Rng(seed, k))
            s += z; s2 += z * z
          }
          Iterator.single((s, s2))
        }
        .reduce { case ((a, a2), (c, c2)) => (a + c, a2 + c2) }
    }
  }

  /** Element-wise sum of `count` sampled vectors of dimension `dim`;
    * `sample` accumulates its contribution into the passed array (reused
    * across samples within a partition to avoid per-sample allocation).
    */
  def sumVec(count: Long, seed: Long, dim: Int, stepsPerSample: Long)
            (sample: (CsrGraph, Rng, Array[Double]) => Unit): Array[Double] = {
    if (count * math.max(stepsPerSample, 1L) <= localStepThreshold) {
      val acc = new Array[Double](dim)
      var k = 0L
      while (k < count) { sample(g, Rng(seed, k), acc); k += 1 }
      acc
    } else {
      val b = bcast
      spark.sparkContext.range(0L, count, numSlices = slices)
        .mapPartitions { it =>
          val graph = b.value
          val acc = new Array[Double](dim)
          it.foreach(k => sample(graph, Rng(seed, k), acc))
          Iterator.single(acc)
        }
        .reduce { (x, y) =>
          var i = 0
          while (i < dim) { x(i) += y(i); i += 1 }
          x
        }
    }
  }
}

object Walks {

  /** Advances one random-walk step from `cur`. */
  @inline def step(g: CsrGraph, cur: Int, rng: Rng): Int =
    g.neighbor(cur, rng.nextInt(g.degree(cur)))

  /** Runs a length-`len` walk from `start`, returning the endpoint. */
  def endpoint(g: CsrGraph, start: Int, len: Int, rng: Rng): Int = {
    var cur = start
    var i = 0
    while (i < len) { cur = step(g, cur, rng); i += 1 }
    cur
  }

  /** Walk-sum `Σ_{w ∈ W} x(w)` over the `len` *visited* nodes of a walk
    * from `start` (start excluded — Eq. 11 / Lemma 3.3 count positions
    * `w₁..w_ℓf`), where `x(u) = sVec(u)·sCoef + tVec(u)·tCoef`.
    */
  def walkSum(g: CsrGraph, start: Int, len: Int, rng: Rng,
              sVec: Array[Double], sCoef: Double,
              tVec: Array[Double], tCoef: Double): Double = {
    var cur = start
    var acc = 0.0
    var i = 0
    while (i < len) {
      cur = step(g, cur, rng)
      acc += sVec(cur) * sCoef + tVec(cur) * tCoef
      i += 1
    }
    acc
  }

  /** The AMC random variable `Z_k` of Eq. (11): a walk from `s` scored by
    * `(s(u)/d(s) − t(u)/d(t))` plus a walk from `t` scored by the negated
    * coefficients. The two walks use sub-streams 0 and 1 of `rng`'s seed
    * so they are independent.
    */
  def zSample(g: CsrGraph, s: Int, t: Int, len: Int, rng: Rng,
              sVec: Array[Double], tVec: Array[Double],
              dsInv: Double, dtInv: Double): Double = {
    val fromS = walkSum(g, s, len, rng, sVec, dsInv, tVec, -dtInv)
    val fromT = walkSum(g, t, len, rng, sVec, -dsInv, tVec, dtInv)
    fromS + fromT
  }
}
