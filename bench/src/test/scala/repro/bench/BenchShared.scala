package repro.bench

import org.apache.spark.sql.SparkSession

/** One harness per test JVM so graphs / λ / engines are computed once
  * across all bench suites (Test/parallelExecution is off).
  */
object BenchShared {
  private var cached: Harness = _
  def harness(spark: SparkSession): Harness = synchronized {
    if (cached == null) cached = new Harness(spark)
    cached
  }

  /** ε grid used across the efficiency/accuracy tables. The paper sweeps
    * {0.01..0.5}; we drop 0.01/0.02 from the all-methods grid (they push
    * the scaled baselines past our runtime budget, mirroring the paper's
    * one-day cutoff) and study small ε in the dedicated GEER/AMC tables.
    */
  val epsGrid: Seq[Double] = Seq(0.05, 0.1, 0.2, 0.5)

  val allAnalogs: Seq[String] = Seq(
    "facebook-lite", "dblp-lite", "youtube-lite",
    "orkut-lite", "livejournal-lite", "friendster-lite")
}
