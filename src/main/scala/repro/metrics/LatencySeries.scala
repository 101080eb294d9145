package repro.metrics

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** Spark-side analytics over collected latency observations: the overall
  * and per-second 50th/99th percentiles the paper plots in Figs. 9–10.
  */
object LatencySeries {

  /** Observations as a DataFrame (atMicros, latencyMicros). */
  def toDf(spark: SparkSession, obs: Seq[LatencyObs]): DataFrame = {
    import spark.implicits._
    obs.map(o => (o.atMicros, o.latencyMicros)).toDF("atMicros", "latencyMicros")
  }

  /** Overall (p50, p99) in microseconds, via Catalyst percentile_approx. */
  def overall(spark: SparkSession, obs: Seq[LatencyObs]): (Double, Double) = {
    if (obs.isEmpty) return (0.0, 0.0)
    val row = toDf(spark, obs).agg(
      percentile_approx(col("latencyMicros"), lit(0.5), lit(10000)) as "p50",
      percentile_approx(col("latencyMicros"), lit(0.99), lit(10000)) as "p99",
    ).head()
    (row.getLong(0).toDouble, row.getLong(1).toDouble)
  }

  /** Per-second (second, p50, p99) series — the shape of paper Figs. 9/10. */
  def perSecond(spark: SparkSession, obs: Seq[LatencyObs]): DataFrame =
    toDf(spark, obs)
      .groupBy((col("atMicros") / 1_000_000L).cast("long") as "second")
      .agg(
        percentile_approx(col("latencyMicros"), lit(0.5), lit(10000)) as "p50Micros",
        percentile_approx(col("latencyMicros"), lit(0.99), lit(10000)) as "p99Micros",
        count(lit(1)) as "records",
      )
      .orderBy("second")

  /** Exact percentile on a sorted copy (oracle for the approx variant). */
  def exactPercentile(xs: Seq[Long], q: Double): Long = {
    if (xs.isEmpty) return 0L
    val s = xs.sorted
    s(math.min(s.size - 1, (q * s.size).toInt))
  }
}
