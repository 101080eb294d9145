package repro.queries

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.nexmark._

/** Spark (Catalyst) reference implementations of the four NexMark queries,
  * producing the same logical answers as the simulator's dataflows. Tests
  * assert a three-way agreement:
  * simulator sink digest == Spark reference == DuckDB SQL (via Oracle).
  */
object SparkRefs {
  import NexmarkGen.WindowMicros

  /** Q1: currency conversion of every bid. */
  def q1(spark: SparkSession, evs: Seq[NxEvent]): DataFrame =
    NexmarkData.bidsDf(spark, evs).select(
      col("auction"), col("bidder"),
      (col("price") * Q1.EurRate) as "priceEur",
      col("ts"))

  /** Oracle SQL for Q1 over table `bid`. */
  val q1Sql: String =
    s"SELECT auction, bidder, CAST(price AS DOUBLE) * ${Q1.EurRate} AS priceEur, ts FROM bid"

  /** Q3: persons in OR/ID/CA joined with their category-10 auctions. */
  def q3(spark: SparkSession, evs: Seq[NxEvent]): DataFrame = {
    val p = NexmarkData.personsDf(spark, evs)
      .where(col("state").isin("OR", "ID", "CA"))
    val a = NexmarkData.auctionsDf(spark, evs)
      .where(col("category") === NexmarkGen.Q3Category)
    p.join(a, p("id") === a("seller"))
      .select(p("name"), p("city"), p("state"), a("id") as "auction")
  }

  val q3Sql: String =
    s"""SELECT p.name, p.city, p.state, a.id AS auction
       |FROM person p JOIN auction a ON CAST(a.seller AS BIGINT) = CAST(p.id AS BIGINT)
       |WHERE a.category = '${NexmarkGen.Q3Category}' AND p.state IN ('OR','ID','CA')
       |""".stripMargin

  /** Q8: persons joined with auctions they opened in the same tumbling
    * window (one row per matching pair, as the dataflow emits).
    */
  def q8(spark: SparkSession, evs: Seq[NxEvent]): DataFrame = {
    val p = NexmarkData.personsDf(spark, evs)
      .select(col("id"), col("name"), floor(col("ts") / WindowMicros) as "window")
    val a = NexmarkData.auctionsDf(spark, evs)
      .select(col("seller"), floor(col("ts") / WindowMicros) as "awindow")
    p.join(a, p("id") === a("seller") && col("window") === col("awindow"))
      .select(col("id") as "personId", col("name"), col("window"))
  }

  val q8Sql: String =
    s"""SELECT CAST(p.id AS BIGINT) AS personId, p.name,
       |       CAST(FLOOR(CAST(p.ts AS BIGINT) / $WindowMicros) AS BIGINT) AS window
       |FROM person p JOIN auction a
       |  ON CAST(a.seller AS BIGINT) = CAST(p.id AS BIGINT)
       | AND FLOOR(CAST(a.ts AS BIGINT) / $WindowMicros) = FLOOR(CAST(p.ts AS BIGINT) / $WindowMicros)
       |""".stripMargin

  /** Q12: bid count per (bidder, tumbling window). */
  def q12(spark: SparkSession, evs: Seq[NxEvent]): DataFrame =
    NexmarkData.bidsDf(spark, evs)
      .groupBy(col("bidder"), floor(col("ts") / WindowMicros) as "window")
      .agg(count(lit(1)) as "cnt")
      .select(col("bidder"), col("window"), col("cnt"))

  val q12Sql: String =
    s"""SELECT CAST(bidder AS BIGINT) AS bidder,
       |       CAST(FLOOR(CAST(ts AS BIGINT) / $WindowMicros) AS BIGINT) AS window,
       |       COUNT(*) AS cnt
       |FROM bid GROUP BY 1, 2""".stripMargin

  // ------------------------------------------------ collection-level refs

  /** Q1 expected sink multiset. */
  def q1Expected(evs: Seq[NxEvent]): Map[Any, Long] =
    NexmarkData.split(evs)._3
      .map(b => Q1Out(b.auction, b.bidder, b.price * Q1.EurRate, b.ts))
      .groupBy(identity[Any]).view.mapValues(_.size.toLong).toMap

  /** Q3 expected sink multiset. */
  def q3Expected(evs: Seq[NxEvent]): Map[Any, Long] = {
    val (ps, as, _) = NexmarkData.split(evs)
    val persons = ps.filter(p => Set("OR", "ID", "CA")(p.state)).map(p => p.id -> p).toMap
    as.filter(_.category == NexmarkGen.Q3Category).flatMap { a =>
      persons.get(a.seller).map(p => Q3Out(p.name, p.city, p.state, a.id))
    }.groupBy(identity[Any]).view.mapValues(_.size.toLong).toMap
  }

  /** Q8 expected sink multiset (pairs). */
  def q8Expected(evs: Seq[NxEvent]): Map[Any, Long] = {
    val (ps, as, _) = NexmarkData.split(evs)
    val persons = ps.map(p => (p.id, p.ts / WindowMicros) -> p.name).toMap
    as.flatMap { a =>
      persons.get((a.seller, a.ts / WindowMicros))
        .map(nm => Q8Out(a.seller, nm, a.ts / WindowMicros))
    }.groupBy(identity[Any]).view.mapValues(_.size.toLong).toMap
  }

  /** Q12 expected sink upsert map: (bidder, window) -> final count. */
  def q12Expected(evs: Seq[NxEvent]): Map[Any, Long] =
    NexmarkData.split(evs)._3
      .groupBy(b => (b.bidder, b.ts / WindowMicros))
      .map { case (k, bs) => (k: Any) -> bs.size.toLong }
}
