package repro.cql

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

import repro.tvr.Times

/** NEXMark Query 7 in CQL (paper Listing 1):
  *
  * {{{
  *   SELECT Rstream(B.price, B.itemid)
  *   FROM   Bid [RANGE 10 MINUTE SLIDE 10 MINUTE] B
  *   WHERE  B.price = (SELECT MAX(B1.price)
  *                     FROM BID [RANGE 10 MINUTE SLIDE 10 MINUTE] B1)
  * }}}
  *
  * Every ten minutes, emit the highest bid(s) of the previous ten
  * minutes. Time moves in lock step for the whole query (the main and
  * subquery windows coincide at each instant), so each instant evaluates
  * the max over the window relation and selects the matching bids.
  */
object CqlQ7 {

  /** Run Q7 over an in-order bid stream. `bids` needs columns
    * `bidtime` (timestamp), `price`, `item`. Output: one row per instant
    * and max bid: `(price, item, bidtime, cql_t)`.
    */
  def run(
      spark: SparkSession,
      bids: DataFrame,
      rangeMs: Long = 10 * Times.MinuteMs,
      slideMs: Long = 10 * Times.MinuteMs,
  ): DataFrame =
    Cql.rstream(spark, bids, "bidtime", rangeMs, slideMs, { rel =>
      val m = rel.agg(max(col("price")).as("__max"))
      rel.crossJoin(m).where(col("price") === col("__max"))
        .select(col("price"), col("item"), col("bidtime"))
    }).where(col("price").isNotNull)
}
