package repro.paperexample

import org.apache.spark.sql.SparkSession
import org.apache.spark.sql.types._

import repro.tvr.{Times, Tvr, WatermarkTimeline}

/** The Section 4 example: the `Bid` stream with its processing-time
  * arrival log and watermark advances, verbatim from the paper:
  *
  * {{{
  *   8:07  WM -> 8:05
  *   8:08  INSERT (8:07, $2, A)
  *   8:12  INSERT (8:11, $3, B)
  *   8:13  INSERT (8:05, $4, C)
  *   8:14  WM -> 8:08
  *   8:15  INSERT (8:09, $5, D)
  *   8:16  WM -> 8:12
  *   8:17  INSERT (8:13, $1, E)
  *   8:18  INSERT (8:17, $6, F)
  *   8:21  WM -> 8:20
  * }}}
  *
  * Ground truth for Listings 3–14.
  */
object PaperDataset {

  val bidSchema: StructType = StructType(Seq(
    StructField("bidtime", TimestampType),
    StructField("price", IntegerType),
    StructField("item", StringType),
  ))

  /** `(ptime, bidtime, price, item)` in paper clock notation. */
  val arrivals: Seq[(String, String, Int, String)] = Seq(
    ("8:08", "8:07", 2, "A"),
    ("8:12", "8:11", 3, "B"),
    ("8:13", "8:05", 4, "C"),
    ("8:15", "8:09", 5, "D"),
    ("8:17", "8:13", 1, "E"),
    ("8:18", "8:17", 6, "F"),
  )

  val watermark: WatermarkTimeline = WatermarkTimeline.ofHm(
    "8:07" -> "8:05",
    "8:14" -> "8:08",
    "8:16" -> "8:12",
    "8:21" -> "8:20",
  )

  /** The Bid stream as a TVR with event-time column `bidtime`. */
  def bidTvr(spark: SparkSession): Tvr =
    Tvr.ofRows(
      spark,
      bidSchema,
      arrivals.map { case (p, bt, price, item) =>
        (Times.hm(p), false, Seq[Any](Times.ts(Times.hm(bt)), price, item))
      },
    ).withWatermark("bidtime", watermark)

  /** NEXMark Query 7 in the paper's proposed SQL (Listing 2).
    *
    * One deviation from the listing as printed: the paper writes
    * `GROUP BY TumbleBid.wend` while also projecting the ungrouped
    * `TumbleBid.wstart`, which is invalid standard SQL (wstart is only
    * *functionally* dependent on wend); we group by both bounds, which
    * is semantically identical.
    */
  def q7SqlFor(bidTable: String): String =
    s"""SELECT
       |  MaxBid.wstart, MaxBid.wend,
       |  $bidTable.bidtime, $bidTable.price, $bidTable.item
       |FROM
       |  $bidTable,
       |  (SELECT
       |     MAX(TumbleBid.price) maxPrice,
       |     TumbleBid.wstart wstart,
       |     TumbleBid.wend wend
       |   FROM
       |     Tumble(
       |       data    => TABLE($bidTable),
       |       timecol => DESCRIPTOR(bidtime),
       |       dur     => INTERVAL '10' MINUTE) TumbleBid
       |   GROUP BY
       |     TumbleBid.wstart, TumbleBid.wend) MaxBid
       |WHERE
       |  $bidTable.price = MaxBid.maxPrice AND
       |  $bidTable.bidtime >= MaxBid.wend - INTERVAL '10' MINUTE AND
       |  $bidTable.bidtime < MaxBid.wend""".stripMargin

  val q7Sql: String = q7SqlFor("Bid")

  /** Listing 5/6: the Tumble TVF and its grouped aggregate. */
  val tumbleSql: String =
    """SELECT wstart, wend, bidtime, price, item
      |FROM Tumble(
      |  data    => TABLE(Bid),
      |  timecol => DESCRIPTOR(bidtime),
      |  dur     => INTERVAL '10' MINUTES,
      |  offset  => INTERVAL '0' MINUTES)""".stripMargin

  val tumbleGroupSql: String =
    """SELECT TumbleBid.wstart, TumbleBid.wend, MAX(TumbleBid.price) maxPrice
      |FROM Tumble(
      |  data    => TABLE(Bid),
      |  timecol => DESCRIPTOR(bidtime),
      |  dur     => INTERVAL '10' MINUTES) TumbleBid
      |GROUP BY TumbleBid.wstart, TumbleBid.wend""".stripMargin

  /** Listing 7/8: the Hop TVF and its grouped aggregate. */
  val hopSql: String =
    """SELECT wstart, wend, bidtime, price, item
      |FROM Hop(
      |  data    => TABLE(Bid),
      |  timecol => DESCRIPTOR(bidtime),
      |  dur     => INTERVAL '10' MINUTES,
      |  hopsize => INTERVAL '5' MINUTES)""".stripMargin

  val hopGroupSql: String =
    """SELECT HopBid.wstart, HopBid.wend, MAX(HopBid.price) maxPrice
      |FROM Hop(
      |  data    => TABLE(Bid),
      |  timecol => DESCRIPTOR(bidtime),
      |  dur     => INTERVAL '10' MINUTES,
      |  hopsize => INTERVAL '5' MINUTES) HopBid
      |GROUP BY HopBid.wstart, HopBid.wend""".stripMargin
}
