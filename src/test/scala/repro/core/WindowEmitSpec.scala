package repro.core

import org.apache.spark.sql.DataFrame

import repro.SparkSpec
import repro.paperexample.PaperDataset
import repro.tvr.Times

/** EMIT semantics applied to the grouped windowing queries themselves
  * (Listings 6/8 under the Section 6.5 materialization controls).
  */
class WindowEmitSpec extends SparkSpec {

  private def fmtCell(v: Any): String = v match {
    case t: java.sql.Timestamp => Times.fmt(Times.ms(t))
    case other                 => String.valueOf(other)
  }
  private def rows(df: DataFrame): Seq[Seq[String]] =
    df.collect().toSeq.map(_.toSeq.map(fmtCell))

  private def session: StreamSqlSession = {
    val s = new StreamSqlSession(spark)
    s.registerStream("Bid", PaperDataset.bidTvr(spark))
    s
  }

  test("tumble aggregate EMIT STREAM revises each window as bids arrive") {
    val df = session.sql(PaperDataset.tumbleGroupSql + " EMIT STREAM", Times.hm("8:21"))
    assert(rows(df) == Seq(
      Seq("8:00", "8:10", "2", "false", "8:08", "0"),
      Seq("8:10", "8:20", "3", "false", "8:12", "0"),
      Seq("8:00", "8:10", "2", "true",  "8:13", "1"),
      Seq("8:00", "8:10", "4", "false", "8:13", "2"),
      Seq("8:00", "8:10", "4", "true",  "8:15", "3"),
      Seq("8:00", "8:10", "5", "false", "8:15", "4"),
      Seq("8:10", "8:20", "3", "true",  "8:18", "1"),
      Seq("8:10", "8:20", "6", "false", "8:18", "2"),
    ))
  }

  test("tumble aggregate EMIT STREAM AFTER WATERMARK finalizes each window once") {
    val df = session.sql(
      PaperDataset.tumbleGroupSql + " EMIT STREAM AFTER WATERMARK", Times.hm("8:21"))
    assert(rows(df) == Seq(
      Seq("8:00", "8:10", "5", "false", "8:16", "0"),
      Seq("8:10", "8:20", "6", "false", "8:21", "0"),
    ))
  }

  test("hop aggregate EMIT STREAM AFTER WATERMARK finalizes the three closable windows") {
    val df = session.sql(
      PaperDataset.hopGroupSql + " EMIT STREAM AFTER WATERMARK", Times.hm("8:21"))
    val out = rows(df).sortBy(_.mkString("|"))
    // [8:15, 8:25) never completes (watermark stops at 8:20)
    assert(out == Seq(
      Seq("8:00", "8:10", "5", "false", "8:16", "0"),
      Seq("8:05", "8:15", "5", "false", "8:21", "0"),
      Seq("8:10", "8:20", "6", "false", "8:21", "0"),
    ))
  }

  test("hop aggregate table view AFTER WATERMARK at 8:21 omits the open window") {
    val df = session.sql(PaperDataset.hopGroupSql + " EMIT AFTER WATERMARK", Times.hm("8:21"))
    val out = rows(df).sortBy(_.mkString("|"))
    assert(out == Seq(
      Seq("8:00", "8:10", "5"),
      Seq("8:05", "8:15", "5"),
      Seq("8:10", "8:20", "6"),
    ))
  }

  test("a tumble with offset shifts the grid (windows at :03)") {
    val df = session.sql(
      """SELECT T.wstart, T.wend, MAX(T.price) maxPrice
        |FROM Tumble(data => TABLE(Bid), timecol => DESCRIPTOR(bidtime),
        |            dur => INTERVAL '10' MINUTE, offset => INTERVAL '3' MINUTE) T
        |GROUP BY T.wstart, T.wend""".stripMargin, Times.hm("8:21"))
    val out = rows(df).sortBy(_.mkString("|"))
    // grid: [7:53,8:03), [8:03,8:13), [8:13,8:23)
    assert(out == Seq(
      Seq("8:03", "8:13", "5"),  // C(8:05) A(8:07) D(8:09) B(8:11)
      Seq("8:13", "8:23", "6"),  // E(8:13) F(8:17)
    ))
  }

  test("delayed table view reflects only materialized state (Extension 6 as a table)") {
    // At 8:13, a 6-minute delay means nothing has materialized yet.
    val early = session.sql(
      PaperDataset.tumbleGroupSql + " EMIT AFTER DELAY INTERVAL '6' MINUTES", Times.hm("8:13"))
    assert(early.count() == 0)
    // At 8:14 the first timer (armed 8:08) has fired.
    val at814 = session.sql(
      PaperDataset.tumbleGroupSql + " EMIT AFTER DELAY INTERVAL '6' MINUTES", Times.hm("8:14"))
    assert(rows(at814) == Seq(Seq("8:00", "8:10", "4")))
  }

  test("ver sequences are per-window, not global") {
    val df  = session.sql(PaperDataset.tumbleGroupSql + " EMIT STREAM", Times.hm("8:21"))
    val out = rows(df)
    val byWindow = out.groupBy(_.head).view.mapValues(_.map(_(5).toInt)).toMap
    byWindow.values.foreach(vers => assert(vers == vers.indices.toList))
  }
}
