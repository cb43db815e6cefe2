package repro.core

import repro.SparkSpec
import repro.paperexample.PaperDataset
import repro.tvr.Times

/** Section 5 lessons: which operators preserve watermark alignment of
  * event-time attributes, and Extension 2's GROUP BY requirement.
  */
class EventTimeAlignmentSpec extends SparkSpec {

  private lazy val session: StreamSqlSession = {
    val s = new StreamSqlSession(spark)
    s.registerStream("Bid", PaperDataset.bidTvr(spark))
    s
  }

  private def align(sql: String): Map[String, EventTimeAlignment.Align] =
    session.alignmentOf(sql).toMap

  test("a verbatim-forwarded event time column stays aligned (strict)") {
    val m = align("SELECT bidtime, price FROM Bid")
    assert(m("bidtime") == EventTimeAlignment.Align("Bid", 0L, strict = true))
    assert(!m.contains("price"))
  }

  test("Tumble's wend is aligned with delta 0; wstart with delta dur") {
    val m = align(PaperDataset.tumbleSql)
    assert(m("wend") == EventTimeAlignment.Align("Bid", 0L, strict = false))
    assert(m("wstart") == EventTimeAlignment.Align("Bid", 10 * Times.MinuteMs, strict = false))
  }

  test("Hop's wstart/wend are aligned through the generator") {
    val m = align(PaperDataset.hopSql)
    assert(m("wstart") == EventTimeAlignment.Align("Bid", 10 * Times.MinuteMs, strict = false))
    assert(m("wend") == EventTimeAlignment.Align("Bid", 0L, strict = false))
  }

  test("grouping keys keep alignment through an aggregation") {
    val m = align(PaperDataset.tumbleGroupSql)
    assert(m.contains("wstart") && m.contains("wend"))
    assert(!m.contains("maxPrice"))
  }

  test("an aggregate over an event time column loses alignment") {
    val m = align(
      """SELECT TB.wend wend, MAX(TB.bidtime) lastBid
        |FROM Tumble(data => TABLE(Bid), timecol => DESCRIPTOR(bidtime),
        |            dur => INTERVAL '10' MINUTE) TB
        |GROUP BY TB.wend""".stripMargin)
    assert(m.contains("wend"))
    assert(!m.contains("lastBid")) // MAX() erases the watermark bound
  }

  test("arbitrary arithmetic on an event time column degrades it (conservative rule)") {
    val m = align("SELECT bidtime + INTERVAL '5' MINUTE AS shifted, price FROM Bid")
    assert(!m.contains("shifted"))
  }

  test("alignment survives joins (both inputs' attributes visible)") {
    val m = align(PaperDataset.q7Sql)
    assert(m("wstart") == EventTimeAlignment.Align("Bid", 10 * Times.MinuteMs, strict = false))
    assert(m("wend") == EventTimeAlignment.Align("Bid", 0L, strict = false))
    assert(m("bidtime") == EventTimeAlignment.Align("Bid", 0L, strict = true))
  }

  test("renaming via alias preserves alignment") {
    val m = align("SELECT bidtime AS occurred, item FROM Bid")
    assert(m("occurred") == EventTimeAlignment.Align("Bid", 0L, strict = true))
  }

  // ------------------------------------------------ Extension 2 rule

  test("Extension 2: GROUP BY without an event-time key over a stream is rejected") {
    val e = intercept[Exception] {
      session.sql("SELECT item, MAX(price) m FROM Bid GROUP BY item", Times.hm("8:21")).collect()
    }
    def causes(t: Throwable): Seq[Throwable] =
      if (t == null) Nil else t +: causes(t.getCause)
    assert(causes(e).exists(_.isInstanceOf[StreamSqlAnalysisException]),
      s"expected StreamSqlAnalysisException in cause chain, got $e")
  }

  test("Extension 2: GROUP BY with a window bound key is accepted") {
    val df = session.sql(PaperDataset.tumbleGroupSql, Times.hm("8:21"))
    assert(df.count() == 2)
  }

  test("Extension 2: GROUP BY on the raw event time column is accepted") {
    val df = session.sql(
      "SELECT bidtime, COUNT(*) c FROM Bid GROUP BY bidtime", Times.hm("8:21"))
    assert(df.count() == 6)
  }

  test("Extension 2 rule is inert for bounded tables") {
    val s2 = new StreamSqlSession(spark)
    s2.registerTable("BoundedBid",
      PaperDataset.bidTvr(spark).snapshot)
    val df = s2.sql("SELECT item, MAX(price) m FROM BoundedBid GROUP BY item")
    assert(df.count() == 6)
  }
}
