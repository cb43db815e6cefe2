package repro.core

import org.apache.spark.sql.DataFrame

import repro.SparkSpec
import repro.paperexample.PaperDataset
import repro.tvr.{Times, Tvr}

/** TVRs are not restricted to append-only streams: the changelog
  * encoding carries DELETEs too (paper §3.1/§3.3.1, Flink's retraction
  * streams in §B.2.3). A cancelled bid must ripple through every
  * materialization mode.
  */
class RetractionStreamSpec extends SparkSpec {

  private def fmtCell(v: Any): String = v match {
    case t: java.sql.Timestamp => Times.fmt(Times.ms(t))
    case other                 => String.valueOf(other)
  }
  private def rows(df: DataFrame): Seq[Seq[String]] =
    df.collect().toSeq.map(_.toSeq.map(fmtCell))

  /** Paper bids, plus: D (the 8:00-window champion, $5) is cancelled at
    * processing time 8:19 — before the watermark closes nothing (window
    * 1 closed at 8:16, so for AFTER WATERMARK the cancellation is late).
    */
  private def tvrWithCancel: Tvr = {
    val changes = PaperDataset.arrivals.map { case (p, bt, price, item) =>
      (Times.hm(p), false, Seq[Any](Times.ts(Times.hm(bt)), price, item))
    } :+ ((Times.hm("8:19"), true, Seq[Any](Times.ts(Times.hm("8:09")), 5, "D")))
    Tvr.ofRows(spark, PaperDataset.bidSchema, changes)
      .withWatermark("bidtime", PaperDataset.watermark)
  }

  private def session: StreamSqlSession = {
    val s = new StreamSqlSession(spark)
    s.registerStream("Bid", tvrWithCancel)
    s
  }

  test("the snapshot after the retraction no longer contains the cancelled bid") {
    val snap = session.sql("SELECT item FROM Bid", Times.hm("8:21"))
    assert(rows(snap).flatten.sorted == Seq("A", "B", "C", "E", "F"))
  }

  test("the instantaneous Q7 table falls back to the next-best bid") {
    val df = session.sql(PaperDataset.q7Sql, Times.hm("8:21"))
    assert(rows(df).sortBy(_.mkString("|")) == Seq(
      Seq("8:00", "8:10", "8:05", "4", "C"), // C ($4) is champion again
      Seq("8:10", "8:20", "8:17", "6", "F"),
    ))
  }

  test("EMIT STREAM shows the cancellation as an undo + replacement") {
    val df = session.sql(PaperDataset.q7Sql + " EMIT STREAM", Times.hm("8:21"))
    val after18 = rows(df).filter(r => Times.hm(r(6)) >= Times.hm("8:19"))
    assert(after18 == Seq(
      Seq("8:00", "8:10", "8:09", "5", "D", "true",  "8:19", "5"),
      Seq("8:00", "8:10", "8:05", "4", "C", "false", "8:19", "6"),
    ))
  }

  test("AFTER WATERMARK finals are immune to the post-completion retraction") {
    val df = session.sql(PaperDataset.q7Sql + " EMIT STREAM AFTER WATERMARK", Times.hm("8:21"))
    assert(rows(df) == Seq(
      Seq("8:00", "8:10", "8:09", "5", "D", "false", "8:16", "0"),
      Seq("8:10", "8:20", "8:17", "6", "F", "false", "8:21", "0"),
    ))
  }

  test("folding the changelog reproduces the retracted table") {
    val stream = session.sql(PaperDataset.q7Sql + " EMIT STREAM", Times.hm("8:21"))
    val folded = stream.collect().toSeq
      .foldLeft(Map.empty[Seq[String], Int].withDefaultValue(0)) { (bag, r) =>
        val key  = r.toSeq.dropRight(3).map(fmtCell)
        bag.updated(key, bag(key) + (if (r.getBoolean(r.length - 3)) -1 else 1))
      }
      .filter(_._2 > 0).keys.toSeq.sortBy(_.mkString("|"))
    val table = rows(session.sql(PaperDataset.q7Sql, Times.hm("8:21"))).sortBy(_.mkString("|"))
    assert(folded == table)
  }
}
