package repro.cql

import org.apache.spark.sql.functions._

import repro.SparkSpec
import repro.paperexample.PaperDataset
import repro.tvr.Times

class CqlSpec extends SparkSpec {
  import spark.implicits._

  /** The paper dataset's bids as a plain (in-order presentable) stream. */
  private lazy val bids = PaperDataset.arrivals
    .map { case (p, bt, price, item) =>
      (Times.ts(Times.hm(bt)), price, item, Times.ts(Times.hm(p)))
    }
    .toDF("bidtime", "price", "item", "ptime")

  test("instants cover the data range at slide granularity") {
    val ts = Cql.instants(Times.hm("8:05"), Times.hm("8:17"), 10 * Times.MinuteMs)
    assert(ts == Seq(Times.hm("8:10"), Times.hm("8:20")))
  }

  test("instants with a finer slide") {
    val ts = Cql.instants(Times.hm("8:05"), Times.hm("8:12"), 5 * Times.MinuteMs)
    assert(ts == Seq(Times.hm("8:10"), Times.hm("8:15")))
  }

  test("relationAt extracts the half-open window [T-w, T)") {
    val rel = Cql.relationAt(bids, "bidtime", Times.hm("8:10"), 10 * Times.MinuteMs)
    assert(rel.collect().map(_.getString(2)).sorted.toSeq == Seq("A", "C", "D"))
  }

  test("relationAt excludes the right boundary") {
    val rel = Cql.relationAt(bids, "bidtime", Times.hm("8:11"), Times.MinuteMs)
    // [8:10, 8:11): no bids at exactly 8:10
    assert(rel.count() == 0)
  }

  test("Rstream emits the full window relation at each instant") {
    val out = Cql.rstream(spark, bids, "bidtime", 10 * Times.MinuteMs, 10 * Times.MinuteMs,
      rel => rel.select(col("item")))
    val byInstant = out.collect()
      .groupBy(r => Times.fmt(Times.ms(r.getTimestamp(1))))
      .view.mapValues(_.map(_.getString(0)).sorted.toSeq).toMap
    assert(byInstant == Map(
      "8:10" -> Seq("A", "C", "D"),
      "8:20" -> Seq("B", "E", "F"),
    ))
  }

  test("Istream emits rows entering the window") {
    val out = Cql.istream(spark, bids, "bidtime", 10 * Times.MinuteMs, 5 * Times.MinuteMs,
      rel => rel.select(col("item")))
    // at 8:15, window [8:05,8:15): entered since [8:00,8:10): B (8:11), E (8:13)
    val at815 = out.where(unix_millis(col("cql_t")) === Times.hm("8:15"))
      .collect().map(_.getString(0)).sorted
    assert(at815.toSeq == Seq("B", "E"))
  }

  test("Dstream emits rows leaving the window") {
    val out = Cql.dstream(spark, bids, "bidtime", 10 * Times.MinuteMs, 5 * Times.MinuteMs,
      rel => rel.select(col("item")))
    // at 8:15: left since [8:00,8:10): A (8:07) and C (8:05), D(8:09)? D=8:09 left too? [8:05,8:15) keeps 8:05<=t<8:05? window at 8:15 is [8:05,8:15): keeps C(8:05), D(8:09); A(8:07) stays too.
    // window at 8:10 was [8:00,8:10): {A,C,D}; at 8:15 is [8:05,8:15): {C,A,D,B,E}; nothing left.
    val at815 = out.where(unix_millis(col("cql_t")) === Times.hm("8:15")).count()
    assert(at815 == 0)
    // at 8:20, window [8:10,8:20) vs [8:05,8:15): A, C, D left.
    val at820 = out.where(unix_millis(col("cql_t")) === Times.hm("8:20"))
      .collect().map(_.getString(0)).sorted
    assert(at820.toSeq == Seq("A", "C", "D"))
  }

  test("CQL Q7 (Listing 1) emits the per-window max bids at window-close instants") {
    val out = CqlQ7.run(spark, bids)
    val rows = out.collect().map { r =>
      (Times.fmt(Times.ms(r.getTimestamp(3))), r.getInt(0), r.getString(1))
    }.sortBy(_._1)
    assert(rows.toSeq == Seq(("8:10", 5, "D"), ("8:20", 6, "F")))
  }

  test("CQL Q7 equals the proposal's EMIT STREAM AFTER WATERMARK result set") {
    // The paper's central equivalence: the CQL query and the streaming-SQL
    // query produce the same per-window answers; only emission ptimes
    // differ (logical instants vs watermark passage).
    val cql = CqlQ7.run(spark, bids).collect()
      .map(r => (r.getInt(0), r.getString(1))).toSet
    val session = new repro.core.StreamSqlSession(spark)
    session.registerStream("Bid", PaperDataset.bidTvr(spark))
    val ours = session
      .sql(PaperDataset.q7Sql + " EMIT STREAM AFTER WATERMARK", Times.hm("8:21"))
      .collect().map(r => (r.getInt(3), r.getString(4))).toSet
    assert(cql == ours)
  }

  test("heartbeat buffering drops events whose skew exceeds the slack") {
    val (kept, dropped) = Cql.heartbeatBuffer(bids, "bidtime", "ptime", 2 * Times.MinuteMs)
    // skews: A=1m, B=1m, C=8m, D=6m, E=4m, F=1m -> dropped C, D, E
    assert(dropped == 3)
    assert(kept.collect().map(_.getString(2)).sorted.toSeq == Seq("A", "B", "F"))
  }

  test("heartbeat buffering with ample slack keeps everything") {
    val (kept, dropped) = Cql.heartbeatBuffer(bids, "bidtime", "ptime", Times.HourMs)
    assert(dropped == 0)
    assert(kept.count() == 6)
  }

  test("Rstream over an empty stream is empty") {
    val out = Cql.rstream(spark, bids.limit(0), "bidtime",
      10 * Times.MinuteMs, 10 * Times.MinuteMs, rel => rel.select(col("item")))
    assert(out.count() == 0)
  }
}
