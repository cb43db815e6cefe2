package repro.core

import org.apache.spark.sql.functions._

import repro.SparkSpec
import repro.cql.CqlQ7
import repro.engine.{EngineMode, MicroBatchEngine}
import repro.nexmark.NexGen
import repro.tvr.Times

/** Three independent implementations of NEXMark Q7 must agree on the
  * final per-window answers over the same recorded stream:
  *
  *   1. the reference evaluator (`StreamSqlSession`, per-tick snapshot
  *      diffing of the paper's SQL),
  *   2. the incremental micro-batch engine (state + watermark GC),
  *   3. the CQL baseline (logical-clock window evaluation).
  *
  * This is the strongest internal-consistency check in the repo: the
  * three share no evaluation code beyond the input DataFrame.
  */
class ThreeWayEquivalenceSpec extends SparkSpec {

  private val TenMin = 10 * Times.MinuteMs

  // Small enough for the reference evaluator, and at one bid per minute
  // of event time the 60 bids span seven 10-minute windows with real
  // disorder (mean skew 3 min).
  private lazy val bids = NexGen
    .bids(spark, sf = 0.00006, gapMs = Times.MinuteMs, meanSkewMs = 3 * Times.MinuteMs)
    .select("bidtime", "price", "item", "ptime")
    .persist()

  /** Final (price, item) per wstart, window keyed in minutes. */
  private type Tops = Map[Long, Set[(Long, String)]]

  private lazy val reference: Tops = {
    val wm = NexGen.perfectWatermark(bids, tickEveryMs = Times.MinuteMs)
    val session = new StreamSqlSession(spark)
    session.registerStream("NexBid", NexGen.bidTvr(bids, wm))
    // Table view once everything has arrived = the final answer.
    session.sql(repro.paperexample.PaperDataset.q7SqlFor("NexBid"))
      .collect().toSeq
      .groupBy(r => Times.ms(r.getTimestamp(0)))
      .view.mapValues(_.map(r => (r.getLong(3), r.getString(4))).toSet).toMap
  }

  private lazy val engineTops: Tops = {
    val res = new MicroBatchEngine(spark)
      .run(bids, TenMin, numBatches = 6, EngineMode.AfterWatermark)
    res.finalOutput.collect().toSeq
      .groupBy(r => Times.ms(r.getTimestamp(0)))
      .view.mapValues(_.map(r => (r.getLong(3), r.getString(4))).toSet).toMap
  }

  private lazy val cqlTops: Tops = {
    CqlQ7.run(spark, bids).collect().toSeq
      .groupBy(r => Times.ms(r.getTimestamp(3)) - TenMin) // instant = wend -> wstart
      .view.mapValues(_.map(r => (r.getLong(0), r.getString(1))).toSet).toMap
  }

  test("the stream is genuinely out of order") {
    val log = NexGen.arrivalLog(bids)
    val inv = log.sortBy(_._1).map(_._2).sliding(2).count {
      case Seq(a, b) => a > b
      case _         => false
    }
    assert(inv > 0)
  }

  test("reference evaluator and micro-batch engine agree window by window") {
    // The engine keeps a single top per window; the SQL keeps all ties.
    // Compare on max price per window and membership of the engine's pick.
    assert(reference.keySet == engineTops.keySet)
    reference.foreach { case (w, rows) =>
      val engRows = engineTops(w)
      assert(engRows.subsetOf(rows), s"window ${Times.fmt(w)}: $engRows not in $rows")
      assert(rows.map(_._1).max == engRows.map(_._1).max)
    }
  }

  test("reference evaluator and CQL baseline agree window by window") {
    assert(reference.keySet == cqlTops.keySet)
    reference.foreach { case (w, rows) =>
      assert(cqlTops(w) == rows, s"window ${Times.fmt(w)}")
    }
  }

  test("per-window price maxima agree across all three") {
    val refMax = reference.view.mapValues(_.map(_._1).max).toMap
    val engMax = engineTops.view.mapValues(_.map(_._1).max).toMap
    val cqlMax = cqlTops.view.mapValues(_.map(_._1).max).toMap
    assert(refMax == engMax && refMax == cqlMax)
  }

  test("the answers cover every window of the stream span") {
    val span = bids.agg(
      min(unix_millis(col("bidtime"))), max(unix_millis(col("bidtime")))).head()
    val expected = (span.getLong(0) / TenMin to span.getLong(1) / TenMin).map(_ * TenMin).toSet
    assert(reference.keySet == expected)
  }
}
