package repro.experiments

import org.apache.spark.sql.{DataFrame, SparkSession}

import repro.core.StreamSqlSession
import repro.engine.{EngineMode, MicroBatchEngine, StreamAnalytics}
import repro.nexmark.NexGen
import repro.paperexample.PaperDataset
import repro.tvr.Times

/** The paper's reproducible artifacts, one entry per table in
  * EXPERIMENTS.md: the listing tables of Sections 4/6 (L3–L14) and the
  * quantitative benchmarks B1–B5 derived from the paper's claims.
  * Shared by the `jobs/` spark-submit entrypoints and the `bench/`
  * suites.
  */
object Experiments {

  // ------------------------------------------------------------ rendering

  def render(title: String, header: Seq[String], rows: Seq[Seq[String]]): String = {
    val all    = header +: rows
    val widths = header.indices.map(i => all.map(_(i).length).max)
    def line(cells: Seq[String]): String =
      cells.zip(widths).map { case (c, w) => c.padTo(w, ' ') }.mkString("| ", " | ", " |")
    val sep = widths.map("-" * _).mkString("|-", "-|-", "-|")
    (s"== $title" +: line(header) +: sep +: rows.map(line)).mkString("\n")
  }

  private def fmtCell(v: Any): String = v match {
    case t: java.sql.Timestamp => Times.fmt(Times.ms(t))
    case d: Double             => f"$d%.3f"
    case other                 => String.valueOf(other)
  }

  def dfRows(df: DataFrame, sortedSet: Boolean = true): Seq[Seq[String]] = {
    val rs = df.collect().toSeq.map(_.toSeq.map(fmtCell))
    if (sortedSet) rs.sortBy(_.mkString("|")) else rs
  }

  // ------------------------------------------------------------ L3..L14

  /** A listing reproduction: id, query+mode description, column header,
    * produced rows, and the rows printed in the paper.
    */
  final case class Listing(
      id: String,
      description: String,
      header: Seq[String],
      produced: Seq[Seq[String]],
      paper: Seq[Seq[String]],
  ) {
    def matches: Boolean = produced == paper
    def rendered: String =
      render(s"$id — $description (paper match: $matches)", header, produced)
  }

  private val q7Header     = Seq("wstart", "wend", "bidtime", "price", "item")
  private val streamHeader = q7Header ++ Seq("undo", "ptime", "ver")

  def paperSession(spark: SparkSession): StreamSqlSession = {
    val s = new StreamSqlSession(spark)
    s.registerStream("Bid", PaperDataset.bidTvr(spark))
    s
  }

  /** All twelve listing tables, produced by the reference evaluator. */
  def listings(spark: SparkSession): Seq[Listing] = {
    val s      = paperSession(spark)
    def at(hm: String) = Times.hm(hm)
    def tbl(sql: String, p: String)    = dfRows(s.sql(sql, at(p)))
    def stream(sql: String, p: String) = dfRows(s.sql(sql, at(p)), sortedSet = false)

    Seq(
      Listing("L3", "Q7 table view at 8:21", q7Header,
        tbl(PaperDataset.q7Sql, "8:21"),
        Seq(Seq("8:00", "8:10", "8:09", "5", "D"), Seq("8:10", "8:20", "8:17", "6", "F"))),
      Listing("L4", "Q7 table view at 8:13", q7Header,
        tbl(PaperDataset.q7Sql, "8:13"),
        Seq(Seq("8:00", "8:10", "8:05", "4", "C"), Seq("8:10", "8:20", "8:11", "3", "B"))),
      Listing("L5", "Tumble TVF output at 8:21", q7Header,
        tbl(PaperDataset.tumbleSql, "8:21"),
        Seq(
          Seq("8:00", "8:10", "8:05", "4", "C"), Seq("8:00", "8:10", "8:07", "2", "A"),
          Seq("8:00", "8:10", "8:09", "5", "D"), Seq("8:10", "8:20", "8:11", "3", "B"),
          Seq("8:10", "8:20", "8:13", "1", "E"), Seq("8:10", "8:20", "8:17", "6", "F"))),
      Listing("L6", "Tumble + GROUP BY (max price per window)", Seq("wstart", "wend", "maxPrice"),
        tbl(PaperDataset.tumbleGroupSql, "8:21"),
        Seq(Seq("8:00", "8:10", "5"), Seq("8:10", "8:20", "6"))),
      Listing("L7", "Hop TVF output at 8:21", q7Header,
        tbl(PaperDataset.hopSql, "8:21"),
        Seq(
          Seq("8:00", "8:10", "8:05", "4", "C"), Seq("8:00", "8:10", "8:07", "2", "A"),
          Seq("8:00", "8:10", "8:09", "5", "D"), Seq("8:05", "8:15", "8:05", "4", "C"),
          Seq("8:05", "8:15", "8:07", "2", "A"), Seq("8:05", "8:15", "8:09", "5", "D"),
          Seq("8:05", "8:15", "8:11", "3", "B"), Seq("8:05", "8:15", "8:13", "1", "E"),
          Seq("8:10", "8:20", "8:11", "3", "B"), Seq("8:10", "8:20", "8:13", "1", "E"),
          Seq("8:10", "8:20", "8:17", "6", "F"), Seq("8:15", "8:25", "8:17", "6", "F"))),
      Listing("L8", "Hop + GROUP BY (max price per hop window)", Seq("wstart", "wend", "maxPrice"),
        tbl(PaperDataset.hopGroupSql, "8:21"),
        Seq(
          Seq("8:00", "8:10", "5"), Seq("8:05", "8:15", "5"),
          Seq("8:10", "8:20", "6"), Seq("8:15", "8:25", "6"))),
      Listing("L9", "Q7 EMIT STREAM changelog", streamHeader,
        stream(PaperDataset.q7Sql + " EMIT STREAM", "8:21"),
        Seq(
          Seq("8:00", "8:10", "8:07", "2", "A", "false", "8:08", "0"),
          Seq("8:10", "8:20", "8:11", "3", "B", "false", "8:12", "0"),
          Seq("8:00", "8:10", "8:07", "2", "A", "true", "8:13", "1"),
          Seq("8:00", "8:10", "8:05", "4", "C", "false", "8:13", "2"),
          Seq("8:00", "8:10", "8:05", "4", "C", "true", "8:15", "3"),
          Seq("8:00", "8:10", "8:09", "5", "D", "false", "8:15", "4"),
          Seq("8:10", "8:20", "8:11", "3", "B", "true", "8:18", "1"),
          Seq("8:10", "8:20", "8:17", "6", "F", "false", "8:18", "2"))),
      Listing("L10", "Q7 EMIT AFTER WATERMARK at 8:13 (empty)", q7Header,
        tbl(PaperDataset.q7Sql + " EMIT AFTER WATERMARK", "8:13"),
        Seq.empty),
      Listing("L11", "Q7 EMIT AFTER WATERMARK at 8:16", q7Header,
        tbl(PaperDataset.q7Sql + " EMIT AFTER WATERMARK", "8:16"),
        Seq(Seq("8:00", "8:10", "8:09", "5", "D"))),
      Listing("L12", "Q7 EMIT AFTER WATERMARK at 8:21", q7Header,
        tbl(PaperDataset.q7Sql + " EMIT AFTER WATERMARK", "8:21"),
        Seq(Seq("8:00", "8:10", "8:09", "5", "D"), Seq("8:10", "8:20", "8:17", "6", "F"))),
      Listing("L13", "Q7 EMIT STREAM AFTER WATERMARK", streamHeader,
        stream(PaperDataset.q7Sql + " EMIT STREAM AFTER WATERMARK", "8:21"),
        Seq(
          Seq("8:00", "8:10", "8:09", "5", "D", "false", "8:16", "0"),
          Seq("8:10", "8:20", "8:17", "6", "F", "false", "8:21", "0"))),
      Listing("L14", "Q7 EMIT STREAM AFTER DELAY 6 min", streamHeader,
        stream(PaperDataset.q7Sql + " EMIT STREAM AFTER DELAY INTERVAL '6' MINUTES", "8:21"),
        Seq(
          Seq("8:00", "8:10", "8:05", "4", "C", "false", "8:14", "0"),
          Seq("8:10", "8:20", "8:17", "6", "F", "false", "8:18", "0"),
          Seq("8:00", "8:10", "8:05", "4", "C", "true", "8:21", "1"),
          Seq("8:00", "8:10", "8:09", "5", "D", "false", "8:21", "2"))),
    )
  }

  // ------------------------------------------------------------ B1

  final case class B1Row(mode: String, emitted: Long, reductionVsContinuous: Double)

  /** B1 — "Torrents of updates": changelog rows materialized per EMIT
    * policy over a NEXMark bid stream.
    */
  def b1(spark: SparkSession, sf: Double,
         windowMs: Long = 10 * Times.MinuteMs,
         delays: Seq[Long] = Seq(1, 5, 10).map(_ * Times.MinuteMs)): Seq[B1Row] = {
    val ev = NexGen.bids(spark, sf).select("bidtime", "price", "item", "ptime").persist()
    val cont = StreamAnalytics.continuousEmissions(ev, windowMs)
    val rows = B1Row("EMIT STREAM (continuous)", cont, 1.0) +:
      delays.map { d =>
        val e = StreamAnalytics.delayEmissions(ev, windowMs, d)
        B1Row(s"EMIT STREAM AFTER DELAY ${d / Times.MinuteMs} min", e, cont.toDouble / e)
      } :+ {
        val e = StreamAnalytics.watermarkEmissions(ev, windowMs)
        B1Row("EMIT STREAM AFTER WATERMARK", e, cont.toDouble / e)
      }
    ev.unpersist()
    rows
  }

  def renderB1(rows: Seq[B1Row]): String =
    render("B1 — update volume by EMIT policy",
      Seq("policy", "changelog rows", "reduction vs continuous"),
      rows.map(r => Seq(r.mode, r.emitted.toString, f"${r.reductionVsContinuous}%.1fx")))

  // ------------------------------------------------------------ B2

  final case class B2Row(batch: Int, wm: String, arrived: Long,
                         retainedNoGc: Long, retainedGc: Long, stateWindowsGc: Long)

  /** B2 — "finite state over infinite input": rows a general operator
    * retains with vs without watermark-driven GC as the stream runs.
    */
  def b2(spark: SparkSession, sf: Double,
         windowMs: Long = 10 * Times.MinuteMs, batches: Int = 10): Seq[B2Row] = {
    val ev = NexGen.bids(spark, sf).select("bidtime", "price", "item", "ptime").persist()
    val engine = new MicroBatchEngine(spark)
    val gc   = engine.run(ev, windowMs, batches, EngineMode.AfterWatermark)
    val noGc = engine.run(ev, windowMs, batches, EngineMode.Continuous)
    val rows = gc.perBatch.zip(noGc.perBatch).map { case (g, n) =>
      val wm = if (g.wmMs > Long.MaxValue / 4) "+inf" else Times.fmt(g.wmMs)
      B2Row(g.batch, wm, g.arrivedRows, n.retainedRows, g.retainedRows, g.stateWindows)
    }
    ev.unpersist()
    rows
  }

  def renderB2(rows: Seq[B2Row]): String =
    render("B2 — retained state: watermark GC vs none",
      Seq("batch", "watermark", "arrived", "retained (no GC)", "retained (GC)", "open windows"),
      rows.map(r => Seq(r.batch.toString, r.wm, r.arrived.toString,
        r.retainedNoGc.toString, r.retainedGc.toString, r.stateWindowsGc.toString)))

  // ------------------------------------------------------------ B3

  final case class B3Row(policy: String, meanDelayMin: Double, droppedRows: Long)

  /** B3 — emission latency and loss: STREAM-style heartbeat buffering at
    * fixed slack vs watermark-driven finalization.
    */
  def b3(spark: SparkSession, sf: Double,
         windowMs: Long = 10 * Times.MinuteMs,
         slacks: Seq[Long] = Seq(1, 2, 5, 10, 20, 30).map(_ * Times.MinuteMs)): Seq[B3Row] = {
    val ev = NexGen.bids(spark, sf).select("bidtime", "price", "item", "ptime").persist()
    val wm = NexGen.perfectWatermark(ev, tickEveryMs = Times.MinuteMs)
    val (wmMean, _) = StreamAnalytics.watermarkLatency(ev, windowMs, wm)
    val rows = slacks.map { s =>
      val (mean, dropped) = StreamAnalytics.bufferLatency(ev, windowMs, s)
      B3Row(s"buffer slack ${s / Times.MinuteMs} min", mean / Times.MinuteMs, dropped)
    } :+ B3Row("watermark (perfect)", wmMean / Times.MinuteMs, 0L)
    ev.unpersist()
    rows
  }

  def renderB3(rows: Seq[B3Row]): String =
    render("B3 — window emission delay vs data loss",
      Seq("policy", "mean delay (min)", "dropped rows"),
      rows.map(r => Seq(r.policy, f"${r.meanDelayMin}%.2f", r.droppedRows.toString)))

  // ------------------------------------------------------------ B4

  final case class B4Row(meanSkewMin: Long, watermark: Double, arrivalOrder: Double,
                         procTime: Double)

  /** B4 — correctness under disorder: fraction of windows whose final
    * top bid is right, per processing discipline, as mean skew grows.
    */
  def b4(spark: SparkSession, sf: Double,
         windowMs: Long = 10 * Times.MinuteMs,
         skews: Seq[Long] = Seq(0, 1, 2, 5, 10).map(_ * Times.MinuteMs)): Seq[B4Row] = {
    skews.map { skew =>
      val ev = NexGen.bids(spark, sf, meanSkewMs = skew)
        .select("bidtime", "price", "item", "ptime").persist()
      val row = B4Row(
        skew / Times.MinuteMs,
        watermark = 1.0, // event-time windows + watermark: correct by construction
        arrivalOrder = StreamAnalytics.arrivalOrderCorrectness(ev, windowMs),
        procTime = StreamAnalytics.procTimeCorrectness(ev, windowMs))
      ev.unpersist()
      row
    }
  }

  def renderB4(rows: Seq[B4Row]): String =
    render("B4 — fraction of windows with the correct final answer",
      Seq("mean skew (min)", "watermark", "arrival-order finalize", "processing-time windows"),
      rows.map(r => Seq(r.meanSkewMin.toString, f"${r.watermark}%.3f",
        f"${r.arrivalOrder}%.3f", f"${r.procTime}%.3f")))

  // ------------------------------------------------------------ B5

  final case class B5Row(check: String, rows: Long, equal: Boolean)

  /** B5 — stream/table equivalence, oracle-checked: the stream query's
    * final answer equals the batch query over the recorded table equals
    * DuckDB running the equivalent SQL.
    */
  def b5(spark: SparkSession, sf: Double): Seq[B5Row] = {
    import org.apache.spark.sql.functions._
    val TenMin = 10 * Times.MinuteMs

    def check(name: String, ours: DataFrame, duckSql: String,
              tables: (String, DataFrame)*): B5Row = {
      val n = ours.count()
      val ok =
        try { repro.Oracle.assertEquivalent(ours, duckSql, tables: _*); true }
        catch { case e: IllegalArgumentException => Console.err.println(s"[$name] $e"); false }
      B5Row(name, n, ok)
    }

    val paperBids = PaperDataset.bidTvr(spark).snapshot
    val nexBids   = NexGen.bids(spark, sf)
    def duckBid(df: DataFrame) =
      df.select(unix_millis(col("bidtime")).as("bidms"), col("price"), col("item"))
    def q7Duck =
      s"""WITH w AS (
         |  SELECT CAST(bidms AS BIGINT) AS bms, CAST(price AS BIGINT) AS price, item,
         |         CAST(floor(CAST(bidms AS BIGINT) / $TenMin.0) AS BIGINT) * $TenMin AS wstart
         |  FROM bid
         |), m AS (SELECT wstart, MAX(price) AS maxprice FROM w GROUP BY wstart)
         |SELECT w.wstart AS wstart, w.wstart + $TenMin AS wend,
         |       w.bms AS bidtime, w.price AS price, w.item AS item
         |FROM w JOIN m ON w.wstart = m.wstart AND w.price = m.maxprice""".stripMargin

    val s1 = paperSession(spark)
    val paperQ7 = s1.sql(PaperDataset.q7Sql, Times.hm("8:21"))
      .withColumn("wstart", unix_millis(col("wstart")))
      .withColumn("wend", unix_millis(col("wend")))
      .withColumn("bidtime", unix_millis(col("bidtime")))

    val s2 = new StreamSqlSession(spark)
    s2.registerStream("NexBid",
      NexGen.bidTvr(nexBids, NexGen.perfectWatermark(nexBids, Times.MinuteMs)))
    val nexQ7 = s2.sql(PaperDataset.q7SqlFor("NexBid"))
      .withColumn("wstart", unix_millis(col("wstart")))
      .withColumn("wend", unix_millis(col("wend")))
      .withColumn("bidtime", unix_millis(col("bidtime")))

    val engine = new MicroBatchEngine(spark)
    val eng = engine.run(nexBids.select("bidtime", "price", "item", "ptime"),
      TenMin, 10, EngineMode.AfterWatermark)
    val engTops = eng.finalOutput
      .select(unix_millis(col("wstart")).as("wstart"), col("price"))

    Seq(
      check("Q7 paper dataset vs DuckDB", paperQ7, q7Duck, "bid" -> duckBid(paperBids)),
      check("Q7 recorded NEXMark stream vs DuckDB", nexQ7, q7Duck, "bid" -> duckBid(nexBids)),
      check("engine after-watermark final output vs DuckDB", engTops,
        s"""SELECT CAST(floor(CAST(bidms AS BIGINT) / $TenMin.0) AS BIGINT) * $TenMin AS wstart,
           |       MAX(CAST(price AS BIGINT)) AS price
           |FROM bid GROUP BY 1""".stripMargin,
        "bid" -> duckBid(nexBids)),
    )
  }

  def renderB5(rows: Seq[B5Row]): String =
    render("B5 — stream/table equivalence (DuckDB oracle)",
      Seq("check", "rows", "equal"),
      rows.map(r => Seq(r.check, r.rows.toString, r.equal.toString)))
}
