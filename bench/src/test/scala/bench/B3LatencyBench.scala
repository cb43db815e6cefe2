package bench

import repro.SparkSpec
import repro.experiments.Experiments

/** B3 — STREAM-style in-order buffering vs watermark-driven out-of-order
  * processing (paper Section 3.2): a fixed heartbeat slack trades
  * emission delay against dropped data; a watermark adapts and drops
  * nothing while staying well below the drop-nothing slack.
  */
class B3LatencyBench extends SparkSpec {

  private val sf = sys.env.getOrElse("BENCH_SF", "0.1").toDouble

  private lazy val rows = Experiments.b3(spark, sf)

  test("render B3") {
    println(Experiments.renderB3(rows) + s"   [sf=$sf]")
  }

  test("larger slack drops less data") {
    val drops = rows.init.map(_.droppedRows)
    assert(drops == drops.sorted.reverse, s"drops should fall with slack: $drops")
  }

  test("small slack loses data; large slack pays high latency") {
    val small = rows.head   // 1 min slack
    val large = rows.init.last // 30 min slack
    assert(small.droppedRows > 0, "1-minute slack must drop laggards (mean skew 2 min)")
    assert(large.droppedRows == 0 || large.droppedRows < small.droppedRows / 100)
    assert(large.meanDelayMin == 30.0)
  }

  test("the watermark drops nothing at a fraction of the drop-nothing slack") {
    val wm = rows.last
    assert(wm.policy.contains("watermark"))
    assert(wm.droppedRows == 0)
    val dropNothingSlack = rows.init.filter(_.droppedRows == 0).map(_.meanDelayMin)
    // if any fixed slack achieved zero drops, the watermark must beat it
    dropNothingSlack.headOption.foreach { s =>
      assert(wm.meanDelayMin < s, s"watermark ${wm.meanDelayMin} vs slack $s")
    }
    assert(wm.meanDelayMin < 30.0)
  }
}
