package bench

import repro.SparkSpec
import repro.experiments.Experiments

/** B1 — "Torrents of updates" (paper Section 5 / 6.5.2): changelog rows
  * materialized per EMIT policy over a NEXMark bid stream at SF=0.1
  * (~100k bids, ~170 ten-minute windows).
  *
  * Paper claim (qualitative): instantaneous updates are a torrent;
  * AFTER DELAY compresses them; AFTER WATERMARK reduces to exactly one
  * final row per window.
  */
class B1UpdateVolumeBench extends SparkSpec {

  private val sf = sys.env.getOrElse("BENCH_SF", "0.1").toDouble

  private lazy val rows = Experiments.b1(spark, sf)

  test("render B1") {
    println(Experiments.renderB1(rows) + s"   [sf=$sf]")
  }

  test("update volume shrinks monotonically with the delay") {
    val emitted = rows.map(_.emitted)
    assert(emitted == emitted.sorted.reverse,
      s"expected continuous >= delays (asc) >= watermark, got $emitted")
  }

  test("AFTER WATERMARK emits exactly one row per window") {
    val wm = rows.last
    assert(wm.mode.contains("WATERMARK"))
    // ~ (stream span / window) windows; at SF=0.1, gap 1s: ~167
    assert(wm.emitted >= 100 && wm.emitted <= 400)
  }

  test("materialization control delivers at least a 2x reduction at 5 min delay") {
    val d5 = rows.find(_.mode.contains("5 min")).get
    assert(d5.reductionVsContinuous >= 2.0,
      s"expected >= 2x, got ${d5.reductionVsContinuous}")
  }
}
