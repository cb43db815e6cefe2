package bench

import repro.SparkSpec
import repro.experiments.Experiments

/** B2 — "Some operations only work (efficiently) on watermarked event
  * time attributes" (paper Section 5): watermark-driven GC keeps
  * operator state finite over an unbounded stream, while a
  * no-completeness-signal operator must retain everything.
  */
class B2StateSizeBench extends SparkSpec {

  private val sf = sys.env.getOrElse("BENCH_SF", "0.1").toDouble

  private lazy val rows = Experiments.b2(spark, sf)

  test("render B2") {
    println(Experiments.renderB2(rows) + s"   [sf=$sf]")
  }

  test("without a watermark, retained input grows without bound (linear in arrivals)") {
    rows.foreach(r => assert(r.retainedNoGc == r.arrived))
  }

  test("with watermark GC, retained input stays a small fraction of arrivals") {
    val last = rows.last
    assert(last.retainedGc < last.arrived / 4,
      s"GC retained ${last.retainedGc} of ${last.arrived}")
  }

  test("GC-retained state does not grow with stream length") {
    val tail = rows.drop(2).map(_.retainedGc)
    // bounded by (open-window span) * rate, not by total arrivals
    assert(tail.max < rows.last.arrived / 2)
  }

  test("open-window aggregate state stays tiny") {
    rows.drop(2).foreach(r => assert(r.stateWindowsGc <= 25, s"open windows ${r.stateWindowsGc}"))
  }
}
