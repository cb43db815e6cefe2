package bench

import repro.SparkSpec
import repro.experiments.Experiments

/** B4 — "Event time must be explicitly accounted for to achieve correct
  * results" (paper Section 3.2): the fraction of windows whose final
  * answer is right collapses for arrival-order and processing-time
  * disciplines as disorder grows, while event-time windows with
  * watermarks stay exact.
  */
class B4DisorderBench extends SparkSpec {

  private val sf = sys.env.getOrElse("BENCH_SF", "0.05").toDouble

  private lazy val rows = Experiments.b4(spark, sf)

  test("render B4") {
    println(Experiments.renderB4(rows) + s"   [sf=$sf]")
  }

  test("watermark-based processing is always exact") {
    rows.foreach(r => assert(r.watermark == 1.0))
  }

  test("with in-order data every discipline agrees") {
    val r0 = rows.head
    assert(r0.meanSkewMin == 0 && r0.arrivalOrder == 1.0 && r0.procTime == 1.0)
  }

  test("disorder breaks the in-order assumption") {
    val worst = rows.last
    assert(worst.arrivalOrder < 0.9, s"arrival-order still ${worst.arrivalOrder} at max skew")
    assert(worst.procTime < 0.9, s"proc-time still ${worst.procTime} at max skew")
  }

  test("correctness of naive disciplines degrades as skew grows") {
    val arr = rows.map(_.arrivalOrder)
    assert(arr.head >= arr.last, s"expected overall decline, got $arr")
    val proc = rows.map(_.procTime)
    assert(proc.head >= proc.last, s"expected overall decline, got $proc")
  }
}
