package bench

import repro.SparkSpec
import repro.experiments.Experiments

/** B5 — the unifying claim (paper Sections 3.1/4 and B.1): the streaming
  * query's final answer equals the batch query over the recorded table —
  * checked against DuckDB as an independent SQL engine.
  */
class B5TableStreamEquivalenceBench extends SparkSpec {

  // DuckDB ingests the full input in-process; keep the oracle at unit scale.
  private val sf = sys.env.getOrElse("BENCH_ORACLE_SF", "0.005").toDouble

  private lazy val rows = Experiments.b5(spark, sf)

  test("render B5") {
    println(Experiments.renderB5(rows) + s"   [sf=$sf]")
  }

  test("every equivalence check passes") {
    rows.foreach(r => assert(r.equal, s"${r.check} differs from the oracle"))
  }

  test("the checks cover non-trivial result sizes") {
    assert(rows.forall(_.rows > 0))
  }
}
