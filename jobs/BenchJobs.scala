package repro.jobs

import repro.experiments.Experiments

/** One spark-submit entrypoint per quantitative table (B1–B5).
  * Usage: `spark-submit --class repro.jobs.B1Job repro.jar [sf]`.
  */
object B1Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSpark.session("b1-update-volume")
    try println(Experiments.renderB1(Experiments.b1(spark, JobSpark.sf(args))))
    finally spark.stop()
  }
}

object B2Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSpark.session("b2-state-size")
    try println(Experiments.renderB2(Experiments.b2(spark, JobSpark.sf(args))))
    finally spark.stop()
  }
}

object B3Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSpark.session("b3-latency")
    try println(Experiments.renderB3(Experiments.b3(spark, JobSpark.sf(args))))
    finally spark.stop()
  }
}

object B4Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSpark.session("b4-disorder")
    try println(Experiments.renderB4(Experiments.b4(spark, JobSpark.sf(args))))
    finally spark.stop()
  }
}

object B5Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSpark.session("b5-equivalence")
    try {
      // DuckDB collects the full input in-process: cap the oracle scale.
      val sf = math.min(JobSpark.sf(args), 0.01)
      println(Experiments.renderB5(Experiments.b5(spark, sf)))
    } finally spark.stop()
  }
}
