package repro.jobs

import repro.experiments.Experiments

/** One spark-submit entrypoint per paper listing table (L3–L14): each
  * prints the reproduced table and whether it matches the paper's rows
  * bit-for-bit.
  */
private[jobs] object ListingJob {
  def run(id: String): Unit = {
    val spark = JobSpark.session(s"listing-$id")
    try {
      val l = Experiments.listings(spark).find(_.id == id)
        .getOrElse(sys.error(s"unknown listing $id"))
      println(l.rendered)
      if (!l.matches) sys.error(s"$id does not match the paper's rows")
    } finally spark.stop()
  }
}

object L3Job  { def main(args: Array[String]): Unit = ListingJob.run("L3") }
object L4Job  { def main(args: Array[String]): Unit = ListingJob.run("L4") }
object L5Job  { def main(args: Array[String]): Unit = ListingJob.run("L5") }
object L6Job  { def main(args: Array[String]): Unit = ListingJob.run("L6") }
object L7Job  { def main(args: Array[String]): Unit = ListingJob.run("L7") }
object L8Job  { def main(args: Array[String]): Unit = ListingJob.run("L8") }
object L9Job  { def main(args: Array[String]): Unit = ListingJob.run("L9") }
object L10Job { def main(args: Array[String]): Unit = ListingJob.run("L10") }
object L11Job { def main(args: Array[String]): Unit = ListingJob.run("L11") }
object L12Job { def main(args: Array[String]): Unit = ListingJob.run("L12") }
object L13Job { def main(args: Array[String]): Unit = ListingJob.run("L13") }
object L14Job { def main(args: Array[String]): Unit = ListingJob.run("L14") }

/** All listings at once. */
object ListingsJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSpark.session("listings")
    try Experiments.listings(spark).foreach(l => println(l.rendered + "\n"))
    finally spark.stop()
  }
}
