package bench

import repro.SparkSpec
import repro.experiments.Experiments

/** L3–L14: reproduce every result listing of the paper's worked example
  * and print it next to the paper's rows (`paper match: true` in each
  * header means bit-for-bit equality).
  */
class ListingsBench extends SparkSpec {

  private lazy val listings = Experiments.listings(spark)

  test("render all listing tables") {
    listings.foreach(l => info("\n" + l.rendered))
    println(listings.map(_.rendered).mkString("\n\n"))
  }

  for (id <- Seq("L3", "L4", "L5", "L6", "L7", "L8", "L9", "L10", "L11", "L12", "L13", "L14"))
    test(s"$id matches the paper bit-for-bit") {
      val l = listings.find(_.id == id).get
      assert(l.matches, s"\nproduced:\n${l.produced}\npaper:\n${l.paper}")
    }
}
