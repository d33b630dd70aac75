package repro.jobs

import repro.baseline.CTC
import repro.core._
import repro.data.GraphGen

/** spark-submit entrypoint for the qualitative case studies (Exp-6..8):
  * prints the discovered communities on the flight-like and fiction-like
  * networks for BCC vs CTC.
  *
  * Usage: spark-submit --class repro.jobs.CaseStudies repro.jar
  */
object CaseStudies {

  def main(args: Array[String]): Unit = {
    // flight network
    val flight = GraphGen.flightLike()
    val index = BCIndex.build(flight)
    val labels = flight.labelSet.toSeq.sorted
    val pair = (for {
      i <- labels.indices; j <- i + 1 until labels.length
      chi = index.butterflyDegrees(labels(i), labels(j))
      m = chi.max if m > 0
    } yield (labels(i), labels(j), m)).maxBy(_._3)
    val (cA, cB, _) = pair
    val qa = (0 until flight.n).filter(v => flight.labels(v) == cA).minBy(flight.ids(_))
    val qb = (0 until flight.n).filter(v => flight.labels(v) == cB).minBy(flight.ids(_))
    val params = LocalBCC.defaultParams(flight, flight.ids(qa), flight.ids(qb), b = 1)
    LPBCC.run(flight, flight.ids(qa), flight.ids(qb), params).foreach { res =>
      println(s"[flight] BCC $cA-$cB: ${res.vertexIds.size} cities, diam=${res.diameter}")
    }
    CTC.run(flight, Seq(flight.ids(qa), flight.ids(qb))).foreach { c =>
      val n = c.map(id => flight.labels(flight.indexOf(id))).size
      println(s"[flight] CTC: ${c.size} cities across $n countries")
    }

    // fiction network
    val potter = GraphGen.potterLike()
    val good = (0 until potter.n).filter(v => potter.labels(v) == "justice").minBy(potter.ids(_))
    val evil = (0 until potter.n).filter(v => potter.labels(v) == "evil").minBy(potter.ids(_))
    LPBCC.run(potter, potter.ids(good), potter.ids(evil), BCCParams(3, 3, 1)).foreach { res =>
      val j = res.vertexIds.count(id => potter.labels(potter.indexOf(id)) == "justice")
      println(s"[potter] BCC: $j justice + ${res.vertexIds.size - j} evil, diam=${res.diameter}")
    }
  }
}
