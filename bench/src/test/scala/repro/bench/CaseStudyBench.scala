package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.bench.BenchHarness._
import repro.core._
import repro.data.GraphStreams

/** Case study (paper §VII-F, Fig 22): detect the information-exfiltration
  * pattern of Fig 1 planted once in synthetic background traffic (the
  * paper's internal ZeuS capture is private — see DESIGN.md §3). Window 30
  * "seconds" (units), as in the paper.
  */
class CaseStudyBench extends AnyFunSuite {

  test("case study: the planted attack is detected exactly once, at plant time") {
    val plantAt = 15000
    val stream  = GraphStreams.trafficWithAttack(30000, nHosts = 400, plantAt = plantAt)
    val q       = GraphStreams.attackQuery
    val engine  = new TimingEngine(q, Decomposer.decompose(q), StoreMode.MsTree)
    val driver  = new WindowDriver(engine, window = 30)
    var hits    = Vector.empty[(Long, Matching.Match)]
    val t0      = System.nanoTime()
    stream.foreach { e =>
      driver.advance(e).foreach(m => hits :+= (e.ts, m))
    }
    val secs = (System.nanoTime() - t0) / 1e9
    printTable(
      "Case study (Fig 22): planted exfiltration detection",
      Seq("stream edges", "window", "detections", "detected at t", "throughput (edges/s)"),
      Seq(Seq("30000", "30", hits.size.toString,
        hits.map(_._1).mkString(","), fmt(stream.size / secs))),
    )
    assert(hits.size == 1, s"expected exactly the planted attack, got ${hits.size}")
    assert(hits.head._1 == plantAt + 4L, "detected on the exfiltration edge (t5)")
    assert(Matching.isValidPartial(q, hits.head._2))
  }
}
