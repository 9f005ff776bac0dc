package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.bench.BenchHarness._
import repro.core._

/** Table T25 (paper Fig 25): average number of answers reported by the
  * generated query sets while window size and query size vary. The paper's
  * stated shape: answers grow with the window, shrink with query size.
  */
class SelectivityBench extends AnyFunSuite {

  private val windows    = Seq(500L, 1000L, 1500L, 2000L, 2500L)
  private val sizes      = Seq(4, 6, 8, 10, 12)
  private val streamLen  = 20000
  private val queriesPer = 3

  test("T25: selectivity of the generated query sets") {
    for (ds <- Seq("traffic", "wiki", "lsbench")) {
      val stream = dataset(ds, streamLen)
      val rows = sizes.map { size =>
        val qs = queries(stream, size, queriesPer, windowSpan = 1500, seed0 = 900 + size)
        s"|E(Q)|=$size" +: windows.map { w =>
          fmt(mean(qs.map(q =>
            benchRun(new TimingEngine(q, Decomposer.decompose(q), StoreMode.MsTree), stream, w)
              .matches.toDouble)))
        }
      }
      printTable(
        s"T25 Avg #answers reported over the stream — $ds",
        "query size" +: windows.map(w => s"|W|=$w"),
        rows,
      )
    }
    succeed
  }
}
