package repro.jobs

import repro.core._
import repro.data.{GraphStreams, QueryGenerator}

/** spark-submit entrypoint: run the Timing engine (MS-tree) continuously
  * over a synthetic stream and print per-window reporting statistics.
  *
  * Usage: RunContinuousQuery [dataset=traffic|wiki|lsbench] [nEdges]
  *        [window] [querySize] [seed]
  * (No Spark needed for the core engine itself; kept as a plain main so
  * spark-submit and `sbt run` both work.)
  */
object RunContinuousQuery {
  def main(args: Array[String]): Unit = {
    val dataset = args.lift(0).getOrElse("traffic")
    val n       = args.lift(1).map(_.toInt).getOrElse(20000)
    val window  = args.lift(2).map(_.toLong).getOrElse(1500L)
    val size    = args.lift(3).map(_.toInt).getOrElse(6)
    val seed    = args.lift(4).map(_.toLong).getOrElse(42L)

    val stream = dataset match {
      case "wiki"    => GraphStreams.wikiTalk(n, n / 40)
      case "lsbench" => GraphStreams.lsbench(n, n / 40)
      case _         => GraphStreams.traffic(n, n / 40)
    }
    val q = QueryGenerator
      .fromStream(stream, size, QueryGenerator.RandomOrder, seed, window)
      .getOrElse(sys.error("query generation failed; try another seed"))
    println(s"query: $q")
    val d = Decomposer.decompose(q)
    println(s"decomposition k=${d.k}: ${d.subqueries.map(_.seq.mkString("{", ",", "}")).mkString(" ")}")

    val engine = new TimingEngine(q, d, StoreMode.MsTree)
    val driver = new WindowDriver(engine, window)
    val t0     = System.nanoTime()
    var total  = 0L
    stream.foreach { e =>
      val nm = driver.advance(e).size
      total += nm
      if (e.ts % (n / 10) == 0)
        println(f"t=${e.ts}%6d  |Ω(Q)|=${engine.results.size}%6d  space=${engine.spaceCells}%8d cells")
    }
    val secs = (System.nanoTime() - t0) / 1e9
    println(f"done: $n edges in $secs%.2f s (${n / secs}%.0f edges/s), $total matches reported")
  }
}
