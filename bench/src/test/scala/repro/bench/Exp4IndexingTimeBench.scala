package repro.bench

import repro.SparkSpec
import repro.eval.{Experiments, Harness}

/** Experiment 4 (Fig. 6a): index-construction time as the lake grows
  * (Larger Real samples; paper sweeps 2.5K–12.5K tables, we sweep 100–500).
  * Paper shape: D³L up to 4–6× faster than TUS (whose YAGO mapping
  * dominates); Aurum up to 5× faster than D³L on small lakes, converging as
  * the graph build grows with lake size.
  */
class Exp4IndexingTimeBench extends SparkSpec {
  import BenchFixtures._

  test("Experiment 4: indexing time vs lake size") {
    val sizes = Seq(100, 200, 300, 400, 500)
    val rows = Experiments.indexingTimes(spark, sizes, Harness.kbPath)
    banner("Experiment 4 — indexing time (s) vs lake size (tables)")
    println(f"${"system"}%-8s ${"tables"}%7s ${"seconds"}%9s")
    rows.foreach(r => println(f"${r.system}%-8s ${r.x}%7d ${r.seconds}%9.2f"))

    rows.foreach(r => assert(r.seconds > 0))
    def series(sys: String) = rows.filter(_.system == sys).sortBy(_.x).map(_.seconds)
    // Paper shape: TUS is the slowest indexer at the largest size.
    assert(series("tus").last >= series("d3l").last,
      s"tus ${series("tus").last}s should exceed d3l ${series("d3l").last}s")
    // Everything grows with the lake (monotone trend between extremes).
    Seq("d3l", "tus", "aurum").foreach { s =>
      assert(series(s).last > series(s).head * 0.8, s"$s did not grow with lake size")
    }
  }
}
