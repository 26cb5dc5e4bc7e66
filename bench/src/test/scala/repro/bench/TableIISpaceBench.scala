package repro.bench

import java.nio.file.Files
import repro.SparkSpec
import repro.eval.Experiments

/** Experiment 7 / Table II: space occupied by each system's index
  * structures relative to the lake size.
  * Paper: Synthetic — D³L 69%, TUS 56%, Aurum 55%;
  *        Smaller Real — D³L 33%, TUS 19%, Aurum 20%;
  *        Larger Real sample — D³L 58%, TUS 32%, Aurum 29%.
  * Shape: D³L costs the most (4 indexes + finer-grained features ⇒ more
  * entries); TUS and Aurum comparable to each other.
  */
class TableIISpaceBench extends SparkSpec {
  import BenchFixtures._

  test("Table II: index space overhead") {
    val dir = Files.createTempDirectory("space").toString
    val rows = Experiments.spaceOverhead(spark, synthetic, dir) ++
      Experiments.spaceOverhead(spark, smallerReal, dir)
    banner("Table II — index space overhead (% of lake size)")
    println(f"${"system"}%-8s ${"repo"}%-14s ${"index MB"}%10s ${"lake MB"}%10s ${"overhead"}%9s")
    rows.foreach { r =>
      println(f"${r.system}%-8s ${r.repo}%-14s ${r.indexBytes / 1e6}%10.2f ${r.lakeBytes / 1e6}%10.2f ${r.overheadPct}%8.1f%%")
    }

    rows.foreach { r => assert(r.indexBytes > 0 && r.lakeBytes > 0) }
    // Paper shape: D³L's indexes are the largest on every repository.
    rows.groupBy(_.repo).foreach { case (repo, rs) =>
      val by = rs.map(r => r.system -> r.overheadPct).toMap
      assert(by("d3l") >= by("tus"), s"$repo: d3l ${by("d3l")} < tus ${by("tus")}")
      assert(by("d3l") >= by("aurum"), s"$repo: d3l ${by("d3l")} < aurum ${by("aurum")}")
    }
  }
}
