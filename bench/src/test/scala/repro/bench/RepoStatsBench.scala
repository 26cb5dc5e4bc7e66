package repro.bench

import repro.SparkSpec
import repro.eval.Experiments

/** Fig. 2: repository statistics — arity, cardinality, and percentage of
  * numeric attributes for the two effectiveness repositories. The paper's
  * corpora have arity mostly ≤ 25, cardinality mostly ≤ 1000, and Smaller
  * Real has a higher numeric ratio than Synthetic's typical tables.
  */
class RepoStatsBench extends SparkSpec {
  import BenchFixtures._

  test("Fig. 2: repository statistics") {
    val rows = Experiments.repoStats(synthetic.lake) ++ Experiments.repoStats(smallerReal.lake)
    banner("Fig. 2 — repository statistics (quartiles)")
    println(f"${"repo"}%-14s ${"metric"}%-12s ${"p25"}%8s ${"median"}%8s ${"p75"}%8s ${"max"}%8s")
    rows.foreach { r =>
      println(f"${r.repo}%-14s ${r.metric}%-12s ${r.p25}%8.1f ${r.median}%8.1f ${r.p75}%8.1f ${r.max}%8.1f")
    }
    println(f"avg answer size: synthetic=${synthetic.lake.avgAnswerSize}%.1f " +
      f"smaller_real=${smallerReal.lake.avgAnswerSize}%.1f")

    def m(repo: String, metric: String) = rows.find(r => r.repo == repo && r.metric == metric).get
    assert(m("synthetic", "arity").median >= 2)
    assert(m("smaller_real", "arity").median >= 3)
    assert(m("smaller_real", "numeric_pct").median > 0, "Smaller Real needs numeric attributes")
    assert(synthetic.lake.avgAnswerSize > 5, "answer sizes must support a k sweep")
    assert(smallerReal.lake.avgAnswerSize > 5)
  }
}
