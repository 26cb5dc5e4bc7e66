package repro.eval

import repro.{Oracle, SparkSpec}
import repro.lake.{GroundTruth, Lake, LakeColumn, LakeTable}
import Metrics.{Align, Ranked}

class MetricsSpec extends SparkSpec {

  // Hand-built truth: target t has related {a, b, c}; d, e unrelated.
  private val truth = GroundTruth(
    relatedTables = Map(
      "t" -> Set("a", "b", "c"),
      "a" -> Set("t", "b", "c"), "b" -> Set("t", "a", "c"), "c" -> Set("t", "a", "b"),
      "d" -> Set.empty, "e" -> Set.empty),
    attrDomain = Map(
      ("t", 0) -> "k.name", ("t", 1) -> "k.city", ("t", 2) -> "k.num",
      ("a", 0) -> "k.name", ("a", 1) -> "k.city",
      ("b", 0) -> "k.name",
      ("c", 0) -> "k.num",
      ("d", 0) -> "other.x", ("e", 0) -> "other.y"),
  )

  private def mkTable(id: String, n: Int): LakeTable =
    LakeTable(id, "x", Vector.tabulate(n)(i =>
      LakeColumn(s"c$i", Vector("v"), s"d$i", isSubject = i == 0)))

  private val lake = Lake("test", Vector(
    mkTable("t", 3), mkTable("a", 2), mkTable("b", 1), mkTable("c", 1),
    mkTable("d", 1), mkTable("e", 1)), truth)

  private val ranks = Seq(
    Ranked("t", "a", 1), Ranked("t", "d", 2), Ranked("t", "b", 3),
    Ranked("t", "c", 4), Ranked("t", "e", 5))

  // ---- precision / recall --------------------------------------------------

  test("precision@k and recall@k at k=1") {
    val (p, r) = Metrics.precisionRecallAtK(ranks, truth, 1)
    assert(p == 1.0)             // a related
    assert(math.abs(r - 1.0 / 3) < 1e-12)
  }

  test("precision@k and recall@k at k=2 (one FP)") {
    val (p, r) = Metrics.precisionRecallAtK(ranks, truth, 2)
    assert(p == 0.5)
    assert(math.abs(r - 1.0 / 3) < 1e-12)
  }

  test("precision@k and recall@k at k=4") {
    val (p, r) = Metrics.precisionRecallAtK(ranks, truth, 4)
    assert(p == 0.75)
    assert(r == 1.0)
  }

  test("precision uses only what was retrieved when fewer than k exist") {
    val (p, _) = Metrics.precisionRecallAtK(ranks, truth, 100)
    assert(p == 3.0 / 5)
  }

  test("targets without truth entries are skipped") {
    val (p, r) = Metrics.precisionRecallAtK(Seq(Ranked("d", "t", 1)), truth, 1)
    assert(p == 0.0 && r == 0.0)
  }

  test("multiple targets are averaged") {
    val two = ranks ++ Seq(Ranked("a", "t", 1), Ranked("a", "d", 2))
    val (p, _) = Metrics.precisionRecallAtK(two, truth, 2)
    // t: 0.5; a: 0.5 (t related to a, d not) → avg 0.5
    assert(p == 0.5)
  }

  test("oracle: precision@2 agrees with a SQL formulation") {
    import spark.implicits._
    import org.apache.spark.sql.functions._
    val ranksDf = ranks.map(r => (r.tTable, r.sTable, r.rank)).toDF("t_table", "s_table", "rank")
    val truthDf = truth.relatedTables.toSeq.flatMap { case (t, rs) => rs.map(t -> _) }
      .toDF("t_table", "s_table").withColumn("rel", lit(1))
    val sparkP = ranksDf.filter($"rank" <= 2)
      .join(truthDf, Seq("t_table", "s_table"), "left")
      .groupBy($"t_table")
      .agg((sum(coalesce($"rel", lit(0))) / count(lit(1))) as "precision")
    Oracle.assertEquivalent(
      sparkP,
      """SELECT r.t_table,
        |       sum(CASE WHEN g.s_table IS NULL THEN 0 ELSE 1 END) * 1.0 / count(*) AS precision
        |FROM ranks r LEFT JOIN truth g
        |  ON r.t_table = g.t_table AND r.s_table = g.s_table
        |WHERE CAST(r.rank AS INT) <= 2
        |GROUP BY r.t_table""".stripMargin,
      "ranks" -> ranksDf, "truth" -> truthDf.drop("rel"))
    val got = sparkP.collect().head.getDouble(1)
    assert(got == 0.5)
  }

  // ---- coverage ------------------------------------------------------------

  private val aligns = Seq(
    Align("t", 0, "a", 0), Align("t", 1, "a", 1), // a covers cols 0,1 of t
    Align("t", 0, "b", 0),                        // b covers col 0
    Align("t", 2, "c", 0),                        // c covers col 2
    Align("t", 0, "d", 0))                        // d (unrelated) covers col 0

  test("coverage without joins at k=1 (a covers 2/3)") {
    val cov = Metrics.meanCoverage(ranks, aligns, lake, 1)
    assert(math.abs(cov - 2.0 / 3) < 1e-12)
  }

  test("coverage averages over the top-k tables") {
    val cov = Metrics.meanCoverage(ranks, aligns, lake, 2)
    // a: 2/3; d: 1/3 → mean 1/2
    assert(math.abs(cov - 0.5) < 1e-12)
  }

  test("coverage with join paths unions path-table alignments") {
    val reach: (String, String) => Set[String] = (_, si) => if (si == "a") Set("c") else Set.empty
    val cov = Metrics.meanCoverage(ranks, aligns, lake, 1, reach)
    assert(cov == 1.0) // a(0,1) ∪ c(2) = all of t's 3 columns
  }

  test("coverage of a table with no alignments is 0") {
    val cov = Metrics.meanCoverage(Seq(Ranked("t", "e", 1)), aligns, lake, 1)
    assert(cov == 0.0)
  }

  // ---- attribute precision -------------------------------------------------

  test("attribute precision without joins at k=1") {
    // a's alignments: (t0,a0) name-name related; (t1,a1) city-city related → 1.0
    val ap = Metrics.meanAttrPrecision(ranks, aligns, truth, 1)
    assert(ap == 1.0)
  }

  test("attribute precision counts unrelated alignments as FPs") {
    // d's alignment (t0,d0) is unrelated → at k=2: mean(1.0, 0.0) = 0.5
    val ap = Metrics.meanAttrPrecision(ranks, aligns, truth, 2)
    assert(ap == 0.5)
  }

  test("joined attribute precision: a group is TP if any member is related") {
    val reach: (String, String) => Set[String] = (_, si) => if (si == "a") Set("d") else Set.empty
    // Groups for a∪d: t0 → {(a,0) related, (d,0) unrelated} → TP;
    // t1 → {(a,1)} related → TP. Precision 1.0.
    val ap = Metrics.meanAttrPrecisionJoined(ranks, aligns, truth, 1, reach)
    assert(ap == 1.0)
  }

  test("joined attribute precision penalises groups with no related member") {
    val reach: (String, String) => Set[String] = (_, _) => Set("d")
    // b alone aligns t0 via (b,0) related; joined with d adds (d,0) unrelated
    // to the same group → still TP. Use c: covers t2 via (c,0) with domain
    // k.num vs truth (t,2)=k.num → related.
    val ranksB = Seq(Ranked("t", "b", 1))
    val ap = Metrics.meanAttrPrecisionJoined(ranksB, aligns, truth, 1, reach)
    assert(ap == 1.0)
  }

  test("empty rankings give zero metrics") {
    assert(Metrics.precisionRecallAtK(Seq.empty, truth, 5) == ((0.0, 0.0)))
    assert(Metrics.meanCoverage(Seq.empty, aligns, lake, 5) == 0.0)
    assert(Metrics.meanAttrPrecision(Seq.empty, aligns, truth, 5) == 0.0)
  }
}
