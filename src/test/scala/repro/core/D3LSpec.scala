package repro.core

import org.apache.spark.sql.functions._
import repro.SparkSpec
import repro.lake.{Generators, LakeDf}

/** End-to-end discovery tests on a small dirty lake with planted ground
  * truth: related tables (same cluster) must dominate the top of the D³L
  * ranking, evidence columns must behave per §III, and Algorithm 2's guards
  * must hold.
  */
class D3LSpec extends SparkSpec {

  private lazy val lake = Generators.smallerReal(nClusters = 3, tablesPerCluster = 5, poolSize = 80, seed = 31)
  private lazy val long = LakeDf.toLong(spark, lake.tables).cache()
  private lazy val idx = D3L.index(spark, long)
  private lazy val targets = lake.tables.take(3).map(_.id) // one per cluster
  private lazy val result = D3L.queryAll(spark, idx, targets)
  private lazy val ranking = result.ranking.cache()

  test("ranking contains every target") {
    val ts = ranking.select("t_table").distinct().collect().map(_.getString(0)).toSet
    assert(ts == targets.toSet)
  }

  test("ranking never contains self-matches") {
    assert(ranking.filter(col("t_table") === col("s_table")).count() == 0)
  }

  test("ranks are dense and start at 1") {
    targets.foreach { t =>
      val rs = ranking.filter(col("t_table") === t).select("rank")
        .collect().map(_.getInt(0)).sorted.toSeq
      assert(rs == (1 to rs.size))
    }
  }

  test("scores are within [0,1] and ordered by rank") {
    targets.foreach { t =>
      val rows = ranking.filter(col("t_table") === t)
        .orderBy("rank").select("score").collect().map(_.getDouble(0)).toSeq
      assert(rows.forall(s => s >= 0.0 && s <= 1.0 + 1e-9))
      assert(rows == rows.sorted)
    }
  }

  test("distance vector columns are all present and bounded") {
    Evidence.all.foreach { e =>
      val bad = ranking.filter(col(s"d$e") < 0 || col(s"d$e") > 1.0001).count()
      assert(bad == 0, s"evidence $e out of bounds")
    }
  }

  test("same-cluster tables dominate the top of the ranking") {
    // Precision@4 (cluster size 5 → 4 related per target) averaged ≥ 0.5:
    // the planted related tables must clearly beat cross-cluster noise.
    val rows = ranking.filter(col("rank") <= 4)
      .select("t_table", "s_table").collect()
    val hits = rows.count(r => lake.truth.related(r.getString(0), r.getString(1)))
    assert(hits >= rows.length / 2, s"only $hits/${rows.length} top-4 are truly related")
  }

  test("recall: most related tables are retrieved somewhere in the ranking") {
    val retrieved = ranking.select("t_table", "s_table").collect()
      .groupBy(_.getString(0)).view.mapValues(_.map(_.getString(1)).toSet).toMap
    targets.foreach { t =>
      val rel = lake.truth.relatedTables(t)
      val found = rel intersect retrieved.getOrElse(t, Set.empty)
      assert(found.size >= rel.size / 2, s"$t: found ${found.size}/${rel.size}")
    }
  }

  test("alignments reference valid column indexes") {
    val rows = result.alignments.collect()
    rows.foreach { r =>
      val t = lake.table(r.getAs[String]("t_table"))
      val s = lake.table(r.getAs[String]("s_table"))
      assert(r.getAs[Int]("t_col") < t.arity)
      assert(r.getAs[Int]("s_col") < s.arity)
    }
  }

  test("tablePairs is a superset of the ranked tables") {
    val ranked = ranking.select("t_table", "s_table").collect()
      .map(r => (r.getString(0), r.getString(1))).toSet
    val guard = result.tablePairs.collect().map(r => (r.getString(0), r.getString(1))).toSet
    assert(ranked.subsetOf(guard))
  }

  test("D distances only appear between numeric attribute pairs with guard evidence") {
    // Every table pair with dD < 1 must have numeric attrs on both sides.
    val withD = ranking.filter(col("dD") < 1.0).select("t_table", "s_table").collect()
    withD.foreach { r =>
      def hasNumeric(id: String) = lake.table(id).columns.exists { c =>
        c.values.count(v => repro.text.Tokenizer.isNumericValue(v)) >
          0.8 * math.max(1, c.values.count(v => v != null && v.trim.nonEmpty))
      }
      assert(hasNumeric(r.getString(0)), s"${r.getString(0)} has no numeric attr")
      assert(hasNumeric(r.getString(1)), s"${r.getString(1)} has no numeric attr")
    }
  }

  test("single-evidence re-ranking produces valid dense ranks") {
    val byName = D3L.rankBySingleEvidence(ranking, Evidence.N)
    targets.foreach { t =>
      val rs = byName.filter(col("t_table") === t).select("rank")
        .collect().map(_.getInt(0)).sorted.toSeq
      assert(rs == (1 to rs.size))
    }
  }

  test("single-evidence rankings differ from the aggregate") {
    val byFormat = D3L.rankBySingleEvidence(ranking, Evidence.F)
      .select("t_table", "s_table", "rank").collect()
      .map(r => (r.getString(0), r.getString(1)) -> r.getInt(2)).toMap
    val agg = ranking.select("t_table", "s_table", "rank").collect()
      .map(r => (r.getString(0), r.getString(1)) -> r.getInt(2)).toMap
    assert(byFormat != agg)
  }

  test("queryTable on a lake member ≈ batched query for that member") {
    val t = lake.tables.head
    val single = D3L.queryTable(spark, idx, t, excludeId = Some(t.id))
    val got = single.ranking.filter(col("rank") <= 3).select("s_table")
      .collect().map(_.getString(0)).toSet
    assert(got.nonEmpty)
    // The top tables should be largely truly related, as in the batched run.
    val rel = got.count(lake.truth.related(t.id, _))
    assert(rel >= 1, s"top-3 of single-target query had no related table: $got")
  }

  test("evidence weights change the ranking") {
    val cfg = D3LConfig(evidenceWeights = Map("N" -> 5.0, "V" -> 0.01, "F" -> 0.01, "E" -> 0.01, "D" -> 0.01))
    val reweighted = D3L.queryAll(spark, idx, targets, cfg).ranking
      .select("t_table", "s_table", "rank").collect()
      .map(r => (r.getString(0), r.getString(1)) -> r.getInt(2)).toMap
    val base = ranking.select("t_table", "s_table", "rank").collect()
      .map(r => (r.getString(0), r.getString(1)) -> r.getInt(2)).toMap
    assert(reweighted != base)
  }
}
