package repro.core

import repro.SparkSpec
import repro.lake.Generators

class SubjectAttributeSpec extends SparkSpec {

  private lazy val lake = Generators.smallerReal(nClusters = 6, tablesPerCluster = 10, poolSize = 100, seed = 21)

  test("feature vector has five components in [0,1]") {
    val f = SubjectAttribute.features(2, 5, 0.1, 0.9, 0.0, 12.0)
    assert(f.length == 5)
    f.foreach(x => assert(x >= 0.0 && x <= 1.0))
  }

  test("position is normalised by arity") {
    assert(SubjectAttribute.features(0, 5, 0, 0, 0, 0)(0) == 0.0)
    assert(SubjectAttribute.features(4, 5, 0, 0, 0, 0)(0) == 1.0)
    assert(SubjectAttribute.features(0, 1, 0, 0, 0, 0)(0) == 0.0)
  }

  test("score prefers leftmost distinct non-numeric columns") {
    val subject = SubjectAttribute.score(SubjectAttribute.features(0, 5, 0.0, 1.0, 0.0, 15.0))
    val numeric = SubjectAttribute.score(SubjectAttribute.features(3, 5, 0.0, 1.0, 1.0, 5.0))
    val sparse = SubjectAttribute.score(SubjectAttribute.features(1, 5, 0.8, 0.3, 0.0, 10.0))
    assert(subject > numeric)
    assert(subject > sparse)
  }

  test("hand-set heuristic weights are a reasonable fallback (≥75%)") {
    val acc = SubjectAttribute.tableAccuracy(lake.tables, model = None)
    assert(acc >= 0.75, s"heuristic accuracy=$acc")
  }

  test("pipeline's default supervised model reaches the paper's ballpark accuracy (≥85%)") {
    val acc = SubjectAttribute.tableAccuracy(lake.tables, Some(SubjectAttribute.defaultModel))
    assert(acc >= 0.85, s"default-model accuracy=$acc (paper: 0.89)")
  }

  test("supervised variant trained on held-out lakes also reaches ≥85%") {
    val trainLake = Generators.smallerReal(nClusters = 6, tablesPerCluster = 10, poolSize = 100, seed = 22)
    val model = SubjectAttribute.train(trainLake.tables)
    val acc = SubjectAttribute.tableAccuracy(lake.tables, Some(model))
    assert(acc >= 0.85, s"trained accuracy=$acc")
  }

  test("labelledExamples yields one positive per table") {
    val (xs, ys) = SubjectAttribute.labelledExamples(lake.tables.take(10))
    assert(ys.count(_ == 1) == 10)
    assert(xs.length == lake.tables.take(10).map(_.arity).sum)
  }

  test("predict returns exactly one subject per table") {
    val idx = FeatureExtraction.extract(spark, repro.lake.LakeDf.toLong(spark, lake.tables.take(8)))
    val per = idx.subjects.groupBy("table_id").count().collect()
    assert(per.length == 8)
    per.foreach(r => assert(r.getLong(1) == 1))
  }

  test("predict never selects an all-numeric column when text exists") {
    val idx = FeatureExtraction.extract(spark, repro.lake.LakeDf.toLong(spark, lake.tables.take(8)))
    val chosen = idx.subjects.collect().map(r => (r.getAs[String]("table_id"), r.getAs[Int]("col_idx")))
    chosen.foreach { case (tid, ci) =>
      val col = lake.table(tid).columns(ci)
      val numFrac = col.values.count(v => repro.text.Tokenizer.isNumericValue(v)).toDouble /
        math.max(1, col.values.count(_ != null))
      assert(numFrac < 0.8, s"$tid#$ci looks numeric")
    }
  }
}
