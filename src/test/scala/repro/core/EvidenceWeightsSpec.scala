package repro.core

import repro.SparkSpec
import repro.lake.{Generators, LakeDf}

class EvidenceWeightsSpec extends SparkSpec {

  private lazy val lake = Generators.synthetic(nBases = 6, derivedPerBase = 6, baseRows = 80, seed = 51)
  private lazy val idx = D3L.index(spark, LakeDf.toLong(spark, lake.tables))
  private lazy val targetIds = lake.tables.map(_.id).take(6)

  test("buildExamples yields balanced, labelled feature vectors") {
    val (xs, ys) = EvidenceWeights.buildExamples(spark, idx, lake, targetIds)
    assert(xs.nonEmpty)
    assert(xs.forall(_.length == 5))
    assert(ys.toSet.subsetOf(Set(0, 1)))
    assert(ys.contains(1), "expected positive examples")
    assert(ys.contains(0), "expected negative examples")
    // negatives capped at 3× positives (+ rounding slack)
    val pos = ys.count(_ == 1); val neg = ys.count(_ == 0)
    assert(neg <= math.max(8, pos * 3))
  }

  test("trained weights are positive and normalised to mean 1") {
    val trained = EvidenceWeights.train(spark, idx, lake, targetIds)
    assert(trained.weights.keySet == Evidence.all.toSet)
    trained.weights.values.foreach(w => assert(w >= 0.0))
    assert(math.abs(trained.weights.values.sum - 5.0) < 1e-6)
  }

  test("classifier separates related from unrelated (accuracy ≥ 0.7, paper: 0.89)") {
    val trained = EvidenceWeights.train(spark, idx, lake, targetIds)
    assert(trained.trainAccuracy >= 0.7, s"accuracy=${trained.trainAccuracy}")
  }

  test("trained weights are usable in a query and keep ranking valid") {
    val trained = EvidenceWeights.train(spark, idx, lake, targetIds)
    val cfg = D3LConfig(evidenceWeights = trained.weights)
    val ranking = D3L.queryAll(spark, idx, targetIds.take(2), cfg).ranking
    import org.apache.spark.sql.functions._
    assert(ranking.filter(col("rank") === 1).count() == 2)
  }
}
