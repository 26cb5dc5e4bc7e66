package repro.bench

import org.apache.spark.sql.DataFrame
import repro.SparkSpec
import repro.eval.Harness
import repro.lake.Generators

/** Lazily-built shared fixtures for the bench suites: each lake is generated
  * and indexed once per JVM (Test/parallelExecution := false keeps one JVM
  * for the whole bench run), and each system's batched query runs once.
  *
  * Scaled-down stand-ins for the paper's repositories (DESIGN.md §2):
  *   Synthetic    ~5,000 tables → 384 (24 bases × 16 derived, clean)
  *   Smaller Real ~700 tables   → 120 (8 clusters × 15, dirty)
  * k sweeps scale accordingly: the paper's average answer sizes are 260/110,
  * ours ≈ 14/14, so ks span 2…40 (≈0.15×…2.9× the average answer size,
  * matching the paper's 5…350 / 10…110 relative ranges).
  */
object BenchFixtures {

  lazy val spark = SparkSpec.shared

  val ks: Seq[Int] = Seq(2, 5, 10, 15, 20, 25, 30, 40)

  lazy val synthetic: Harness.Fixture =
    Harness.build(spark, Generators.synthetic(), nTargets = 20, seed = 101)

  lazy val smallerReal: Harness.Fixture =
    Harness.build(spark, Generators.smallerReal(), nTargets = 20, seed = 102)

  /** Eq. 3 weights trained on the Synthetic fixture (as in the paper, which
    * trains on the TUS benchmark and evaluates everywhere).
    */
  lazy val trained = Harness.trainWeights(spark, synthetic)
  lazy val weights: Map[String, Double] = trained.weights

  lazy val synD3l: (Harness.SystemRun, DataFrame) = Harness.runD3L(spark, synthetic, Some(weights))
  lazy val synTus: Harness.SystemRun = Harness.runTus(spark, synthetic)
  lazy val synAurum: Harness.SystemRun = Harness.runAurum(spark, synthetic)

  lazy val srD3l: (Harness.SystemRun, DataFrame) = Harness.runD3L(spark, smallerReal, Some(weights))
  lazy val srTus: Harness.SystemRun = Harness.runTus(spark, smallerReal)
  lazy val srAurum: Harness.SystemRun = Harness.runAurum(spark, smallerReal)

  def banner(title: String): Unit =
    println(s"\n==== $title ====")
}
