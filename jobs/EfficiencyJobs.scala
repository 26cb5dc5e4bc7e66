package repro.jobs

import repro.eval.{Experiments, Harness}

/** Experiment 4 (Fig. 6a): indexing time vs lake size. */
object Exp4Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSupport.session("exp4-indexing-time")
    val sizes = if (args.nonEmpty) args.map(_.toInt).toSeq else Seq(100, 200, 300, 400, 500)
    Experiments.indexingTimes(spark, sizes, Harness.kbPath)
      .foreach(r => println(f"${r.system}%-8s ${r.x}%7d ${r.seconds}%9.2f"))
    spark.stop()
  }
}

/** Experiment 5 (Fig. 6b): search time vs k on Synthetic. */
object Exp5Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSupport.session("exp5-search-time-synthetic")
    val (syn, _, _) = JobSupport.fixtures(spark)
    val (rows, aurumConst) = Experiments.searchTimes(spark, syn, Seq(5, 15, 30), nTargets = 3)
    rows.foreach(r => println(f"${r.system}%-8s ${r.x}%5d ${r.seconds}%9.3f"))
    println(f"aurum constant: $aurumConst%.6f s")
    spark.stop()
  }
}

/** Experiment 6 (Fig. 6c): search time vs k on Smaller Real. */
object Exp6Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSupport.session("exp6-search-time-smaller-real")
    val (_, sr, _) = JobSupport.fixtures(spark)
    val (rows, aurumConst) = Experiments.searchTimes(spark, sr, Seq(5, 15, 30), nTargets = 3)
    rows.foreach(r => println(f"${r.system}%-8s ${r.x}%5d ${r.seconds}%9.3f"))
    println(f"aurum constant: $aurumConst%.6f s")
    spark.stop()
  }
}

/** Experiment 7 / Table II: index space overhead. */
object TableIIJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSupport.session("table2-space-overhead")
    val (syn, sr, _) = JobSupport.fixtures(spark)
    val dir = java.nio.file.Files.createTempDirectory("space").toString
    val rows = Experiments.spaceOverhead(spark, syn, dir) ++ Experiments.spaceOverhead(spark, sr, dir)
    rows.foreach(r => println(f"${r.system}%-8s ${r.repo}%-14s ${r.overheadPct}%8.1f%%"))
    spark.stop()
  }
}
