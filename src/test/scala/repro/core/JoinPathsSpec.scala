package repro.core

import repro.SparkSpec
import repro.lake.{Generators, LakeDf}

class JoinPathsSpec extends SparkSpec {

  private lazy val lake = Generators.smallerReal(nClusters = 2, tablesPerCluster = 6, poolSize = 60, seed = 41)
  private lazy val idx = D3L.index(spark, LakeDf.toLong(spark, lake.tables))
  private lazy val graph = JoinPaths.buildGraph(spark, idx)

  test("SA-join graph connects tables that share subject entities") {
    // Tables of one cluster sample from one entity pool → subject-attribute
    // token overlap → edges must exist within clusters.
    assert(graph.edgeCount > 0, "expected at least one SA-join edge")
  }

  test("SA-join edges are symmetric") {
    graph.neighbours.foreach { case (t, ns) =>
      ns.foreach(n => assert(graph.adjacent(n).contains(t), s"$t→$n not symmetric"))
    }
  }

  test("no self-loops") {
    graph.neighbours.foreach { case (t, ns) => assert(!ns.contains(t)) }
  }

  test("edges mostly stay within clusters") {
    // Cross-cluster SA edges are legitimate (an area-name subject genuinely
    // joins city columns elsewhere), but same-pool subject overlap must
    // still dominate.
    val all = graph.neighbours.toSeq.flatMap { case (t, ns) => ns.map(t -> _) }
    val within = all.count { case (a, b) => lake.table(a).cluster == lake.table(b).cluster }
    assert(within >= all.size * 0.55, s"$within/${all.size} edges within clusters")
  }

  // ---- Algorithm 3 on a hand-built graph -----------------------------------

  private val g = JoinPaths.SaJoinGraph(Map(
    "s1" -> Set("x1", "x2"),
    "x1" -> Set("s1", "x3"),
    "x2" -> Set("s1"),
    "x3" -> Set("x1"),
    "s2" -> Set("x9"),
    "x9" -> Set("s2"),
  ))

  test("findJoinPaths enumerates simple paths from the start node") {
    val paths = JoinPaths.findJoinPaths(g, topK = Set("s1"),
      relatedToTarget = Set("x1", "x2", "x3"), start = "s1")
    assert(paths.contains(List("s1", "x1")))
    assert(paths.contains(List("s1", "x2")))
    assert(paths.contains(List("s1", "x1", "x3")))
  }

  test("paths never revisit nodes (acyclic)") {
    val paths = JoinPaths.findJoinPaths(g, Set("s1"), Set("x1", "x2", "x3"), "s1")
    paths.foreach(p => assert(p.distinct == p))
  }

  test("paths never pass through other top-k tables") {
    val paths = JoinPaths.findJoinPaths(g, topK = Set("s1", "x1"),
      relatedToTarget = Set("x1", "x2", "x3"), start = "s1")
    assert(!paths.exists(_.tail.contains("x1")))
    assert(paths.contains(List("s1", "x2")))
  }

  test("paths require index evidence of target relatedness") {
    val paths = JoinPaths.findJoinPaths(g, Set("s1"), relatedToTarget = Set("x2"), "s1")
    assert(paths == Set(List("s1", "x2")))
  }

  test("maxLen caps path length") {
    val paths = JoinPaths.findJoinPaths(g, Set("s1"), Set("x1", "x2", "x3"), "s1", maxLen = 2)
    assert(paths.forall(_.size <= 2))
    assert(!paths.contains(List("s1", "x1", "x3")))
  }

  test("reachable returns path members minus the start") {
    val r = JoinPaths.reachable(g, Set("s1"), Set("x1", "x2", "x3"), "s1")
    assert(r == Set("x1", "x2", "x3"))
  }

  test("disconnected start yields no paths") {
    assert(JoinPaths.findJoinPaths(g, Set("s2"), Set("x1"), "s2").isEmpty)
    assert(JoinPaths.reachable(g, Set("s2"), Set("x1"), "s2").isEmpty)
  }

  test("graph lookup of unknown table is empty") {
    assert(graph.adjacent("nonexistent").isEmpty)
  }
}
