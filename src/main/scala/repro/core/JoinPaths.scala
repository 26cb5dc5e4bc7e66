package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.lsh.MinHash

/** §IV — extending relatedness through SA-join paths.
  *
  * Two tables are SA-joinable when the 𝕍 index gives evidence that the tsets
  * of two of their attributes overlap and at least one of those attributes is
  * its table's (predicted) subject attribute. The overlap coefficient is
  * estimated from the signature Jaccard Ĵ and the tset sizes via the paper's
  * inclusion–exclusion bound  ov ≥ Ĵ·(|A|+|B|) / ((1+Ĵ)·min(|A|,|B|)).
  *
  * Algorithm 3 then enumerates, per top-k table S_i, all acyclic paths whose
  * non-start nodes are outside the top-k and have index evidence of
  * relatedness to the target.
  */
object JoinPaths {

  /** Undirected SA-join graph over the lake as an adjacency map. */
  final case class SaJoinGraph(neighbours: Map[String, Set[String]]) {
    def adjacent(t: String): Set[String] = neighbours.getOrElse(t, Set.empty)
    def edgeCount: Int = neighbours.valuesIterator.map(_.size).sum / 2
  }

  private val jaccardUdf = udf((a: Seq[Long], b: Seq[Long]) =>
    MinHash.estimateJaccard(a.toArray, b.toArray))

  /** Build the SA-join graph from the lake's 𝕍 index (one-off per lake). */
  def buildGraph(spark: SparkSession, idx: LakeIndexes, cfg: D3LConfig = D3LConfig()): SaJoinGraph = {
    import spark.implicits._
    val vBuckets = idx.buckets.filter($"evidence" === Evidence.V)
    val subjAttrs = idx.subjects.select($"attr").withColumn("is_subj", lit(true))

    // Collisions where the left side is a subject attribute; the right side
    // may be any attribute ("at least one of a or a' is a subject attribute").
    val left = vBuckets.join(subjAttrs, "attr")
      .select($"band", $"bucket", $"attr" as "a_attr", $"table_id" as "a_table")
    val right = vBuckets
      .select($"band", $"bucket", $"attr" as "b_attr", $"table_id" as "b_table")
    val collided = left.join(right, Seq("band", "bucket"))
      .filter($"a_table" =!= $"b_table")
      .select("a_attr", "a_table", "b_attr", "b_table")
      .distinct()

    val sig = idx.signatures.filter($"evidence" === Evidence.V)
    val sizes = idx.catalog.select($"attr", $"tset_size")
    val edges = collided
      .join(sig.select($"attr" as "a_attr", $"sig" as "a_sig"), "a_attr")
      .join(sig.select($"attr" as "b_attr", $"sig" as "b_sig"), "b_attr")
      .join(sizes.select($"attr" as "a_attr", $"tset_size" as "a_size"), "a_attr")
      .join(sizes.select($"attr" as "b_attr", $"tset_size" as "b_size"), "b_attr")
      .withColumn("jac", jaccardUdf($"a_sig", $"b_sig"))
      .withColumn("ov",
        $"jac" * ($"a_size" + $"b_size") / ((lit(1.0) + $"jac") * least($"a_size", $"b_size")))
      .filter($"ov" >= cfg.minJoinOverlap && $"jac" > 0.0)
      .select("a_table", "b_table")
      .distinct()
      .as[(String, String)]
      .collect()

    val adj = scala.collection.mutable.Map.empty[String, Set[String]].withDefaultValue(Set.empty)
    edges.foreach { case (a, b) =>
      adj(a) = adj(a) + b
      adj(b) = adj(b) + a
    }
    SaJoinGraph(adj.toMap)
  }

  /** Algorithm 3, called for one start table S_i ∈ S^k: all simple paths of
    * length ≥ 2 whose non-start nodes are outside `topK`, acyclic, and in
    * `relatedToTarget` (≥1 index relates them to T). Returns paths as node
    * lists starting at `start`.
    */
  def findJoinPaths(graph: SaJoinGraph, topK: Set[String], relatedToTarget: Set[String],
                    start: String, maxLen: Int = 4): Set[List[String]] = {
    val out = scala.collection.mutable.Set.empty[List[String]]
    def dfs(node: String, path: List[String]): Unit = {
      val newPath = path :+ node
      if (newPath.size > 1) out += newPath
      if (newPath.size >= maxLen) return
      graph.adjacent(node).toSeq.sorted.foreach { n =>
        if (!topK.contains(n) && !newPath.contains(n) && relatedToTarget.contains(n))
          dfs(n, newPath)
      }
    }
    dfs(start, Nil)
    out.toSet
  }

  /** All tables reachable from `start` through valid join paths (the tables
    * whose attributes the join result can contribute), excluding `start`.
    *
    * Computed by guarded BFS rather than by materialising Algorithm 3's path
    * set: every BFS tree path is a valid simple path under the same node
    * constraints, so the reachable set is identical, but the cost is
    * O(V+E) — enumerating all simple paths in the dense cliques that
    * same-base derived tables form is combinatorial and only needed when a
    * caller wants the concrete join plans (findJoinPaths).
    */
  def reachable(graph: SaJoinGraph, topK: Set[String], relatedToTarget: Set[String],
                start: String, maxLen: Int = 4): Set[String] = {
    val visited = scala.collection.mutable.Set(start)
    var frontier = List(start)
    var depth = 1
    while (frontier.nonEmpty && depth < maxLen) {
      frontier = frontier.flatMap { node =>
        graph.adjacent(node).toSeq.filter { n =>
          !visited.contains(n) && !topK.contains(n) && relatedToTarget.contains(n) &&
            { visited += n; true }
        }
      }
      depth += 1
    }
    visited.toSet - start
  }
}
