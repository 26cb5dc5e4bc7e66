package repro.lake

import scala.util.Random
import Domains.ClusterSpec

/** Generators for the three repositories of §V (DESIGN.md §2, "Data lakes").
  *
  * All generation is deterministic in the seed. Per-table format renderers,
  * column-name synonyms, typos and nulls model real-publisher dirtiness;
  * the Synthetic lake uses canonical names/formats only (clean), mirroring
  * the paper's observation that the TUS benchmark is consistent and clean.
  */
object Generators {

  /** Entity = domainKey → canonical value; one entity row per real-world
    * object, shared (with overlap) by the tables of a cluster so that
    * value-overlap and SA-join evidence exist by construction.
    */
  private def entityPool(spec: ClusterSpec, n: Int, rnd: Random): Vector[Map[String, String]] =
    Vector.fill(n) {
      val m = Map.newBuilder[String, String]
      m += spec.subject.key -> spec.subject.gen(rnd)
      spec.props.foreach(p => m += p.key -> p.gen(rnd))
      m.result()
    }

  /** Generate the tables of one topical cluster.
    *
    * @param clusterId   ground-truth cluster label (scopes domain keys)
    * @param dirty       real lakes pick name synonyms/format variants/typos;
    *                    clean lakes always render canonically
    */
  private def clusterTables(spec: ClusterSpec, clusterId: String, nTables: Int,
                            poolSize: Int, dirty: Boolean, rnd: Random,
                            idPrefix: String): Vector[LakeTable] = {
    val pool = entityPool(spec, poolSize, rnd)
    Vector.tabulate(nTables) { t =>
      val nRows = 40 + rnd.nextInt(60)
      val entities = rnd.shuffle(pool).take(nRows)
      val nProps = 3 + rnd.nextInt(math.min(5, spec.props.size - 2))
      val props = rnd.shuffle(spec.props).take(nProps)
      // Subject column first with p=0.8, else at a random position.
      val subjPos = if (rnd.nextDouble() < 0.8) 0 else rnd.nextInt(nProps + 1)
      val specs = {
        val ps = props.toBuffer
        ps.insert(subjPos, spec.subject)
        ps.toVector
      }
      val cols = specs.map { d =>
        val name = if (dirty) d.names(rnd.nextInt(d.names.size)) else d.names.head
        val render = if (dirty) d.renderers(rnd.nextInt(d.renderers.size)) else d.renderers.head
        val typoP = if (dirty) 0.04 else 0.0
        val isSubject = d eq spec.subject
        // Subject attributes have few nulls (the Venetis signal); others more.
        val nullP = if (!dirty) 0.0 else if (isSubject) 0.005 else 0.04
        val values = entities.map { e =>
          if (rnd.nextDouble() < nullP) null
          else Dirt.typo(rnd, typoP)(render(e(d.key)))
        }
        LakeColumn(name, values, s"$clusterId.${d.key}", isSubject)
      }
      LakeTable(s"$idPrefix${clusterId}_t$t", clusterId, cols)
    }
  }

  private def truthFromClusters(tables: Seq[LakeTable]): GroundTruth = {
    val byCluster = tables.groupBy(_.cluster)
    val related = tables.map { t =>
      t.id -> (byCluster(t.cluster).map(_.id).toSet - t.id)
    }.toMap
    val attrDomain = tables.flatMap { t =>
      t.columns.zipWithIndex.map { case (c, i) => (t.id, i) -> c.domainKey }
    }.toMap
    GroundTruth(related, attrDomain)
  }

  // -------------------------------------------------------------------------

  /** SmallerRealLite: ~`nClusters·tablesPerCluster` dirty tables over real-
    * world-style topical clusters (paper: ~700 UK open-government tables).
    * Ground truth: related ⇔ same cluster; attribute domains cluster-scoped
    * (generic domains like city recur across clusters in the *data* but not
    * in the truth — the human-topical-judgment reading of Definition 1,
    * DESIGN.md §2).
    */
  def smallerReal(nClusters: Int = 8, tablesPerCluster: Int = 15,
                  poolSize: Int = 150, seed: Long = 7): Lake = {
    require(nClusters <= Domains.clusters.size, s"at most ${Domains.clusters.size} clusters")
    val rnd = new Random(seed)
    val tables = Domains.clusters.take(nClusters).flatMap { spec =>
      clusterTables(spec, spec.name, tablesPerCluster, poolSize, dirty = true, rnd, "sr_")
    }
    Lake("smaller_real", tables, truthFromClusters(tables))
  }

  /** Per-base locality for the Synthetic benchmark: the paper's 32 bases
    * are *distinct* open-data tables, so two bases rarely share value
    * domains wholesale. Our bases cycle 8 cluster specs, which without this
    * would make same-spec bases near-identical on generic columns (same 46
    * cities, same Gaussian parameters) and cap every system's precision far
    * below the paper's. Each base therefore draws its low-cardinality
    * categorical domains from a small base-specific subset (geographic/
    * topical locality) and jitters its numeric distributions.
    */
  private def baseLocalise(spec: ClusterSpec, rnd: Random): Map[String, String] => Map[String, String] = {
    import Vocab._
    def sub[T](xs: IndexedSeq[T], n: Int): IndexedSeq[T] = rnd.shuffle(xs).take(n)
    val cityPool = sub(cities, 5)
    val countyPool = sub(counties, 3)
    val sectorPool = sub(sectors, 3)
    val catPool = sub(crimeCategories, 3)
    val opPool = sub(operators, 3)
    val yearBase = 2000 + rnd.nextInt(20)
    val numScale: Map[String, Double] =
      spec.props.filter(_.numeric).map(p => p.key -> (0.4 + rnd.nextDouble() * 2.0)).toMap
    def pick(xs: IndexedSeq[String]) = xs(rnd.nextInt(xs.size))
    e => e.map { case (k, v) =>
      k -> (k match {
        case "city"           => pick(cityPool)
        case "county"         => pick(countyPool)
        case "sector"         => pick(sectorPool)
        case "crime_category" => pick(catPool)
        case "operator"       => pick(opPool)
        case "year"           => (yearBase + rnd.nextInt(4)).toString
        case key if numScale.contains(key) =>
          repro.text.Tokenizer.parseNumeric(v) match {
            case Some(d) =>
              val scaled = d * numScale(key)
              if (v.contains('.')) f"$scaled%.2f" else math.round(scaled).toString
            case None => v
          }
        case _ => v
      })
    }
  }

  /** SyntheticLite: clean base tables + random projections/selections — the
    * TUS-benchmark recipe (paper: ~5,000 tables from 32 bases). Related ⇔
    * same base AND ≥1 shared base column; attribute domains base-scoped.
    */
  def synthetic(nBases: Int = 24, derivedPerBase: Int = 16,
                baseRows: Int = 150, seed: Long = 11): Lake = {
    val rnd = new Random(seed)
    val bases = Vector.tabulate(nBases) { b =>
      val spec = Domains.clusters(b % Domains.clusters.size)
      val localise = baseLocalise(spec, rnd)
      val pool = entityPool(spec, baseRows, rnd).map(localise)
      val nProps = math.min(spec.props.size, 5 + rnd.nextInt(3))
      val props = rnd.shuffle(spec.props).take(nProps)
      val specs = spec.subject +: props
      val cols = specs.map { d =>
        val values = pool.map(e => e(d.key))
        // Each base fixes one column-name synonym (distinct source tables
        // name their columns differently; derived tables inherit the name).
        // Indexed by b/|specs| so same-spec bases pick different synonyms.
        val name = d.names((b / Domains.clusters.size) % d.names.size)
        LakeColumn(name, values, s"b$b.${d.key}", d eq spec.subject)
      }
      LakeTable(s"syn_b$b", s"b$b", cols)
    }
    val derived = bases.flatMap { base =>
      Vector.tabulate(derivedPerBase) { d =>
        // Random projection: keep each column with p=0.6, at least two, and
        // random selection: keep each row with p in [0.3, 0.8].
        val keepCols = {
          val ks = base.columns.indices.filter(_ => rnd.nextDouble() < 0.6)
          if (ks.size >= 2) ks else rnd.shuffle(base.columns.indices.toList).take(2).sorted
        }
        val keepP = 0.3 + rnd.nextDouble() * 0.5
        val keepRows = (0 until base.numRows).filter(_ => rnd.nextDouble() < keepP)
        val rows = if (keepRows.size >= 5) keepRows else (0 until math.min(5, base.numRows))
        val cols = keepCols.map { ci =>
          val c = base.columns(ci)
          c.copy(values = rows.map(c.values).toVector)
        }.toVector
        LakeTable(s"${base.id}_d$d", base.cluster, cols)
      }
    }
    // Related ⇔ same base sharing ≥1 base column (domain keys are base-scoped
    // so sharing a domain key ⇒ same base).
    val byBase = derived.groupBy(_.cluster)
    val related = derived.map { t =>
      val doms = t.columns.map(_.domainKey).toSet
      t.id -> (byBase(t.cluster).filter { s =>
        s.id != t.id && s.columns.exists(c => doms.contains(c.domainKey))
      }.map(_.id).toSet)
    }.toMap
    val attrDomain = derived.flatMap { t =>
      t.columns.zipWithIndex.map { case (c, i) => (t.id, i) -> c.domainKey }
    }.toMap
    Lake("synthetic", derived, GroundTruth(related, attrDomain))
  }

  /** LargerRealLite: `nTables` dirty tables over replicated cluster specs
    * with fresh entity pools — efficiency experiments only (paper: ~43,000
    * NHS tables). No ground truth is consulted.
    */
  def scaling(nTables: Int, seed: Long = 13): Lake = {
    val rnd = new Random(seed)
    val perCluster = 12
    val nClusters = math.max(1, (nTables + perCluster - 1) / perCluster)
    val tables = (0 until nClusters).flatMap { c =>
      val spec = Domains.clusters(c % Domains.clusters.size)
      val want = math.min(perCluster, nTables - c * perCluster)
      clusterTables(spec, s"c$c", want, poolSize = 120, dirty = true, rnd, "lg_")
    }.toVector.take(nTables)
    Lake(s"scaling_$nTables", tables, truthFromClusters(tables))
  }
}
