package repro.core

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.lake.{LakeColumn, LakeDf, LakeTable}

class FeatureExtractionSpec extends SparkSpec {

  /** Tiny hand-built lake exercising every evidence type. */
  private def tinyTables: Seq[LakeTable] = Seq(
    LakeTable("t1", "c1", Vector(
      LakeColumn("Practice", Vector("Dr E Cullen", "Blackfriars", "Radclife Care"), "c1.practice", isSubject = true),
      LakeColumn("Address", Vector("18 Portland Street, M1 3BE", "41 Oxford Road, M13 9PL", "9 Mirabel Street, M3 1NN"), "c1.addr", isSubject = false),
      LakeColumn("Patients", Vector("1202", "3572", "980"), "c1.patients", isSubject = false),
    )),
    LakeTable("t2", "c1", Vector(
      LakeColumn("Practice Name", Vector("Blackfriars", "The London Clinic", "Radclife Care"), "c1.practice", isSubject = true),
      LakeColumn("Payment", Vector("73648", "15520", "22100"), "c1.payment", isSubject = false),
    )),
  )

  private lazy val idx = FeatureExtraction.extract(spark, LakeDf.toLong(spark, tinyTables))

  test("catalog has one row per attribute") {
    assert(idx.catalog.count() == 5)
  }

  test("catalog marks numeric attributes") {
    val numeric = idx.catalog.filter(col("is_numeric")).select("attr")
      .collect().map(_.getString(0)).toSet
    assert(numeric == Set("t1#2", "t2#1"))
  }

  test("oracle: catalog value counts match DuckDB") {
    val long = LakeDf.toLong(spark, tinyTables)
    val df = idx.catalog.select(col("attr"), col("n_values"))
    Oracle.assertEquivalent(
      df,
      """SELECT table_id || '#' || col_idx AS attr,
        |       count(*) FILTER (WHERE value IS NOT NULL AND trim(value) <> '') AS n_values
        |FROM lake GROUP BY table_id, col_idx""".stripMargin,
      "lake" -> long)
  }

  test("catalog null fraction is zero for fully populated columns") {
    val nf = idx.catalog.select("attr", "null_frac").collect()
      .map(r => r.getString(0) -> r.getDouble(1)).toMap
    assert(nf.values.forall(_ == 0.0))
  }

  test("signatures exist for N on every attribute") {
    val n = idx.signatures.filter(col("evidence") === "N").count()
    assert(n == 5)
  }

  test("signatures for V/E exist only for textual attributes") {
    val v = idx.signatures.filter(col("evidence") === "V").select("attr")
      .collect().map(_.getString(0)).toSet
    assert(v == Set("t1#0", "t1#1", "t2#0"))
    val e = idx.signatures.filter(col("evidence") === "E").select("attr")
      .collect().map(_.getString(0)).toSet
    assert(e == Set("t1#0", "t1#1", "t2#0"))
  }

  test("signatures for F exist for every attribute (numerics included)") {
    val f = idx.signatures.filter(col("evidence") === "F").count()
    assert(f == 5)
  }

  test("numeric profiles are sorted samples of the numeric extents") {
    val rows = idx.numericProfiles.collect()
    assert(rows.map(_.getAs[String]("attr")).toSet == Set("t1#2", "t2#1"))
    rows.foreach { r =>
      val s = r.getAs[scala.collection.Seq[Double]]("sample")
      assert(s.toSeq == s.toSeq.sorted)
      assert(s.nonEmpty)
    }
  }

  test("t1 numeric profile contains the parsed values") {
    val s = idx.numericProfiles.filter(col("attr") === "t1#2")
      .select("sample").collect()(0).getAs[scala.collection.Seq[Double]](0)
    assert(s.toSeq == Seq(980.0, 1202.0, 3572.0))
  }

  test("buckets reference only attributes with signatures") {
    val bAttrs = idx.buckets.select("attr").distinct().collect().map(_.getString(0)).toSet
    val sAttrs = idx.signatures.select("attr").distinct().collect().map(_.getString(0)).toSet
    assert(bAttrs.subsetOf(sAttrs))
  }

  test("minhash evidences have 60 buckets per attribute, simhash 48") {
    val counts = idx.buckets.groupBy("evidence", "attr").count()
      .collect().map(r => (r.getString(0), r.getLong(2))).toSet
    counts.foreach {
      case ("E", n) => assert(n == 48, s"E had $n")
      case (_, n)   => assert(n == 60, s"had $n")
    }
  }

  test("similar attribute names produce similar N signatures") {
    import repro.lsh.MinHash
    val sigs = idx.signatures.filter(col("evidence") === "N")
      .select("attr", "sig").collect()
      .map(r => r.getString(0) -> r.getAs[scala.collection.Seq[Long]](1).toArray).toMap
    val sim = MinHash.estimateJaccard(sigs("t1#0"), sigs("t2#0")) // Practice vs Practice Name
    val dis = MinHash.estimateJaccard(sigs("t1#0"), sigs("t1#1")) // Practice vs Address
    assert(sim > dis)
    assert(sim > 0.3, s"sim=$sim")
  }

  test("overlapping extents produce similar V signatures") {
    import repro.lsh.MinHash
    val sigs = idx.signatures.filter(col("evidence") === "V")
      .select("attr", "sig").collect()
      .map(r => r.getString(0) -> r.getAs[scala.collection.Seq[Long]](1).toArray).toMap
    // t1#0 and t2#0 share "Blackfriars" and "Radclife Care".
    val sim = MinHash.estimateJaccard(sigs("t1#0"), sigs("t2#0"))
    val dis = MinHash.estimateJaccard(sigs("t1#0"), sigs("t1#1"))
    assert(sim > dis, s"sim=$sim dis=$dis")
  }

  test("tset excludes per-part frequent words but keeps rare ones") {
    // In t1's Address column, 'street' appears twice (frequent within parts
    // containing it) while 'portland' is unique — the tset keeps 'portland'.
    val long = LakeDf.toLong(spark, tinyTables)
    val toks = long.filter(col("table_id") === "t1" && col("col_idx") === 1)
    // Reconstruct via public API: the V signature must differ from a
    // signature over ALL tokens (frequent ones dropped).
    import repro.lsh.MinHash
    import repro.text.Tokenizer
    val allTokens = tinyTables.head.columns(1).values.flatMap(Tokenizer.tokens)
    val vSig = idx.signatures.filter(col("attr") === "t1#1" && col("evidence") === "V")
      .select("sig").collect()(0).getAs[scala.collection.Seq[Long]](0).toArray
    val allSig = MinHash.signature(allTokens)
    assert(MinHash.estimateJaccard(vSig, allSig) < 1.0)
  }

  test("token embeddings exist for corpus tokens") {
    val toks = idx.tokenEmbeddings.select("token").collect().map(_.getString(0)).toSet
    assert(toks.contains("blackfriars"))
    assert(toks.contains("portland"))
  }

  test("embedding vectors have the configured dimension") {
    val v = idx.tokenEmbeddings.limit(1).select("vec").collect()(0).getAs[scala.collection.Seq[Float]](0)
    assert(v.size == repro.text.Embeddings.Dim)
  }

  test("subjects are predicted for both tables") {
    val subj = idx.subjects.collect().map(r => r.getAs[String]("table_id") -> r.getAs[Int]("col_idx")).toMap
    assert(subj == Map("t1" -> 0, "t2" -> 0))
  }

  test("reuseEmbeddings skips retraining and uses the provided model") {
    val single = LakeDf.toLong(spark, tinyTables.take(1))
    val idx2 = FeatureExtraction.extract(spark, single, reuseEmbeddings = Some(idx.tokenEmbeddings))
    assert(idx2.tokenEmbeddings eq idx.tokenEmbeddings)
    assert(idx2.signatures.filter(col("evidence") === "E").count() > 0)
  }

  test("empty-valued columns stay out of the value indexes") {
    val t = Seq(LakeTable("e1", "c", Vector(
      LakeColumn("Empty", Vector(null, null, ""), "c.e", isSubject = false),
      LakeColumn("Full", Vector("a b", "c d", "e f"), "c.f", isSubject = true))))
    val i2 = FeatureExtraction.extract(spark, LakeDf.toLong(spark, t))
    val vAttrs = i2.buckets.filter(col("evidence") === "V").select("attr")
      .distinct().collect().map(_.getString(0)).toSet
    assert(!vAttrs.contains("e1#0"))
  }
}
