package repro.baselines

import java.nio.file.Files
import repro.SparkSpec

class SyntheticKBSpec extends SparkSpec {

  private lazy val dbPath: String = {
    val dir = Files.createTempDirectory("kbspec")
    SyntheticKB.createDb(dir.resolve("kb.duckdb").toString)
  }

  test("entries are lower-case single words with unique keys") {
    val es = SyntheticKB.entries
    assert(es.nonEmpty)
    es.foreach { case (t, _) =>
      assert(t == t.toLowerCase)
      assert(!t.contains(" "))
    }
    assert(es.map(_._1).distinct.size == es.size)
  }

  test("entries cover the expected classes") {
    val classes = SyntheticKB.entries.map(_._2).toSet
    assert(classes.contains("City"))
    assert(classes.contains("Organization"))
    assert(classes.contains("StreetType"))
  }

  test("createDb produces a queryable DuckDB file") {
    val conn = java.sql.DriverManager.getConnection(s"jdbc:duckdb:$dbPath")
    try {
      val rs = conn.createStatement().executeQuery("SELECT count(*) FROM kb")
      rs.next()
      assert(rs.getLong(1) == SyntheticKB.entries.size)
    } finally conn.close()
  }

  test("mapTokens resolves known tokens to their classes") {
    import spark.implicits._
    val toks = Seq("manchester", "street", "ltd", "zzzunknown").toDF("token")
    val mapped = SyntheticKB.mapTokens(toks, dbPath).as[(String, String)].collect().toMap
    assert(mapped("manchester") == "City")
    assert(mapped("street") == "StreetType")
    assert(mapped("ltd") == "Organization")
    assert(!mapped.contains("zzzunknown"))
  }

  test("mapTokens deduplicates input tokens") {
    import spark.implicits._
    val toks = Seq("manchester", "manchester", "manchester").toDF("token")
    assert(SyntheticKB.mapTokens(toks, dbPath).count() == 1)
  }

  test("mapTokens on empty input is empty") {
    import spark.implicits._
    assert(SyntheticKB.mapTokens(Seq.empty[String].toDF("token"), dbPath).count() == 0)
  }

  test("city names from the vocabulary resolve to City") {
    import spark.implicits._
    val cities = repro.lake.Vocab.cities.take(10).map(_.toLowerCase).toDF("token")
    val mapped = SyntheticKB.mapTokens(cities, dbPath).collect()
    assert(mapped.length == 10)
    mapped.foreach(r => assert(r.getString(1) == "City"))
  }
}
