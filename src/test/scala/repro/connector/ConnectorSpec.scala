package repro.connector

import repro.SparkSpec
import repro.core.{LocalResult, PolyFrame}
import repro.wisconsin.WisconsinData

/** Connector contract: initialize / preProcess / execute / postProcess,
  * plus backend-specific metadata behaviour.
  */
class ConnectorSpec extends SparkSpec {

  private lazy val data = WisconsinData.generate(spark, 500).cache()

  test("SparkSqlConnector registers temp views and executes SQL") {
    val c = new SparkSqlConnector(spark)
    c.initialize("Bench", "conn_t1", data)
    val r = c.execute("SELECT COUNT(*) AS count FROM conn_t1", "conn_t1")
    assert(r.scalarLong == 500L)
  }

  test("DuckDbConnector creates namespace schemas and loads typed tables") {
    val c = new DuckDbConnector()
    try {
      c.initialize("Ns1", "t1", data)
      assert(c.execute("SELECT COUNT(*) AS c FROM Ns1.t1", "t1").scalarLong == 500L)
      // typed, not varchar: numeric aggregation works without casts
      assert(c.execute("SELECT MAX(unique1) AS m FROM Ns1.t1", "t1").scalarLong == 499L)
      // nulls survive the load
      assert(c.execute("SELECT COUNT(*) AS c FROM Ns1.t1 WHERE tenPercent IS NULL", "t1").scalarLong == 50L)
    } finally c.close()
  }

  test("DuckDbConnector honors the threads setting") {
    val c = new DuckDbConnector(threads = 2)
    try {
      val r = c.execute("SELECT current_setting('threads') AS t", "x")
      assert(r.scalar.toString == "2")
    } finally c.close()
  }

  test("MongoConnector preProcess wraps stages into a pipeline array") {
    val c = new MongoConnector(spark)
    assert(c.preProcess("""{ "$match": {} }, { "$limit": 5 }""", "t")
      == """[ { "$match": {} }, { "$limit": 5 } ]""")
  }

  test("MongoConnector executes a wrapped pipeline") {
    val c = new MongoConnector(spark)
    c.initialize("Bench", "m1", data)
    val r = c.run("""{ "$match": {} }, { "$count": "count" }""", "m1")
    assert(r.scalarLong == 500L)
  }

  test("MongoConnector postProcess strips a leaked _id column") {
    val c = new MongoConnector(spark)
    val r = c.postProcess(LocalResult(Seq("a", "_id", "b"), Seq(Seq(1L, 99L, 2L))))
    assert(r.columns == Seq("a", "b"))
    assert(r.rows == Seq(Seq(1L, 2L)))
  }

  test("CypherConnector maintains a count metadata store (Neo4j fast path)") {
    val c = new CypherConnector(spark)
    c.initialize("Bench", "cy1", data)
    assert(c.countMetadata("cy1").contains(500L))
    assert(c.countMetadata("nope").isEmpty)
  }

  test("count() uses metadata only for untransformed base frames") {
    val c = new CypherConnector(spark)
    c.initialize("Bench", "cy2", data)
    val base = PolyFrame(c, "Bench", "cy2", WisconsinData.columns)
    assert(base.isBase)
    assert(base.count() == 500L)
    val filtered = base.filter(repro.core.dsl.col("ten") === 4)
    assert(!filtered.isBase)
    assert(filtered.count() == 50L) // must run the real query, not metadata
  }

  test("MongoConnector exposes no metadata count (pipeline limitation, per paper)") {
    val c = new MongoConnector(spark)
    c.initialize("Bench", "m2", data)
    assert(c.countMetadata("m2").isEmpty)
  }

  test("SparkSqlConnector round-trips results through LocalResult.toDF") {
    val c = new SparkSqlConnector(spark)
    c.initialize("Bench", "conn_t2", data)
    val r  = c.execute("SELECT twenty, COUNT(*) AS n FROM conn_t2 GROUP BY twenty", "conn_t2")
    val df = r.toDF(spark)
    assert(df.count() == 20)
    assert(df.columns.toSeq == Seq("twenty", "n"))
  }
}
