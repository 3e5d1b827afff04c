package repro.integration

import repro.{Oracle, SparkSpec}
import repro.connector._
import repro.core.dsl._
import repro.core.{DatabaseConnector, LocalResult, PolyFrame}
import repro.wisconsin.WisconsinData

/** End-to-end correctness of the 13 benchmark expressions (Table III) on
  * every executable PolyFrame backend — SparkSQL, DuckDB, MiniMongo,
  * MiniCypher — over identical Wisconsin input.
  *
  * Deterministic results are (a) checked against analytically-known
  * values from the Table II derivations, (b) cross-compared between all
  * backends, and (c) for the Spark backend, diffed against hand-written
  * reference SQL on the DuckDB oracle. head()-based expressions (2, 5,
  * 10) return an arbitrary subset, so they are checked by properties.
  */
class BenchmarkExpressionsSpec extends SparkSpec {

  private val N = 2000L

  private lazy val data = WisconsinData.generate(spark, N).cache()

  private lazy val sparkConn  = { val c = new SparkSqlConnector(spark); init(c); c }
  private lazy val duckConn   = { val c = new DuckDbConnector();        init(c); c }
  private lazy val mongoConn  = { val c = new MongoConnector(spark);    init(c); c }
  private lazy val cypherConn = { val c = new CypherConnector(spark);   init(c); c }
  private def init(c: DatabaseConnector): Unit =
    Seq("wisconsin", "wisconsin2").foreach(t => c.initialize("Bench", t, data))

  private lazy val backends: Seq[DatabaseConnector] =
    Seq(sparkConn, duckConn, mongoConn, cypherConn)

  private def frames(c: DatabaseConnector): (PolyFrame, PolyFrame) =
    (PolyFrame(c, "Bench", "wisconsin",  WisconsinData.columns),
     PolyFrame(c, "Bench", "wisconsin2", WisconsinData.columns))

  /** Canonical form of a LocalResult for cross-backend comparison. */
  private def canon(r: LocalResult): Seq[Seq[String]] = {
    val order = r.columns.map(_.toLowerCase).zipWithIndex.sortBy(_._1).map(_._2)
    r.rows.map { row =>
      order.map { i =>
        LocalResult.normalize(row(i)) match {
          case null      => "∅"
          case d: Double => f"$d%.6f"
          case v         => v.toString
        }
      }
    }.sortBy(_.mkString("|"))
  }

  private def forAllBackends[A](f: (DatabaseConnector, PolyFrame, PolyFrame) => A): Seq[A] =
    backends.map { c => val (df, df2) = frames(c); f(c, df, df2) }

  // ------------------------------------------------------------ expression 1

  test("expr 1 (len) — every backend returns the exact count") {
    forAllBackends { (c, df, _) => assert(df.count() == N, c.name) }
  }

  test("expr 1 oracle — Spark count query matches DuckDB") {
    val (df, _) = frames(sparkConn)
    Oracle.assertEquivalent(
      sparkConn.dataFrame(df.countQuery),
      "SELECT COUNT(*) AS count FROM wisconsin",
      "wisconsin" -> data)
  }

  // ------------------------------------------------------------ expression 2

  test("expr 2 (project+head) — 5 rows, right columns, valid domains") {
    forAllBackends { (c, df, _) =>
      val r = df.select("two", "four").head(5)
      assert(r.size == 5, c.name)
      assert(r.columns.map(_.toLowerCase) == Seq("two", "four"), c.name)
      r.rows.foreach { row =>
        assert(Set(0L, 1L).contains(LocalResult.normalize(row(0)).asInstanceOf[Long]), c.name)
        assert((0L to 3L).contains(LocalResult.normalize(row(1)).asInstanceOf[Long]), c.name)
      }
    }
  }

  // ------------------------------------------------------------ expression 3

  test("expr 3 (filter & count) — N/10 on every backend") {
    forAllBackends { (c, df, _) =>
      val n = df.filter(col("ten") === 4 && col("twentyPercent") === 4 && col("two") === 0).count()
      assert(n == N / 10, c.name)
    }
  }

  test("expr 3 oracle — Spark filter-count matches DuckDB") {
    val (df, _) = frames(sparkConn)
    val pf = df.filter(col("ten") === 4 && col("twentyPercent") === 4 && col("two") === 0)
    Oracle.assertEquivalent(
      sparkConn.dataFrame(pf.countQuery),
      "SELECT COUNT(*) AS count FROM wisconsin " +
        "WHERE CAST(ten AS INT) = 4 AND CAST(twentyPercent AS INT) = 4 AND CAST(two AS INT) = 0",
      "wisconsin" -> data)
  }

  // ------------------------------------------------------------ expression 4

  test("expr 4 (group by count) — identical group counts on every backend") {
    val results = forAllBackends { (c, df, _) =>
      val r = df.groupBy("oddOnePercent").agg("count").collectAll()
      assert(r.size == 100, c.name)
      canon(r)
    }
    assert(results.distinct.size == 1, "backends disagree on expr 4")
  }

  test("expr 4 oracle — Spark group-by matches DuckDB") {
    val (df, _) = frames(sparkConn)
    val pf = df.groupBy("oddOnePercent").agg("count")
    Oracle.assertEquivalent(
      sparkConn.dataFrame(pf.collectQuery),
      "SELECT CAST(oddOnePercent AS INT) AS oddOnePercent, " +
        "COUNT(oddOnePercent) AS count_oddOnePercent FROM wisconsin GROUP BY oddOnePercent",
      "wisconsin" -> data)
  }

  // ------------------------------------------------------------ expression 5

  test("expr 5 (map upper + head) — 5 uppercased values everywhere") {
    forAllBackends { (c, df, _) =>
      val r = df("stringu1").map("upper").head(5)
      assert(r.size == 5, c.name)
      r.rows.foreach { row =>
        val s = row.head.toString
        assert(s == s.toUpperCase && s.length == 52, c.name)
      }
    }
  }

  // -------------------------------------------------------- expressions 6, 7

  test("expr 6 (max) — N-1 on every backend") {
    forAllBackends { (c, df, _) => assert(df("unique1").max() == (N - 1).toDouble, c.name) }
  }

  test("expr 7 (min) — 0 on every backend") {
    forAllBackends { (c, df, _) => assert(df("unique1").min() == 0.0, c.name) }
  }

  test("expr 6/7 oracle — Spark agg queries match DuckDB") {
    val (df, _) = frames(sparkConn)
    Oracle.assertEquivalent(
      sparkConn.dataFrame(df("unique1").aggValueQuery("max")),
      "SELECT MAX(CAST(unique1 AS BIGINT)) AS max_unique1 FROM wisconsin",
      "wisconsin" -> data)
    Oracle.assertEquivalent(
      sparkConn.dataFrame(df("unique1").aggValueQuery("min")),
      "SELECT MIN(CAST(unique1 AS BIGINT)) AS min_unique1 FROM wisconsin",
      "wisconsin" -> data)
  }

  // ------------------------------------------------------------ expression 8

  test("expr 8 (group by & max) — identical on every backend, max(four)=twenty%4") {
    val results = forAllBackends { (c, df, _) =>
      val r = df.groupBy("twenty").agg("max", "four").collectAll()
      assert(r.size == 20, c.name)
      val lower = r.columns.map(_.toLowerCase)
      val (ti, mi) = (lower.indexOf("twenty"), lower.indexOf("max_four"))
      r.rows.foreach { row =>
        val twenty = LocalResult.normalize(row(ti)).asInstanceOf[Long]
        val mx     = LocalResult.normalize(row(mi)).asInstanceOf[Long]
        assert(mx == twenty % 4, c.name)
      }
      canon(r)
    }
    assert(results.distinct.size == 1, "backends disagree on expr 8")
  }

  test("expr 8 oracle — Spark group-by-max matches DuckDB") {
    val (df, _) = frames(sparkConn)
    val pf = df.groupBy("twenty").agg("max", "four")
    Oracle.assertEquivalent(
      sparkConn.dataFrame(pf.collectQuery),
      "SELECT CAST(twenty AS INT) AS twenty, MAX(CAST(four AS INT)) AS max_four " +
        "FROM wisconsin GROUP BY twenty",
      "wisconsin" -> data)
  }

  // ------------------------------------------------------------ expression 9

  test("expr 9 (sort desc + head) — identical top-5 on every backend") {
    forAllBackends { (c, df, _) =>
      val r = df.sortValues("unique1", ascending = false).head(5)
      val i = r.columns.map(_.toLowerCase).indexOf("unique1")
      val got = r.rows.map(row => LocalResult.normalize(row(i)).asInstanceOf[Long])
      assert(got == Seq(N - 1, N - 2, N - 3, N - 4, N - 5), c.name)
    }
  }

  // ----------------------------------------------------------- expression 10

  test("expr 10 (selection + head) — 5 rows, all satisfying ten=4") {
    forAllBackends { (c, df, _) =>
      val r = df.filter(col("ten") === 4).head(5)
      assert(r.size == 5, c.name)
      val i = r.columns.map(_.toLowerCase).indexOf("ten")
      r.rows.foreach(row =>
        assert(LocalResult.normalize(row(i)) == 4L, c.name))
    }
  }

  // ----------------------------------------------------------- expression 11

  test("expr 11 (range selection & count) — 21% on every backend") {
    forAllBackends { (c, df, _) =>
      val n = df.filter(col("onePercent") >= 40 && col("onePercent") <= 60).count()
      assert(n == N * 21 / 100, c.name)
    }
  }

  test("expr 11 oracle — Spark range-count matches DuckDB") {
    val (df, _) = frames(sparkConn)
    val pf = df.filter(col("onePercent") >= 40 && col("onePercent") <= 60)
    Oracle.assertEquivalent(
      sparkConn.dataFrame(pf.countQuery),
      "SELECT COUNT(*) AS count FROM wisconsin " +
        "WHERE CAST(onePercent AS INT) >= 40 AND CAST(onePercent AS INT) <= 60",
      "wisconsin" -> data)
  }

  // ----------------------------------------------------------- expression 12

  test("expr 12 (join & count) — N on every backend (self-join on unique1)") {
    forAllBackends { (c, df, df2) =>
      assert(df.join(df2, "unique1", "unique1").count() == N, c.name)
    }
  }

  test("expr 12 oracle — Spark join-count matches DuckDB") {
    val (df, df2) = frames(sparkConn)
    val pf = df.join(df2, "unique1", "unique1")
    Oracle.assertEquivalent(
      sparkConn.dataFrame(pf.countQuery),
      "SELECT COUNT(*) AS count FROM wisconsin l INNER JOIN wisconsin2 r " +
        "ON l.unique1 = r.unique1",
      "wisconsin" -> data, "wisconsin2" -> data)
  }

  // ----------------------------------------------------------- expression 13

  test("expr 13 (count missing) — N/10 on every backend") {
    forAllBackends { (c, df, _) =>
      assert(df.filter(col("tenPercent").isna).count() == N / 10, c.name)
    }
  }

  test("expr 13 oracle — Spark missing-count matches DuckDB") {
    val (df, _) = frames(sparkConn)
    val pf = df.filter(col("tenPercent").isna)
    Oracle.assertEquivalent(
      sparkConn.dataFrame(pf.countQuery),
      "SELECT COUNT(*) AS count FROM wisconsin WHERE tenPercent IS NULL",
      "wisconsin" -> data)
  }

  // --------------------------------------------------- cross-cutting checks

  test("boolean-series projection (Table I op 3) evaluates on every backend") {
    forAllBackends { (c, df, _) =>
      val r = df("two").projectExpr(col("two") === 0).collectAll()
      assert(r.size == N, c.name)
      val trues = r.rows.count(row => LocalResult.normalize(row.head) match {
        case b: Boolean => b
        case l: Long    => l == 1L
        case other      => other.toString.toBoolean
      })
      assert(trues == N / 2, c.name)
    }
  }

  test("chained transformations compose across backends (filter→project→sort→head)") {
    forAllBackends { (c, df, _) =>
      val r = df.filter(col("ten") === 4)
        .select("unique1", "ten")
        .sortValues("unique1", ascending = false)
        .head(3)
      val i = r.columns.map(_.toLowerCase).indexOf("unique1")
      val got = r.rows.map(row => LocalResult.normalize(row(i)).asInstanceOf[Long])
      // largest unique1 ≡ 4 (mod 10) below N=2000 is 1994
      assert(got == Seq(1994L, 1984L, 1974L), c.name)
    }
  }
}
