package repro.core

import repro.SparkSpec
import repro.connector._
import repro.wisconsin.WisconsinData

/** Generic rules (paper §III-C-2): describe() and get_dummies() are
  * composed from language-specific rules — executed here on every
  * backend.
  */
class GenericRulesSpec extends SparkSpec {

  private val N = 1000L
  private lazy val data = WisconsinData.generate(spark, N).cache()

  private lazy val backends: Seq[DatabaseConnector] = {
    val cs = Seq(
      new SparkSqlConnector(spark),
      new DuckDbConnector(),
      new MongoConnector(spark),
      new CypherConnector(spark))
    cs.foreach(_.initialize("Gen", "gwisc", data))
    cs
  }

  private def frame(c: DatabaseConnector) = PolyFrame(c, "Gen", "gwisc", WisconsinData.columns)

  test("describe() returns the five statistics per attribute on every backend") {
    backends.foreach { c =>
      val r = frame(c).describe(Seq("unique1", "two"))
      assert(r.size == 1, c.name)
      val byName = r.columns.map(_.toLowerCase).zip(r.rows.head.map(LocalResult.normalize)).toMap
      assert(byName("min_unique1") == 0L, c.name)
      assert(byName("max_unique1") == N - 1, c.name)
      assert(byName("count_unique1") == N, c.name)
      val avg = byName("avg_unique1") match { case d: Double => d; case l: Long => l.toDouble }
      assert(math.abs(avg - (N - 1) / 2.0) < 1e-6, c.name)
      val std = byName("std_unique1") match { case d: Double => d; case l: Long => l.toDouble }
      // population stddev of 0..N-1 = sqrt((N^2-1)/12)
      assert(math.abs(std - math.sqrt((N * N - 1) / 12.0)) < 1e-3, c.name)
      assert(byName("max_two") == 1L, c.name)
      assert(byName("min_two") == 0L, c.name)
    }
  }

  test("describe() counts skip missing values (tenPercent)") {
    backends.foreach { c =>
      val r = frame(c).describe(Seq("tenPercent"))
      val byName = r.columns.map(_.toLowerCase).zip(r.rows.head.map(LocalResult.normalize)).toMap
      assert(byName("count_tenpercent") == N - N / 10, c.name)
    }
  }

  test("get_dummies() one-hot encodes string4 on every backend") {
    backends.foreach { c =>
      val d = frame(c)("string4").getDummies()
      assert(d.columns == Seq("string4_A", "string4_H", "string4_O", "string4_V"), c.name)
      val r = d.collectAll()
      assert(r.size == N, c.name)
      // every row has exactly one 1 across the dummy columns
      r.rows.foreach { row =>
        val ones = row.map(LocalResult.normalize).map {
          case l: Long => l
          case b: Boolean => if (b) 1L else 0L
          case other => other.toString.toDouble.toLong
        }
        assert(ones.sum == 1L, s"${c.name}: $row")
      }
      // and each value appears N/4 times
      val sums = r.rows.map(_.map(LocalResult.normalize).map {
        case l: Long => l; case other => other.toString.toDouble.toLong
      }).transpose.map(_.sum)
      assert(sums == Seq(N / 4, N / 4, N / 4, N / 4), c.name)
    }
  }

  test("describe() composes a single aggregate query (one action, no intermediates)") {
    val c  = new SparkSqlConnector(spark)
    c.initialize("Gen", "gwisc2", data)
    val pf = PolyFrame(c, "Gen", "gwisc2", WisconsinData.columns)
    // count the SELECTs: one outer aggregate over the base scan
    val fns = Seq("min", "max", "avg", "std", "count")
    val aggs = for (a <- Seq("unique1"); f <- fns) yield s"${f}_$a"
    val r = pf.describe(Seq("unique1"))
    assert(r.columns.map(_.toLowerCase) == aggs.map(_.toLowerCase))
  }
}
