package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.core.dsl._
import repro.core.languages.Languages
import TestSupport.norm

/** Text-level formation of the 13 benchmark expressions (Table III /
  * Appendix E-H shapes) without execution. Semantic correctness of these
  * queries is separately verified by the integration suite, which runs
  * them on every backend and diffs against the DuckDB oracle.
  */
class QueryFormationSpec extends AnyFunSuite {

  private def base(lang: LanguageConfig) =
    PolyFrame(new NullConnector(lang), "Bench", "data",
      repro.wisconsin.WisconsinData.columns)

  test("expr 1 (count) — SQL++ matches Appendix E shape") {
    val lang = Languages.sqlpp
    val q = lang.sub("QUERIES", "q_count_all", "subquery" -> base(lang).query)
    assert(norm(q) == "SELECT VALUE COUNT(*) FROM (SELECT VALUE t FROM Bench.data t) t")
  }

  test("expr 2 (project + head) — SQL matches Appendix F shape") {
    val lang = Languages.sql
    val pf = base(lang).select("two", "four")
    val q  = lang.sub("LIMIT", "limit", "subquery" -> pf.query, "num" -> "5")
    assert(norm(q) ==
      """SELECT t."two", t."four" FROM (SELECT * FROM Bench.data t) t LIMIT 5""")
  }

  test("expr 3 (filter & count) — nested filter shape") {
    val lang = Languages.sqlpp
    val pf = base(lang).filter(col("ten") === 4 && col("twentyPercent") === 4 && col("two") === 0)
    val q = lang.sub("QUERIES", "q_count_all", "subquery" -> pf.query)
    assert(norm(q) == ("SELECT VALUE COUNT(*) FROM (SELECT VALUE t FROM " +
      "(SELECT VALUE t FROM Bench.data t) t " +
      "WHERE t.ten = 4 AND t.twentyPercent = 4 AND t.two = 0) t"))
  }

  test("expr 4 (group by count) — SQL++/SQL/Mongo/Cypher shapes") {
    val sqlppQ = base(Languages.sqlpp).groupBy("oddOnePercent").agg("count").query
    assert(norm(sqlppQ) == ("SELECT t.oddOnePercent, COUNT(t.oddOnePercent) AS count_oddOnePercent " +
      "FROM (SELECT VALUE t FROM Bench.data t) t GROUP BY t.oddOnePercent"))

    val mongoQ = base(Languages.mongo).groupBy("oddOnePercent").agg("count").query
    assert(norm(mongoQ).contains(""""$group": { "_id": { "oddOnePercent": "$oddOnePercent" }"""))
    assert(norm(mongoQ).contains(""""$addFields": { "oddOnePercent": "$_id.oddOnePercent" }"""))
    assert(norm(mongoQ).endsWith("""{ "$project": { "_id": 0 } }"""))

    val cypherQ = base(Languages.cypher).groupBy("oddOnePercent").agg("count").query
    assert(norm(cypherQ) == ("MATCH(t: data) WITH { 'oddOnePercent': t.oddOnePercent, " +
      "'count_oddOnePercent': count(t.oddOnePercent) } AS t"))
  }

  test("expr 5 (map upper) — SQL matches Appendix F shape") {
    val lang = Languages.sql
    val pf = base(lang)("stringu1").map("upper")
    val q  = lang.sub("LIMIT", "limit", "subquery" -> pf.query, "num" -> "5")
    assert(norm(q) == ("""SELECT upper(t."stringu1") AS "stringu1" FROM """ +
      """(SELECT t."stringu1" FROM (SELECT * FROM Bench.data t) t) t LIMIT 5"""))
  }

  test("expr 6/7 (max/min) — Mongo matches Appendix H shape") {
    val lang = Languages.mongo
    val pf = base(lang)("unique1")
    val q = lang.sub("QUERIES", "q_agg_value", "subquery" -> pf.query,
      "aggs" -> lang.sub("ATTRIBUTES", "agg_alias", "alias" -> "max_unique1",
        "agg" -> lang.sub("FUNCTIONS", "max", "attribute" -> "unique1")))
    assert(norm(q) == norm(
      """{ "$match": {} },
        |{ "$project": { "unique1": 1 } },
        |{ "$group": { "_id": {}, "max_unique1": { "$max": "$unique1" } } },
        |{ "$project": { "_id": 0 } }""".stripMargin))
  }

  test("expr 8 (group by & max) — Cypher matches Appendix G shape") {
    val q = base(Languages.cypher).groupBy("twenty").agg("max", "four").query
    assert(norm(q) ==
      "MATCH(t: data) WITH { 'twenty': t.twenty, 'max_four': max(t.four) } AS t")
  }

  test("expr 9 (sort desc + head) — shapes") {
    val sqlQ = base(Languages.sql).sortValues("unique1", ascending = false).query
    assert(norm(sqlQ) ==
      """SELECT * FROM (SELECT * FROM Bench.data t) t ORDER BY t."unique1" DESC""")
    val mongoQ = base(Languages.mongo).sortValues("unique1", ascending = false).query
    assert(norm(mongoQ) == norm("""{ "$match": {} }, { "$sort": { "unique1": -1 } }"""))
    val cypherQ = base(Languages.cypher).sortValues("unique1", ascending = false).query
    assert(norm(cypherQ) == "MATCH(t: data) WITH t ORDER BY t.unique1 DESC")
  }

  test("expr 9 ascending variant uses the asc rule") {
    val mongoQ = base(Languages.mongo).sortValues("unique1").query
    assert(norm(mongoQ) == norm("""{ "$match": {} }, { "$sort": { "unique1": 1 } }"""))
  }

  test("expr 11 (range selection) — Spark SQL shape") {
    val lang = Languages.sparkSql
    val pf = base(lang).filter(col("onePercent") >= 40 && col("onePercent") <= 60)
    val q = lang.sub("QUERIES", "q_count_all", "subquery" -> pf.query)
    assert(norm(q) == ("SELECT COUNT(*) AS count FROM (SELECT t.* FROM " +
      "(SELECT * FROM data t) t WHERE t.onePercent >= 40 AND t.onePercent <= 60) t"))
  }

  test("expr 12 (join & count) — SQL join embeds both subqueries") {
    val lang = Languages.sql
    val l = base(lang); val r = PolyFrame(new NullConnector(lang), "Bench", "data2",
      repro.wisconsin.WisconsinData.columns)
    val j = l.join(r, "unique1", "unique1")
    assert(norm(j.query) == ("""SELECT l.*, r.* FROM (SELECT * FROM Bench.data t) l """ +
      """INNER JOIN (SELECT * FROM Bench.data2 t) r ON l."unique1" = r."unique1""""))
  }

  test("expr 12 — Mongo join uses $lookup/let/pipeline + $unwind (Appendix H)") {
    val lang = Languages.mongo
    val l = base(lang); val r = PolyFrame(new NullConnector(lang), "Bench", "data2",
      repro.wisconsin.WisconsinData.columns)
    val q = norm(l.join(r, "unique1", "unique1").query)
    assert(q.contains(""""$lookup": { "from": "data2", "as": "data2", "let": { "left": "$unique1" }"""))
    assert(q.contains(""""$eq": [ "$unique1", "$$left" ]"""))
    assert(q.contains(""""$unwind": { "path": "$data2", "preserveNullAndEmptyArrays": false }"""))
  }

  test("expr 12 — Cypher join adds a second MATCH with a WHERE equality") {
    val lang = Languages.cypher
    val l = base(lang); val r = PolyFrame(new NullConnector(lang), "Bench", "wisconsin2",
      repro.wisconsin.WisconsinData.columns)
    val q = norm(l.join(r, "unique1", "unique1").query)
    assert(q == "MATCH(t: data) MATCH(r: wisconsin2) WHERE t.unique1 = r.unique1 WITH t, r")
  }

  test("expr 13 (count missing) — per-language null idioms") {
    def q13(lang: LanguageConfig) = {
      val pf = base(lang).filter(col("tenPercent").isna)
      lang.sub("QUERIES", "q_count_all", "subquery" -> pf.query)
    }
    assert(norm(q13(Languages.sqlpp)).contains("WHERE t.tenPercent IS UNKNOWN"))
    assert(norm(q13(Languages.sql)).contains("""WHERE t."tenPercent" IS NULL"""))
    assert(norm(q13(Languages.mongo)).contains(""""$lt": [ "$tenPercent", null ]"""))
    assert(norm(q13(Languages.cypher)).contains("WHERE t.tenPercent IS NULL"))
  }

  test("schema tracking follows projections and group-bys") {
    val pf = base(Languages.sparkSql)
    assert(pf.select("two", "four").columns == Seq("two", "four"))
    assert(pf("unique1").seriesName.contains("unique1"))
    assert(pf.groupBy("twenty").agg("max", "four").columns == Seq("twenty", "max_four"))
    assert(pf.filter(col("ten") === 4).columns == pf.columns)
  }

  test("series-only operations reject non-series frames") {
    val pf = base(Languages.sparkSql)
    intercept[IllegalStateException](pf.map("upper"))
    intercept[IllegalStateException](pf.aggValue("max"))
  }
}
