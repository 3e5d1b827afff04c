package repro.util

import org.scalatest.funsuite.AnyFunSuite

class IniSpec extends AnyFunSuite {

  test("parses sections and entries") {
    val c = Ini.parse(
      """[QUERIES]
        |q1 = SELECT 1
        |q2 = SELECT 2
        |[FUNCTIONS]
        |min = MIN($attribute)
        |""".stripMargin)
    assert(c("QUERIES")("q1") == "SELECT 1")
    assert(c("QUERIES")("q2") == "SELECT 2")
    assert(c("FUNCTIONS")("min") == "MIN($attribute)")
  }

  test("multi-line values continue on indented lines") {
    val c = Ini.parse(
      """[LIMIT]
        |limit = $subquery
        | LIMIT $num
        |return_all = $subquery
        |""".stripMargin)
    assert(c("LIMIT")("limit") == "$subquery\nLIMIT $num")
    assert(c("LIMIT")("return_all") == "$subquery")
  }

  test("comments (; and #) are ignored and terminate continuations") {
    val c = Ini.parse(
      """;q1: select all records from a collection
        |[QUERIES]
        |q1 = MATCH(t: $collection)
        |; a comment between entries
        |q2 = $subquery
        | WITH t{$attribute_alias}
        |""".stripMargin)
    assert(c("QUERIES")("q1") == "MATCH(t: $collection)")
    assert(c("QUERIES")("q2") == "$subquery\nWITH t{$attribute_alias}")
  }

  test("values may contain '=' (comparison rules)") {
    val c = Ini.parse(
      """[COMPARISON STATEMENTS]
        |eq = $left = $right
        |ne = $left != $right
        |""".stripMargin)
    assert(c("COMPARISON STATEMENTS")("eq") == "$left = $right")
    assert(c("COMPARISON STATEMENTS")("ne") == "$left != $right")
  }

  test("values may contain JSON braces and colons (MongoDB rules)") {
    val c = Ini.parse(
      """[QUERIES]
        |q1 = { "$match": {} }
        |q2 = $subquery,
        | { "$project": { $attribute_alias } }
        |""".stripMargin)
    assert(c("QUERIES")("q1") == """{ "$match": {} }""")
    assert(c("QUERIES")("q2") == "$subquery,\n{ \"$project\": { $attribute_alias } }")
  }

  test("blank lines end a multi-line value") {
    val c = Ini.parse("[A]\nk = v1\n\n   \nk2 = v2\n")
    assert(c("A")("k") == "v1")
    assert(c("A")("k2") == "v2")
  }

  test("later duplicate key wins") {
    val c = Ini.parse("[A]\nk = old\nk = new\n")
    assert(c("A")("k") == "new")
  }

  test("key order is preserved") {
    val c = Ini.parse("[A]\nz = 1\na = 2\nm = 3\n")
    assert(c("A").keys.toSeq == Seq("z", "a", "m"))
  }

  test("empty section name is rejected") {
    intercept[Ini.IniParseException](Ini.parse("[]\nk = v\n"))
  }

  test("stray un-keyed line is rejected") {
    intercept[Ini.IniParseException](Ini.parse("[A]\njust some text\n"))
  }

  test("the paper's Cypher appendix-B sample parses as written") {
    val c = Ini.parse(
      """;Below are query explanations
        |;q1: select all records from a collection
        |[QUERIES]
        |q1 = MATCH(t: $collection)
        |q3 = $subquery
        | RETURN COUNT(*) AS t
        |[ARITHMETIC STATEMENTS]
        |add = $left + $right
        |mod = $left %% $right
        |[FUNCTIONS]
        |min = min(t.$attribute)
        |std = stDevP(t.$attribute)
        |""".stripMargin)
    assert(c("QUERIES")("q3") == "$subquery\nRETURN COUNT(*) AS t")
    assert(c("FUNCTIONS")("std") == "stDevP(t.$attribute)")
  }
}
