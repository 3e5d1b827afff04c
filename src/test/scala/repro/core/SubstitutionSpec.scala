package repro.core

import org.scalatest.funsuite.AnyFunSuite
import LanguageConfig.substitute

class SubstitutionSpec extends AnyFunSuite {

  test("replaces a single variable") {
    assert(substitute("SELECT * FROM $collection t", Map("collection" -> "Users"))
      == "SELECT * FROM Users t")
  }

  test("replaces multiple variables") {
    assert(substitute("$namespace.$collection", Map("namespace" -> "Test", "collection" -> "Users"))
      == "Test.Users")
  }

  test("longest variable name wins ($attribute_alias before $attribute)") {
    assert(substitute("$attribute_alias / $attribute",
      Map("attribute" -> "A", "attribute_alias" -> "B")) == "B / A")
  }

  test("unknown $-tokens pass through (MongoDB operators)") {
    assert(substitute("""{ "$match": { "$expr": { $condition } } }""",
      Map("condition" -> """"$eq": [ "$lang", "en" ]"""))
      == """{ "$match": { "$expr": { "$eq": [ "$lang", "en" ] } } }""")
  }

  test("$$attribute renders a $-prefixed field path") {
    assert(substitute(""""$min": "$$attribute"""", Map("attribute" -> "age"))
      == """"$min": "$age"""")
  }

  test("substituted values are not re-scanned (no recursive expansion)") {
    assert(substitute("$left AND $right", Map("left" -> "$right", "right" -> "x"))
      == "$right AND x")
  }

  test("variable at end of template") {
    assert(substitute("LIMIT $num", Map("num" -> "10")) == "LIMIT 10")
  }

  test("identifier-boundary: $num does not match inside $number") {
    assert(substitute("$number", Map("num" -> "10")) == "$number")
  }

  test("empty variable map is identity") {
    assert(substitute("a $b c", Map.empty) == "a $b c")
  }

  test("MongoDB $$left stays untouched when only left_on is bound") {
    val tpl = """"let": { "left": "$$left_on" }, "$eq": [ "$$right_on", "$$left" ]"""
    assert(substitute(tpl, Map("left_on" -> "unique1", "right_on" -> "unique1"))
      == """"let": { "left": "$unique1" }, "$eq": [ "$unique1", "$$left" ]""")
  }
}
