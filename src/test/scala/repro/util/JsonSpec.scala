package repro.util

import org.scalatest.funsuite.AnyFunSuite

class JsonSpec extends AnyFunSuite {

  test("parses null / booleans / numbers") {
    assert(Json.parse("null") == JNull)
    assert(Json.parse("true") == JBool(true))
    assert(Json.parse("false") == JBool(false))
    assert(Json.parse("42") == JNum(42))
    assert(Json.parse("-7") == JNum(-7))
    assert(Json.parse("3.5") == JNum(3.5))
    assert(Json.parse("1e3") == JNum(1000))
  }

  test("parses strings with escapes") {
    assert(Json.parse("\"abc\"") == JStr("abc"))
    assert(Json.parse("\"a\\\"b\"") == JStr("a\"b"))
    assert(Json.parse("\"a\\n\\t\\\\\"") == JStr("a\n\t\\"))
    assert(Json.parse("\"\\u0041\"") == JStr("A"))
  }

  test("parses arrays") {
    assert(Json.parse("[1, 2, 3]") == JArr(Vector(JNum(1), JNum(2), JNum(3))))
    assert(Json.parse("[]") == JArr(Vector.empty))
    assert(Json.parse("[[1],[2]]") == JArr(Vector(JArr(Vector(JNum(1))), JArr(Vector(JNum(2))))))
  }

  test("parses objects preserving key order") {
    val o = Json.parse("""{"b": 1, "a": 2}""").asInstanceOf[JObj]
    assert(o.fields.keys.toSeq == Seq("b", "a"))
    assert(o("b") == JNum(1))
  }

  test("parses nested mongo-style pipeline") {
    val p = Json.parse("""[{"$match":{}},{"$project":{"lang":1}},{"$limit":10}]""").asInstanceOf[JArr]
    assert(p.xs.size == 3)
    assert(p.xs.head == JObj("$match" -> JObj()))
    assert(p.xs(1) == JObj("$project" -> JObj("lang" -> JNum(1))))
  }

  test("tolerates arbitrary whitespace") {
    assert(Json.parse(" {\n\t\"a\" :\n [ 1 ,\r\n 2 ] } ") == JObj("a" -> JArr(Vector(JNum(1), JNum(2)))))
  }

  test("rejects trailing garbage") {
    intercept[JsonParseException](Json.parse("1 2"))
    intercept[JsonParseException](Json.parse("{} x"))
  }

  test("rejects malformed input") {
    intercept[JsonParseException](Json.parse("{"))
    intercept[JsonParseException](Json.parse("[1,"))
    intercept[JsonParseException](Json.parse("\"abc"))
    intercept[JsonParseException](Json.parse("{'a': 1}"))
    intercept[JsonParseException](Json.parse("tru"))
  }

  test("render emits integral numbers without decimal point") {
    assert(JNum(10).render == "10")
    assert(JNum(-3).render == "-3")
    assert(JNum(2.5).render == "2.5")
  }

  test("render quotes and escapes strings") {
    assert(JStr("a\"b\n").render == "\"a\\\"b\\n\"")
  }

  test("render keeps object key order") {
    assert(JObj("z" -> JNum(1), "a" -> JNum(2)).render == """{"z":1,"a":2}""")
  }

  test("round-trip: parse(render(v)) == v for 200 random trees") {
    val rnd = new scala.util.Random(42)
    def leaf(): JValue = rnd.nextInt(4) match {
      case 0 => JNull
      case 1 => JBool(rnd.nextBoolean())
      case 2 => JNum(rnd.nextInt(2000001) - 1000000)
      case 3 => JStr(rnd.alphanumeric.take(rnd.nextInt(8)).mkString)
    }
    def tree(depth: Int): JValue =
      if (depth == 0) leaf()
      else rnd.nextInt(3) match {
        case 0 => leaf()
        case 1 => JArr(Vector.fill(rnd.nextInt(4))(tree(depth - 1)))
        case 2 => JObj(Seq.tabulate(rnd.nextInt(4))(i => s"k$i" -> tree(depth - 1)): _*)
      }
    (1 to 200).foreach { _ =>
      val v = tree(3)
      assert(Json.parse(v.render) == v)
    }
  }

  test("parsePrefix returns the consumed length") {
    val (v, n) = Json.parsePrefix("""{"a":1} trailing""")
    assert(v == JObj("a" -> JNum(1)))
    assert(n == 7)
  }
}
