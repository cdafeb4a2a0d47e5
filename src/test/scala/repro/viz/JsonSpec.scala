package repro.viz

import com.fasterxml.jackson.databind.ObjectMapper

import org.scalatest.funsuite.AnyFunSuite

/** The writer is validated by parsing its output with Jackson (which ships
  * with Spark) — if Jackson accepts it and the values round-trip, the JSON
  * is well-formed.
  */
class JsonSpec extends AnyFunSuite {

  private val mapper = new ObjectMapper()

  test("scalars render canonically") {
    assert(JNull.render == "null")
    assert(JBool(true).render == "true")
    assert(JBool(false).render == "false")
    assert(JNum(3.0).render == "3")
    assert(JNum(3.25).render == "3.25")
    assert(JStr("hi").render == "\"hi\"")
  }

  test("NaN and infinities degrade to null (JSON has no representation)") {
    assert(JNum(Double.NaN).render == "null")
    assert(JNum(Double.PositiveInfinity).render == "null")
  }

  test("strings with quotes, backslashes, newlines and control chars escape correctly") {
    val nasty = "a\"b\\c\nd\te\rfg"
    val rendered = JStr(nasty).render
    val parsed = mapper.readTree(rendered)
    assert(parsed.asText() == nasty)
  }

  test("unicode text passes through") {
    val s = "温度 – ③ sensors ü"
    assert(mapper.readTree(JStr(s).render).asText() == s)
  }

  test("arrays and objects nest and preserve field order") {
    val v = Json.obj(
      "name" -> Json.str("cap"),
      "support" -> Json.num(12),
      "sensors" -> Json.arr(Json.str("a"), Json.str("b")),
      "nested" -> Json.obj("x" -> JBool(true), "y" -> JNull),
    )
    val tree = mapper.readTree(v.render)
    assert(tree.get("name").asText() == "cap")
    assert(tree.get("support").asInt() == 12)
    assert(tree.get("sensors").get(1).asText() == "b")
    assert(tree.get("nested").get("x").asBoolean())
    assert(tree.get("nested").get("y").isNull)
    val names = tree.fieldNames()
    assert(names.next() == "name" && names.next() == "support")
  }

  test("empty array and object render") {
    assert(JArr(Nil).render == "[]")
    assert(JObj(Nil).render == "{}")
    assert(mapper.readTree(JArr(Nil).render).isArray)
  }

  test("large integers keep integer form below 1e15") {
    assert(JNum(52261.0).render == "52261")
    assert(JNum(2329936.0).render == "2329936")
  }
}
