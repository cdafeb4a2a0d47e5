package repro.viz

/** Minimal JSON writer (no third-party JSON dependency is resolvable in
  * this sealed build), with correct string escaping. Values are modelled
  * as a tiny ADT; rendering is deterministic (object fields keep insertion
  * order) so exports are diffable.
  */
sealed trait JValue {
  def render: String = this match {
    case JNull        => "null"
    case JBool(b)     => b.toString
    case JNum(v)      =>
      if (v.isNaN || v.isInfinite) "null"
      else if (v == math.floor(v) && math.abs(v) < 1e15) v.toLong.toString
      else v.toString
    case JStr(s)      => Json.quote(s)
    case JArr(xs)     => xs.map(_.render).mkString("[", ",", "]")
    case JObj(fields) => fields.map { case (k, v) => s"${Json.quote(k)}:${v.render}" }.mkString("{", ",", "}")
  }
}
case object JNull extends JValue
final case class JBool(b: Boolean) extends JValue
final case class JNum(v: Double) extends JValue
final case class JStr(s: String) extends JValue
final case class JArr(xs: Seq[JValue]) extends JValue
final case class JObj(fields: Seq[(String, JValue)]) extends JValue

object Json {

  /** JSON string literal with control/quote/backslash escaping. */
  def quote(s: String): String = {
    val sb = new StringBuilder("\"")
    s.foreach {
      case '"'           => sb.append("\\\"")
      case '\\'          => sb.append("\\\\")
      case '\b'          => sb.append("\\b")
      case '\f'          => sb.append("\\f")
      case '\n'          => sb.append("\\n")
      case '\r'          => sb.append("\\r")
      case '\t'          => sb.append("\\t")
      case c if c < ' '  => sb.append(f"\\u${c.toInt}%04x")
      case c             => sb.append(c)
    }
    sb.append('"').toString
  }

  def obj(fields: (String, JValue)*): JObj = JObj(fields)
  def arr(xs: JValue*): JArr = JArr(xs)
  def str(s: String): JStr = JStr(s)
  def num(v: Double): JNum = JNum(v)
}
