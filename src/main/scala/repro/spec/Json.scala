package repro.spec

import scala.collection.immutable.ListMap

/** Minimal JSON abstract syntax tree.
  *
  * Humboldt specifications (Section 4 of the paper) are declarative JSON
  * documents. The sealed container has no network egress, so instead of a
  * resolved JSON library we ship a small, fully tested parser/printer pair.
  * Object key order is preserved (ListMap) so specs round-trip stably and
  * provider ordering — which the paper exposes to end users as a
  * customization axis — survives (de)serialization.
  */
sealed trait Json {

  /** Look up a field on an object; JNull/absent both map to None. */
  def apply(field: String): Option[Json] = this match {
    case Json.JObject(fields) => fields.get(field).filterNot(_ == Json.JNull)
    case _                    => None
  }

  /** String value, if this node is a string. */
  def str: Option[String] = this match {
    case Json.JString(s) => Some(s)
    case _               => None
  }

  /** Numeric value, if this node is a number. */
  def num: Option[Double] = this match {
    case Json.JNumber(n) => Some(n)
    case _               => None
  }

  /** Boolean value, if this node is a boolean. */
  def bool: Option[Boolean] = this match {
    case Json.JBool(b) => Some(b)
    case _             => None
  }

  /** Element list, if this node is an array. */
  def arr: Option[Vector[Json]] = this match {
    case Json.JArray(xs) => Some(xs)
    case _               => None
  }

  /** Field map, if this node is an object. */
  def obj: Option[ListMap[String, Json]] = this match {
    case Json.JObject(fields) => Some(fields)
    case _                    => None
  }

  /** Compact single-line rendering. */
  def render: String = Json.render(this, pretty = false, 0)

  /** Indented multi-line rendering for specs written to disk. */
  def pretty: String = Json.render(this, pretty = true, 0)
}

object Json {
  final case class JString(value: String)                extends Json
  final case class JNumber(value: Double)                extends Json
  final case class JBool(value: Boolean)                 extends Json
  final case class JArray(values: Vector[Json])          extends Json
  final case class JObject(fields: ListMap[String, Json]) extends Json
  case object JNull                                      extends Json

  def obj(fields: (String, Json)*): JObject = JObject(ListMap(fields: _*))
  def arr(values: Json*): JArray            = JArray(values.toVector)
  def str(s: String): JString               = JString(s)
  def num(n: Double): JNumber               = JNumber(n)
  def bool(b: Boolean): JBool               = JBool(b)

  /** Error raised on malformed input, with a character offset for context. */
  final case class ParseError(message: String, offset: Int)
      extends RuntimeException(s"$message at offset $offset")

  /** Parse a complete JSON document; trailing non-whitespace is an error. */
  def parse(input: String): Either[ParseError, Json] =
    try {
      val p     = new Parser(input)
      val value = p.parseValue()
      p.skipWs()
      if (!p.atEnd) Left(ParseError(s"trailing input '${p.peekContext}'", p.pos))
      else Right(value)
    } catch { case e: ParseError => Left(e) }

  /** Parse, throwing on malformed input — for trusted in-repo specs. */
  def parseUnsafe(input: String): Json =
    parse(input).fold(e => throw e, identity)

  private final class Parser(s: String) {
    var pos = 0

    def atEnd: Boolean       = pos >= s.length
    def peekContext: String  = s.slice(pos, math.min(pos + 12, s.length))
    private def cur: Char    = s.charAt(pos)
    private def fail(msg: String): Nothing = throw ParseError(msg, pos)

    def skipWs(): Unit =
      while (!atEnd && (cur == ' ' || cur == '\t' || cur == '\n' || cur == '\r')) pos += 1

    def parseValue(): Json = {
      skipWs()
      if (atEnd) fail("unexpected end of input")
      cur match {
        case '{'                          => parseObject()
        case '['                          => parseArray()
        case '"'                          => JString(parseString())
        case 't'                          => expect("true"); JBool(true)
        case 'f'                          => expect("false"); JBool(false)
        case 'n'                          => expect("null"); JNull
        case c if c == '-' || c.isDigit   => parseNumber()
        case c                            => fail(s"unexpected character '$c'")
      }
    }

    private def expect(lit: String): Unit =
      if (s.regionMatches(pos, lit, 0, lit.length)) pos += lit.length
      else fail(s"expected '$lit'")

    private def parseObject(): JObject = {
      pos += 1 // '{'
      skipWs()
      var fields = ListMap.empty[String, Json]
      if (!atEnd && cur == '}') { pos += 1; return JObject(fields) }
      var done = false
      while (!done) {
        skipWs()
        if (atEnd || cur != '"') fail("expected object key string")
        val key = parseString()
        skipWs()
        if (atEnd || cur != ':') fail("expected ':' after object key")
        pos += 1
        val value = parseValue()
        fields = fields.updated(key, value)
        skipWs()
        if (atEnd) fail("unterminated object")
        cur match {
          case ',' => pos += 1
          case '}' => pos += 1; done = true
          case c   => fail(s"expected ',' or '}' in object, got '$c'")
        }
      }
      JObject(fields)
    }

    private def parseArray(): JArray = {
      pos += 1 // '['
      skipWs()
      val values = Vector.newBuilder[Json]
      if (!atEnd && cur == ']') { pos += 1; return JArray(values.result()) }
      var done = false
      while (!done) {
        values += parseValue()
        skipWs()
        if (atEnd) fail("unterminated array")
        cur match {
          case ',' => pos += 1
          case ']' => pos += 1; done = true
          case c   => fail(s"expected ',' or ']' in array, got '$c'")
        }
      }
      JArray(values.result())
    }

    private def parseString(): String = {
      pos += 1 // opening quote
      val sb = new StringBuilder
      while (true) {
        if (atEnd) fail("unterminated string")
        cur match {
          case '"' => pos += 1; return sb.toString
          case '\\' =>
            pos += 1
            if (atEnd) fail("unterminated escape")
            cur match {
              case '"'  => sb += '"';  pos += 1
              case '\\' => sb += '\\'; pos += 1
              case '/'  => sb += '/';  pos += 1
              case 'b'  => sb += '\b'; pos += 1
              case 'f'  => sb += '\f'; pos += 1
              case 'n'  => sb += '\n'; pos += 1
              case 'r'  => sb += '\r'; pos += 1
              case 't'  => sb += '\t'; pos += 1
              case 'u'  =>
                pos += 1
                if (pos + 4 > s.length) fail("truncated unicode escape")
                val hex = s.substring(pos, pos + 4)
                try sb += Integer.parseInt(hex, 16).toChar
                catch { case _: NumberFormatException => fail(s"bad unicode escape '\\u$hex'") }
                pos += 4
              case c => fail(s"bad escape '\\$c'")
            }
          case c => sb += c; pos += 1
        }
      }
      sb.toString // unreachable
    }

    private def parseNumber(): JNumber = {
      val start = pos
      if (!atEnd && cur == '-') pos += 1
      while (!atEnd && cur.isDigit) pos += 1
      if (!atEnd && cur == '.') { pos += 1; while (!atEnd && cur.isDigit) pos += 1 }
      if (!atEnd && (cur == 'e' || cur == 'E')) {
        pos += 1
        if (!atEnd && (cur == '+' || cur == '-')) pos += 1
        while (!atEnd && cur.isDigit) pos += 1
      }
      val text = s.substring(start, pos)
      try JNumber(text.toDouble)
      catch { case _: NumberFormatException => fail(s"bad number '$text'") }
    }
  }

  private def escape(s: String): String = {
    val sb = new StringBuilder
    s.foreach {
      case '"'            => sb ++= "\\\""
      case '\\'           => sb ++= "\\\\"
      case '\b'           => sb ++= "\\b"
      case '\f'           => sb ++= "\\f"
      case '\n'           => sb ++= "\\n"
      case '\r'           => sb ++= "\\r"
      case '\t'           => sb ++= "\\t"
      case c if c < ' '   => sb ++= f"\\u${c.toInt}%04x"
      case c              => sb += c
    }
    sb.toString
  }

  private def renderNum(n: Double): String =
    if (n.isWhole && math.abs(n) < 1e15) n.toLong.toString else n.toString

  private def render(j: Json, pretty: Boolean, depth: Int): String = {
    val pad  = if (pretty) "  " * (depth + 1) else ""
    val pad0 = if (pretty) "  " * depth else ""
    val nl   = if (pretty) "\n" else ""
    val sp   = if (pretty) " " else ""
    j match {
      case JNull        => "null"
      case JBool(b)     => b.toString
      case JNumber(n)   => renderNum(n)
      case JString(s)   => "\"" + escape(s) + "\""
      case JArray(xs) if xs.isEmpty => "[]"
      case JArray(xs) =>
        xs.map(x => pad + render(x, pretty, depth + 1)).mkString(s"[$nl", s",$nl", s"$nl$pad0]")
      case JObject(fs) if fs.isEmpty => "{}"
      case JObject(fs) =>
        fs.map { case (k, v) => s"""$pad"${escape(k)}":$sp${render(v, pretty, depth + 1)}""" }
          .mkString(s"{$nl", s",$nl", s"$nl$pad0}")
    }
  }
}
