package repro.core.json

import repro.core.model._

/** Hand-written streaming JSON parser: text → [[Item]].
  *
  * Stand-in for the JSONiter parser the paper uses in `json-file()`
  * (§5.7): it builds items directly while scanning the input, without an
  * intermediate DOM, which is the property the paper relies on for its
  * "CPU-bound JSON parsing" observation in §6.3.
  *
  * Accepts one JSON value per call (`parse`) or one value per line
  * (`parseLine`, the JSON-Lines contract).
  */
object JsonParser {

  /** Parse a complete JSON value; trailing garbage is an error. */
  def parse(text: String): Item = {
    val p = new JsonParser(text)
    val v = p.parseValue()
    p.skipWs()
    if (!p.atEnd) throw new RumbleException("JSON", s"trailing input at ${p.pos}: $text")
    v
  }

  /** Parse one JSON-Lines record (must be a single JSON value). */
  def parseLine(line: String): Item = parse(line)
}

final class JsonParser(input: String) {
  var pos: Int = 0
  private val len = input.length

  def atEnd: Boolean = pos >= len

  def skipWs(): Unit = {
    while (pos < len && (input.charAt(pos) match {
             case ' ' | '\t' | '\n' | '\r' => true
             case _                        => false
           })) pos += 1
  }

  private def fail(msg: String): Nothing =
    throw new RumbleException("JSON", s"$msg at position $pos in: ${input.take(200)}")

  private def expect(c: Char): Unit = {
    if (atEnd || input.charAt(pos) != c) fail(s"expected '$c'")
    pos += 1
  }

  def parseValue(): Item = {
    skipWs()
    if (atEnd) fail("unexpected end of input")
    input.charAt(pos) match {
      case '{'                                       => parseObject()
      case '['                                       => parseArray()
      case '"'                                       => StringItem(parseString())
      case 't'                                       => parseKeyword("true", BooleanItem(true))
      case 'f'                                       => parseKeyword("false", BooleanItem(false))
      case 'n'                                       => parseKeyword("null", NullItem)
      case c if c == '-' || (c >= '0' && c <= '9')   => parseNumber()
      case c                                         => fail(s"unexpected character '$c'")
    }
  }

  private def parseKeyword(kw: String, item: Item): Item = {
    if (pos + kw.length > len || input.substring(pos, pos + kw.length) != kw)
      fail(s"expected '$kw'")
    pos += kw.length
    item
  }

  private def parseObject(): Item = {
    expect('{'); skipWs()
    val fields = Vector.newBuilder[(String, Item)]
    if (!atEnd && input.charAt(pos) == '}') { pos += 1; return ObjectItem(fields.result()) }
    var done = false
    while (!done) {
      skipWs()
      val key = parseString()
      skipWs(); expect(':')
      val value = parseValue()
      fields += ((key, value))
      skipWs()
      if (atEnd) fail("unterminated object")
      input.charAt(pos) match {
        case ',' => pos += 1
        case '}' => pos += 1; done = true
        case c   => fail(s"expected ',' or '}' but found '$c'")
      }
    }
    ObjectItem(fields.result())
  }

  private def parseArray(): Item = {
    expect('['); skipWs()
    val values = Vector.newBuilder[Item]
    if (!atEnd && input.charAt(pos) == ']') { pos += 1; return ArrayItem(values.result()) }
    var done = false
    while (!done) {
      values += parseValue()
      skipWs()
      if (atEnd) fail("unterminated array")
      input.charAt(pos) match {
        case ',' => pos += 1
        case ']' => pos += 1; done = true
        case c   => fail(s"expected ',' or ']' but found '$c'")
      }
    }
    ArrayItem(values.result())
  }

  private def parseString(): String = {
    expect('"')
    val sb    = new StringBuilder
    var done  = false
    while (!done) {
      if (atEnd) fail("unterminated string")
      val c = input.charAt(pos); pos += 1
      c match {
        case '"'  => done = true
        case '\\' =>
          if (atEnd) fail("unterminated escape")
          val e = input.charAt(pos); pos += 1
          e match {
            case '"'  => sb += '"'
            case '\\' => sb += '\\'
            case '/'  => sb += '/'
            case 'b'  => sb += '\b'
            case 'f'  => sb += '\f'
            case 'n'  => sb += '\n'
            case 'r'  => sb += '\r'
            case 't'  => sb += '\t'
            case 'u'  =>
              if (pos + 4 > len) fail("bad unicode escape")
              sb += Integer.parseInt(input.substring(pos, pos + 4), 16).toChar
              pos += 4
            case other => fail(s"bad escape '\\$other'")
          }
        case other => sb += other
      }
    }
    sb.toString
  }

  private def parseNumber(): Item = {
    val start = pos
    if (!atEnd && input.charAt(pos) == '-') pos += 1
    while (!atEnd && input.charAt(pos).isDigit) pos += 1
    var isIntegral = true
    if (!atEnd && input.charAt(pos) == '.') {
      isIntegral = false
      pos += 1
      while (!atEnd && input.charAt(pos).isDigit) pos += 1
    }
    if (!atEnd && (input.charAt(pos) == 'e' || input.charAt(pos) == 'E')) {
      isIntegral = false
      pos += 1
      if (!atEnd && (input.charAt(pos) == '+' || input.charAt(pos) == '-')) pos += 1
      while (!atEnd && input.charAt(pos).isDigit) pos += 1
    }
    val text = input.substring(start, pos)
    if (text.isEmpty || text == "-") fail("bad number")
    if (isIntegral) {
      try IntItem(text.toLong)
      catch { case _: NumberFormatException => DecimalItem(BigDecimal(text)) }
    } else DoubleItem(text.toDouble)
  }
}
