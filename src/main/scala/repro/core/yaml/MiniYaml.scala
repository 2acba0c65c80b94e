package repro.core.yaml

/** Parsed YAML value. */
sealed trait YamlValue {
  /** Navigate a map key; throws with a path-aware message when absent. */
  def apply(key: String): YamlValue = this match {
    case YamlMap(m) => m.getOrElse(key, throw new NoSuchElementException(s"missing key '$key'"))
    case other      => throw new IllegalArgumentException(s"expected map for key '$key', got $other")
  }
  def get(key: String): Option[YamlValue] = this match {
    case YamlMap(m) => m.get(key)
    case _          => None
  }
  def str: String = this match {
    case YamlStr(s)  => s
    case YamlNum(n)  => if (n == n.floor && !n.isInfinite) n.toLong.toString else n.toString
    case YamlBool(b) => b.toString
    case other       => throw new IllegalArgumentException(s"expected string, got $other")
  }
  def num: Double = this match {
    case YamlNum(n) => n
    case YamlStr(s) => s.toDouble
    case other      => throw new IllegalArgumentException(s"expected number, got $other")
  }
  def int: Int   = num.toInt
  def long: Long = num.toLong
  def bool: Boolean = this match {
    case YamlBool(b) => b
    case other       => throw new IllegalArgumentException(s"expected bool, got $other")
  }
  def list: Seq[YamlValue] = this match {
    case YamlList(xs) => xs
    case other        => throw new IllegalArgumentException(s"expected list, got $other")
  }
  def map: Map[String, YamlValue] = this match {
    case YamlMap(m) => m
    case other      => throw new IllegalArgumentException(s"expected map, got $other")
  }
}
final case class YamlMap(values: Map[String, YamlValue])  extends YamlValue
final case class YamlList(values: Seq[YamlValue])         extends YamlValue
final case class YamlStr(value: String)                   extends YamlValue
final case class YamlNum(value: Double)                   extends YamlValue
final case class YamlBool(value: Boolean)                 extends YamlValue
case object YamlNull                                      extends YamlValue

/** A small indentation-based YAML-subset parser, sufficient for Modyn
  * pipeline files (§3.5): nested maps, block lists (`- item`), inline
  * lists (`[a, b]`), quoted and bare scalars, and multi-line literal
  * blocks (`|`, used for `bytes_parser_function`). No anchors, no flow
  * maps, no multi-document streams — pipelines don't need them.
  */
object MiniYaml {

  def parse(text: String): YamlValue = {
    val lines = text.split('\n').toIndexedSeq
      .map(stripComment)
      .zipWithIndex
      .filter { case (l, _) => l.trim.nonEmpty }
      .map { case (l, i) => Line(indentOf(l), l.trim, i + 1) }
    if (lines.isEmpty) YamlNull
    else {
      val (v, rest) = parseBlock(lines, lines.head.indent)
      require(rest.isEmpty, s"trailing content at line ${rest.head.number}: '${rest.head.text}'")
      v
    }
  }

  private final case class Line(indent: Int, text: String, number: Int)

  private def indentOf(l: String): Int = l.takeWhile(_ == ' ').length

  private def stripComment(l: String): String = {
    // Remove a trailing comment not inside quotes.
    var inS = false; var inD = false
    val sb  = new StringBuilder
    var i = 0
    var done = false
    while (i < l.length && !done) {
      val c = l(i)
      if (c == '\'' && !inD) inS = !inS
      else if (c == '"' && !inS) inD = !inD
      if (c == '#' && !inS && !inD && (i == 0 || l(i - 1) == ' ')) done = true
      else sb.append(c)
      i += 1
    }
    sb.toString
  }

  /** Parse the block of lines at exactly `indent`, returning the value and
    * the unconsumed lines.
    */
  private def parseBlock(lines: IndexedSeq[Line], indent: Int): (YamlValue, IndexedSeq[Line]) = {
    require(lines.nonEmpty, "empty block")
    if (lines.head.text.startsWith("- ") || lines.head.text == "-") parseList(lines, indent)
    else parseMap(lines, indent)
  }

  private def parseMap(lines0: IndexedSeq[Line], indent: Int): (YamlValue, IndexedSeq[Line]) = {
    var lines = lines0
    val out   = scala.collection.mutable.LinkedHashMap.empty[String, YamlValue]
    while (lines.nonEmpty && lines.head.indent == indent &&
           !lines.head.text.startsWith("- ")) {
      val line = lines.head
      val ci   = keyColonIndex(line.text)
      require(ci > 0, s"line ${line.number}: expected 'key: value', got '${line.text}'")
      val key  = unquote(line.text.take(ci).trim)
      val rhs  = line.text.drop(ci + 1).trim
      lines = lines.tail
      if (rhs == "|") {
        // Literal block: all following lines with deeper indentation.
        val (block, rest) = lines.span(_.indent > indent)
        val minIndent     = if (block.isEmpty) 0 else block.map(_.indent).min
        out(key) = YamlStr(block.map(l => " " * (l.indent - minIndent) + l.text).mkString("\n"))
        lines = rest
      } else if (rhs.nonEmpty) {
        out(key) = parseScalarOrInline(rhs, line.number)
      } else {
        // Nested block (deeper indent) or implicit null.
        if (lines.nonEmpty && lines.head.indent > indent) {
          val (v, rest) = parseBlock(lines, lines.head.indent)
          out(key) = v
          lines = rest
        } else out(key) = YamlNull
      }
    }
    (YamlMap(out.toMap), lines)
  }

  private def parseList(lines0: IndexedSeq[Line], indent: Int): (YamlValue, IndexedSeq[Line]) = {
    var lines = lines0
    val out   = Seq.newBuilder[YamlValue]
    while (lines.nonEmpty && lines.head.indent == indent &&
           (lines.head.text.startsWith("- ") || lines.head.text == "-")) {
      val line = lines.head
      val rhs  = line.text.drop(1).trim
      lines = lines.tail
      if (rhs.isEmpty) {
        require(lines.nonEmpty && lines.head.indent > indent,
          s"line ${line.number}: empty list item")
        val (v, rest) = parseBlock(lines, lines.head.indent)
        out += v
        lines = rest
      } else if (keyColonIndex(rhs) > 0) {
        // Map entry starting on the list-item line ("- key: v"): parse the
        // remainder plus the following deeper-indented lines as one map at
        // the synthetic indent of the item body.
        val syntheticIndent = indent + 2
        val (block, rest)   = lines.span(_.indent >= syntheticIndent)
        val (v, leftover) =
          parseMap(Line(syntheticIndent, rhs, line.number) +: block, syntheticIndent)
        require(leftover.isEmpty,
          s"line ${leftover.headOption.fold(line.number)(_.number)}: misaligned key in list map entry")
        out += v
        lines = rest
      } else {
        out += parseScalarOrInline(rhs, line.number)
      }
    }
    (YamlList(out.result()), lines)
  }

  /** Index of the colon that separates key from value (ignoring colons in
    * quotes); -1 when absent.
    */
  private def keyColonIndex(s: String): Int = {
    var inS = false; var inD = false
    var i = 0
    while (i < s.length) {
      val c = s(i)
      if (c == '\'' && !inD) inS = !inS
      else if (c == '"' && !inS) inD = !inD
      else if (c == ':' && !inS && !inD && (i + 1 == s.length || s(i + 1) == ' ')) return i
      i += 1
    }
    -1
  }

  private def parseScalarOrInline(s: String, lineNo: Int): YamlValue = {
    if (s.startsWith("[")) {
      require(s.endsWith("]"), s"line $lineNo: unterminated inline list '$s'")
      val inner = s.substring(1, s.length - 1).trim
      if (inner.isEmpty) YamlList(Seq.empty)
      else YamlList(splitTopLevel(inner).map(e => parseScalar(e.trim)))
    } else parseScalar(s)
  }

  /** Split an inline list body on commas outside quotes/brackets. */
  private def splitTopLevel(s: String): Seq[String] = {
    val out = Seq.newBuilder[String]
    var depth = 0; var inS = false; var inD = false
    val sb = new StringBuilder
    s.foreach { c =>
      if (c == '\'' && !inD) { inS = !inS; sb.append(c) }
      else if (c == '"' && !inS) { inD = !inD; sb.append(c) }
      else if (!inS && !inD && (c == '[' || c == '(')) { depth += 1; sb.append(c) }
      else if (!inS && !inD && (c == ']' || c == ')')) { depth -= 1; sb.append(c) }
      else if (c == ',' && depth == 0 && !inS && !inD) { out += sb.toString; sb.clear() }
      else sb.append(c)
    }
    if (sb.nonEmpty) out += sb.toString
    out.result()
  }

  private def parseScalar(s: String): YamlValue = s match {
    case "" | "null" | "~"  => YamlNull
    case "true" | "True"    => YamlBool(true)
    case "false" | "False"  => YamlBool(false)
    case q if isQuoted(q)   => YamlStr(unquote(q))
    case n                  =>
      n.toDoubleOption.map(YamlNum).getOrElse(YamlStr(n))
  }

  private def isQuoted(s: String): Boolean =
    s.length >= 2 && ((s.head == '"' && s.last == '"') || (s.head == '\'' && s.last == '\''))

  private def unquote(s: String): String = if (isQuoted(s)) s.substring(1, s.length - 1) else s
}
