package repro.util

import scala.collection.immutable.ListMap

/** Parser for PolyFrame's INI-style language-configuration files.
  *
  * The paper (Appendix B/C) writes rewrite rules as
  *
  * {{{
  * ;comment
  * [QUERIES]
  * q1 = MATCH(t: $collection)
  * q2 = $subquery
  *  WITH t{$attribute_alias}
  * }}}
  *
  * i.e. `key = value` entries grouped under `[SECTION]` headers, where a
  * value continues onto subsequent indented lines (multi-line templates).
  * This parser reproduces exactly that format so our language configs can
  * be written the way the paper writes them.
  */
object Ini {

  /** section name -> (key -> template). Key order preserved. */
  type Config = ListMap[String, ListMap[String, String]]

  final case class IniParseException(msg: String, line: Int)
    extends RuntimeException(s"$msg at line $line")

  def parse(text: String): Config = {
    var sections  = ListMap.empty[String, ListMap[String, String]]
    var section   = ""                     // entries before any header live in ""
    var entries   = ListMap.empty[String, String]
    var curKey: Option[String] = None
    var curVal    = new StringBuilder

    def flushKey(): Unit = curKey.foreach { k =>
      entries = entries.updated(k, curVal.toString)
      curKey = None
      curVal = new StringBuilder
    }
    def flushSection(): Unit = {
      flushKey()
      if (entries.nonEmpty || section.nonEmpty) sections = sections.updated(section, entries)
      entries = ListMap.empty
    }

    val keyRe = "^([A-Za-z_][A-Za-z0-9_]*)\\s*=(.*)$".r
    for (((raw, idx)) <- text.linesIterator.zipWithIndex) {
      val lineNo = idx + 1
      val trimmed = raw.trim
      if (trimmed.startsWith(";") || trimmed.startsWith("#")) {
        // comment — ends any in-flight multi-line value
        flushKey()
      } else if (trimmed.startsWith("[") && trimmed.endsWith("]")) {
        flushSection()
        section = trimmed.substring(1, trimmed.length - 1).trim
        if (section.isEmpty) throw IniParseException("empty section name", lineNo)
      } else if (trimmed.isEmpty) {
        flushKey()
      } else raw match {
        case keyRe(k, v) if !raw.head.isWhitespace =>
          flushKey()
          curKey = Some(k)
          curVal = new StringBuilder(v.trim)
        case _ if curKey.isDefined =>
          // continuation line of a multi-line template
          if (curVal.nonEmpty) curVal.append('\n')
          curVal.append(trimmed)
        case _ =>
          throw IniParseException(s"unparseable line '$trimmed'", lineNo)
      }
    }
    flushSection()
    sections
  }
}
