package repro.cypher

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.functions._
import CypherExpr._

/** MiniCypher: parser + executor for the Cypher subset PolyFrame's rewrite
  * rules emit, running on Spark DataFrames — the stand-in substrate for
  * Neo4j (DESIGN.md §3).
  *
  * Execution state is a DataFrame with **one struct column per Cypher
  * variable** (`t`, and `r` after a join MATCH), so `t.attr` resolves as a
  * struct-field path and a join never creates ambiguous columns.
  *
  * Clauses (one per line, as the rewrite templates emit them):
  * {{{
  * MATCH(t: label)                      scan
  * MATCH(r: label) WHERE t.a = r.b     equi-join with the current state
  * WITH t{'a': expr, ...}              map projection (variable stays t)
  * WITH t WHERE pred                    filter
  * WITH { 'k': t.k, 'x': max(t.a) } AS t   implicit-grouping aggregation
  * WITH t ORDER BY t.a [DESC]           sort
  * WITH t, r                            keep both variables
  * RETURN COUNT(*) AS t                 count action
  * RETURN t                             flatten t's fields into columns
  * LIMIT n
  * }}}
  */
object MiniCypher {

  final case class CypherError(msg: String) extends RuntimeException(msg)

  sealed trait Clause
  final case class MatchScan(variable: String, label: String)                    extends Clause
  final case class MatchJoin(variable: String, label: String, pred: String)      extends Clause
  final case class WithProjection(variable: String, fields: Seq[(String, Ast)])  extends Clause
  final case class WithWhere(variable: String, pred: Ast)                        extends Clause
  final case class WithGroup(fields: Seq[(String, Ast)], as: String)             extends Clause
  final case class WithOrder(variable: String, key: Ast, desc: Boolean)          extends Clause
  final case class WithVars(vars: Seq[String])                                   extends Clause
  final case class ReturnCount(alias: String)                                    extends Clause
  final case class ReturnVar(variable: String)                                   extends Clause
  final case class LimitClause(n: Int)                                           extends Clause

  private val matchRe     = """(?i)^MATCH\s*\(\s*(\w+)\s*:\s*(\w+)\s*\)\s*$""".r
  private val matchJoinRe = """(?i)^MATCH\s*\(\s*(\w+)\s*:\s*(\w+)\s*\)\s+WHERE\s+(.+)$""".r
  private val withProjRe  = """(?i)^WITH\s+(\w+)\s*\{(.*)\}\s*$""".r
  private val withWhereRe = """(?i)^WITH\s+(\w+)\s+WHERE\s+(.+)$""".r
  private val withGroupRe = """(?i)^WITH\s*\{(.*)\}\s*AS\s+(\w+)\s*$""".r
  private val withOrderRe = """(?i)^WITH\s+(\w+)\s+ORDER\s+BY\s+(.+?)(\s+DESC)?\s*$""".r
  private val withVarsRe  = """(?i)^WITH\s+(\w+(?:\s*,\s*\w+)+)\s*$""".r
  private val retCountRe  = """(?i)^RETURN\s+COUNT\(\*\)\s+AS\s+(\w+)\s*$""".r
  private val retVarRe    = """(?i)^RETURN\s+(\w+)\s*$""".r
  private val limitRe     = """(?i)^LIMIT\s+(\d+)\s*$""".r

  /** Split `'alias': expr, 'alias2': expr2` on top-level commas. */
  private[cypher] def splitFields(s: String): Seq[(String, Ast)] = {
    val parts = List.newBuilder[String]
    var depth = 0; var inStr = false; var strCh = ' '
    val cur = new StringBuilder
    s.foreach { c =>
      if (inStr) { cur.append(c); if (c == strCh) inStr = false }
      else c match {
        case '\'' | '"' | '`' => inStr = true; strCh = c; cur.append(c)
        case '(' | '{' | '[' => depth += 1; cur.append(c)
        case ')' | '}' | ']' => depth -= 1; cur.append(c)
        case ',' if depth == 0 => parts += cur.toString; cur.clear()
        case _ => cur.append(c)
      }
    }
    if (cur.toString.trim.nonEmpty) parts += cur.toString
    parts.result().map { part =>
      val idx = {
        // alias separator = first ':' outside any quoting
        var i = 0; var in = false; var ch = ' '; var found = -1
        while (i < part.length && found < 0) {
          val c = part(i)
          if (in) { if (c == ch) in = false }
          else if (c == '\'' || c == '"' || c == '`') { in = true; ch = c }
          else if (c == ':') found = i
          i += 1
        }
        if (found < 0) throw CypherError(s"field without alias: '$part'")
        found
      }
      val rawAlias = part.substring(0, idx).trim
      val alias = rawAlias.stripPrefix("'").stripSuffix("'")
        .stripPrefix("\"").stripSuffix("\"")
        .stripPrefix("`").stripSuffix("`")
      alias -> CypherExpr.parse(part.substring(idx + 1).trim)
    }
  }

  def parseClauses(query: String): Seq[Clause] =
    query.linesIterator.map(_.trim).filter(_.nonEmpty).map {
      case matchRe(v, label)            => MatchScan(v, label)
      case matchJoinRe(v, label, pred)  => MatchJoin(v, label, pred)
      case withWhereRe(v, pred)         => WithWhere(v, CypherExpr.parse(pred))
      case withOrderRe(v, key, desc)    => WithOrder(v, CypherExpr.parse(key), desc != null)
      case withGroupRe(fields, as)      => WithGroup(splitFields(fields), as)
      case withProjRe(v, fields)        => WithProjection(v, splitFields(fields))
      case withVarsRe(vars)             => WithVars(vars.split(",").map(_.trim).toSeq)
      case retCountRe(alias)            => ReturnCount(alias)
      case retVarRe(v)                  => ReturnVar(v)
      case limitRe(n)                   => LimitClause(n.toInt)
      case other                         => throw CypherError(s"unparseable clause: '$other'")
    }.toSeq

  /** Wrap a raw collection DataFrame as a single struct column `v`. */
  private def asVariable(df: DataFrame, v: String): DataFrame =
    df.select(struct(df.columns.map(col): _*).as(v))

  def run(query: String, collections: String => DataFrame): DataFrame =
    runClauses(parseClauses(query), collections)

  def runClauses(clauses: Seq[Clause], collections: String => DataFrame): DataFrame = {
    var df: DataFrame = null
    clauses.foreach {
      case MatchScan(v, label) =>
        require(df == null, "MATCH scan must be the first clause")
        df = asVariable(collections(label), v)

      case MatchJoin(v, label, predText) =>
        val right = asVariable(collections(label), v)
        CypherExpr.parse(predText) match {
          case Bin("=", l, r) =>
            // equi-join: one side references the new variable
            val (leftKey, rightKey) = (l, r) match {
              case (Ref(`v`, _), _) => (r, l)
              case _                => (l, r)
            }
            df = df.join(right, toColumn(leftKey) === toColumn(rightKey), "inner")
          case other =>
            df = df.crossJoin(right).filter(toColumn(other))
        }

      case WithProjection(v, fields) =>
        df = df.select(struct(fields.map { case (a, e) => toColumn(e).as(a) }: _*).as(v))

      case WithWhere(_, pred) =>
        df = df.filter(toColumn(pred))

      case WithGroup(fields, as) =>
        val (aggs, keys) = fields.partition { case (_, e) => containsAggregate(e) }
        require(aggs.nonEmpty, "WITH-group needs at least one aggregate")
        val aggCols = aggs.map { case (a, e) => toAggColumn(e).as(s"__a_$a") }
        val grouped =
          if (keys.isEmpty) df.agg(aggCols.head, aggCols.tail: _*)
          else df.groupBy(keys.map { case (a, e) => toColumn(e).as(s"__k_$a") }: _*)
                 .agg(aggCols.head, aggCols.tail: _*)
        val ordered = fields.map { case (a, _) =>
          val src = if (aggs.exists(_._1 == a)) s"__a_$a" else s"__k_$a"
          col(src).as(a)
        }
        df = grouped.select(struct(ordered: _*).as(as))

      case WithOrder(_, key, desc) =>
        df = df.orderBy(if (desc) toColumn(key).desc else toColumn(key).asc)

      case WithVars(_) => // both variables already present as struct columns

      case ReturnCount(alias) =>
        df = df.agg(count(lit(1)).as(alias))

      case ReturnVar(v) =>
        df = df.select(col(s"$v.*"))

      case LimitClause(n) =>
        df = df.limit(n)
    }
    require(df != null, "empty Cypher program")
    df
  }
}
