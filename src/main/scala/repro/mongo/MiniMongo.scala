package repro.mongo

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.functions._
import repro.util._

/** MiniMongo: an interpreter for the MongoDB aggregation-pipeline subset
  * that PolyFrame's Mongo rewrite rules emit, executing on Spark
  * DataFrames. This is the stand-in substrate for MongoDB itself (see
  * DESIGN.md §3) — the generated pipelines are *executed*, so the rewrite
  * rules are validated by results, not just text.
  *
  * Supported stages: $match (empty, $expr, simple equality), $project
  * (include / computed / exclude), $addFields, $group (struct `_id` +
  * accumulators, restored via $addFields exactly as the rewrites emit),
  * $sort, $limit, $count, $lookup (let/pipeline correlated form) and
  * $unwind.
  *
  * Expression operators: field paths (`$a`, `$_id.a`), $eq/$ne/$gt/$lt/
  * $gte/$lte (with MongoDB's `<op> null` missing-data idioms), $and/$or/
  * $not, $add/$subtract/$multiply/$divide/$mod, $toUpper/$toLower/$toInt/
  * $toString, $cond, $ifNull; accumulators $min/$max/$avg/$sum/$stdDevPop.
  */
object MiniMongo {

  final case class MongoError(msg: String) extends RuntimeException(msg)

  /** Run `pipeline` (a parsed JSON array of stages) against `base`;
    * `collections` resolves `$lookup.from` references.
    */
  def run(base: DataFrame, pipeline: JArr, collections: String => DataFrame): DataFrame =
    pipeline.xs.foldLeft(base)((df, stage) => applyStage(df, stageObj(stage), collections))

  private def stageObj(j: JValue): (String, JValue) = j match {
    case JObj(fields) if fields.size == 1 => fields.head
    case other => throw MongoError(s"stage must be a single-key object: ${other.render}")
  }

  private def applyStage(df: DataFrame, stage: (String, JValue),
                         collections: String => DataFrame): DataFrame = stage match {
    case ("$match", JObj(fields)) if fields.isEmpty => df
    case ("$match", o: JObj) =>
      o.get("$expr") match {
        case Some(e) => df.filter(expr(e))
        case None    =>
          // simple equality document: { field: value, ... }
          val conds = o.fields.map { case (f, v) => col(f) === litOf(v) }
          df.filter(conds.reduce(_ && _))
      }

    case ("$project", JObj(fields)) =>
      val includes = fields.collect { case (k, JNum(n)) if n == 1 => k }.toSeq
      val computed = fields.collect { case (k, o: JObj) => k -> o }.toSeq
      val excludes = fields.collect { case (k, JNum(n)) if n == 0 => k }.toSeq
      if (includes.nonEmpty || computed.nonEmpty)
        df.select(includes.map(col) ++ computed.map { case (k, o) => expr(o).as(k) }: _*)
      else
        df.drop(excludes.filter(df.columns.contains): _*)

    case ("$addFields", JObj(fields)) =>
      fields.foldLeft(df) { case (d, (k, v)) => d.withColumn(k, expr(v)) }

    case ("$group", JObj(fields)) =>
      val idSpec = fields.getOrElse("_id", throw MongoError("$group requires _id"))
      val accs = fields.toSeq.collect {
        case (alias, spec: JObj) if alias != "_id" => accumulator(spec).as(alias)
      }
      if (accs.isEmpty) throw MongoError("$group requires at least one accumulator")
      idSpec match {
        case JObj(kf) if kf.isEmpty =>
          df.agg(accs.head, accs.tail: _*).withColumn("_id", lit(null))
        case JObj(kf) =>
          val idStruct = struct(kf.toSeq.map { case (k, v) => expr(v).as(k) }: _*).as("_id")
          df.groupBy(idStruct).agg(accs.head, accs.tail: _*)
        case other => throw MongoError(s"unsupported _id: ${other.render}")
      }

    case ("$sort", JObj(fields)) =>
      val orders = fields.toSeq.map {
        case (f, JNum(n)) if n == -1 => col(f).desc
        case (f, _)                  => col(f).asc
      }
      df.orderBy(orders: _*)

    case ("$limit", JNum(n)) => df.limit(n.toInt)

    case ("$count", JStr(name)) => df.agg(count(lit(1)).as(name))

    case ("$lookup", spec: JObj) => lookup(df, spec, collections)

    case ("$unwind", spec: JObj) =>
      val path = spec("path") match {
        case JStr(p) => p.stripPrefix("$")
        case other   => throw MongoError(s"bad $$unwind path: ${other.render}")
      }
      val preserve = spec.get("preserveNullAndEmptyArrays").contains(JBool(true))
      if (preserve) df.withColumn(path, explode_outer(col(path)))
      else df.withColumn(path, explode(col(path)))

    case (op, v) => throw MongoError(s"unsupported stage $op: ${v.render}")
  }

  /** Correlated `$lookup`: stages of the sub-pipeline that reference a
    * `$$variable` become the equi-join condition; the remaining stages are
    * applied to the foreign collection first (as MongoDB would).
    */
  private def lookup(left: DataFrame, spec: JObj,
                     collections: String => DataFrame): DataFrame = {
    val from   = spec("from") match { case JStr(s) => s; case o => throw MongoError(o.render) }
    val asName = spec("as")   match { case JStr(s) => s; case o => throw MongoError(o.render) }
    val letVars: Map[String, String] = spec.get("let") match {
      case Some(JObj(fs)) => fs.map { case (k, JStr(p)) => k -> p.stripPrefix("$"); case (k, o) => throw MongoError(s"bad let $k: ${o.render}") }.toMap
      case _              => Map.empty
    }
    val stages = spec.get("pipeline") match {
      case Some(JArr(xs)) => xs
      case _              => Vector.empty
    }

    // Split sub-pipeline stages into variable-correlated join predicates vs.
    // plain stages applied to the foreign side.
    var joinKeys = List.empty[(String, String)] // (rightField, leftField)
    var right    = collections(from)
    stages.foreach { s =>
      stageObj(s) match {
        case ("$match", o: JObj) if o.get("$expr").exists(e => e.render.contains("$$")) =>
          o("$expr") match {
            case eq: JObj if eq.get("$eq").isDefined =>
              eq("$eq") match {
                case JArr(Vector(JStr(a), JStr(b))) =>
                  val (varSide, fieldSide) =
                    if (a.startsWith("$$")) (a, b) else (b, a)
                  val leftField = letVars.getOrElse(varSide.stripPrefix("$$"),
                    throw MongoError(s"unknown $$-variable $varSide"))
                  joinKeys ::= (fieldSide.stripPrefix("$"), leftField)
                case other => throw MongoError(s"unsupported correlated $$eq: ${other.render}")
              }
            case other => throw MongoError(s"unsupported correlated $$expr: ${other.render}")
          }
        case st => right = applyStage(right, st, collections)
      }
    }
    if (joinKeys.isEmpty) throw MongoError("$lookup without a correlated predicate")

    val rightKeyCols = joinKeys.map(_._1)
    val grouped = right
      .groupBy(rightKeyCols.map(f => col(f).as(s"__mk_$f")): _*)
      .agg(collect_list(struct(right.columns.map(col): _*)).as(asName))
    val cond = joinKeys.map { case (rf, lf) => left(lf) === grouped(s"__mk_$rf") }.reduce(_ && _)
    left.join(grouped, cond, "left").drop(rightKeyCols.map(f => s"__mk_$f"): _*)
  }

  private def litOf(j: JValue): Column = j match {
    case JNull    => lit(null)
    case JBool(b) => lit(b)
    case JStr(s)  => lit(s)
    case JNum(d)  => if (d.isWhole && math.abs(d) < 1e15) lit(d.toLong) else lit(d)
    case other    => throw MongoError(s"not a literal: ${other.render}")
  }

  /** Translate a MongoDB expression to a Spark Column. */
  def expr(j: JValue): Column = j match {
    case JStr(s) if s.startsWith("$$") => throw MongoError(s"unbound variable $s")
    case JStr(s) if s.startsWith("$")  => col(s.stripPrefix("$"))
    case JStr(s)                        => lit(s)
    case JNull | JBool(_) | JNum(_)     => litOf(j)
    case JObj(fields) if fields.size == 1 =>
      val (op, v) = fields.head
      def pair: (JValue, JValue) = v match {
        case JArr(Vector(a, b)) => (a, b)
        case other => throw MongoError(s"$op expects a 2-array: ${other.render}")
      }
      op match {
        // MongoDB BSON-order idioms for missing data: `x < null` is true
        // only for missing/null x; `x > null` is true for present x.
        case "$lt" if pair._2 == JNull => expr(pair._1).isNull
        case "$gt" if pair._2 == JNull => expr(pair._1).isNotNull
        case "$eq" if pair._2 == JNull => expr(pair._1).isNull
        case "$ne" if pair._2 == JNull => expr(pair._1).isNotNull
        case "$eq"  => expr(pair._1) === expr(pair._2)
        case "$ne"  => expr(pair._1) =!= expr(pair._2)
        case "$gt"  => expr(pair._1) > expr(pair._2)
        case "$lt"  => expr(pair._1) < expr(pair._2)
        case "$gte" => expr(pair._1) >= expr(pair._2)
        case "$lte" => expr(pair._1) <= expr(pair._2)
        case "$and" => v match {
          case JArr(xs) => xs.map(expr).reduce(_ && _)
          case o        => throw MongoError(s"bad $$and: ${o.render}")
        }
        case "$or" => v match {
          case JArr(xs) => xs.map(expr).reduce(_ || _)
          case o        => throw MongoError(s"bad $$or: ${o.render}")
        }
        case "$not" => v match {
          case JArr(Vector(x)) => !expr(x)
          case x               => !expr(x)
        }
        case "$add"      => expr(pair._1) + expr(pair._2)
        case "$subtract" => expr(pair._1) - expr(pair._2)
        case "$multiply" => expr(pair._1) * expr(pair._2)
        case "$divide"   => expr(pair._1) / expr(pair._2)
        case "$mod"      => expr(pair._1) % expr(pair._2)
        case "$toUpper"  => upper(expr(v))
        case "$toLower"  => lower(expr(v))
        case "$toInt"    => expr(v).cast("int")
        case "$toString" => expr(v).cast("string")
        case "$cond" => v match {
          case JArr(Vector(c, t, e)) => when(expr(c), expr(t)).otherwise(expr(e))
          case o                     => throw MongoError(s"bad $$cond: ${o.render}")
        }
        case "$ifNull" => coalesce(expr(pair._1), expr(pair._2))
        case other => throw MongoError(s"unsupported operator $other")
      }
    case other => throw MongoError(s"unsupported expression: ${other.render}")
  }

  /** Accumulator expressions inside $group. */
  private def accumulator(spec: JObj): Column = {
    val (op, v) = spec.fields.head
    op match {
      case "$min" => min(expr(v))
      case "$max" => max(expr(v))
      case "$avg" => avg(expr(v))
      case "$stdDevPop" => stddev_pop(expr(v))
      case "$sum" => v match {
        case JNum(n) => sum(lit(n.toLong))
        case other   => sum(expr(other))
      }
      case other => throw MongoError(s"unsupported accumulator $other")
    }
  }
}
