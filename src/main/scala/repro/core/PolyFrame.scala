package repro.core

/** PolyFrame: a Pandas-like dataframe whose operations incrementally
  * compose queries in a target language, evaluated lazily.
  *
  * Every *transformation* takes this frame's underlying query `Qi` and
  * produces a new frame whose query `Qi+1` embeds `Qi` via the language's
  * `$subquery` slot — recording the order of operations without executing
  * anything. *Actions* (`head`, `count`, `max`, ...) ship the accumulated
  * query through the [[DatabaseConnector]] and return a driver-local
  * [[LocalResult]] (the Pandas-DataFrame analogue).
  */
final class PolyFrame private (
    val connector: DatabaseConnector,
    /** The underlying query Qi for this frame. */
    val query: String,
    /** Best-effort known output schema (used by describe/get_dummies). */
    val columns: Seq[String],
    /** Collection the incremental chain started from. */
    val baseCollection: String,
    /** Set when this frame is a single-attribute series (`af['x']`). */
    val seriesName: Option[String],
    /** True only for the untransformed `q_all` frame — gates metadata
      * fast-paths like Neo4j's instant count.
      */
    val isBase: Boolean,
) {
  private def lang: LanguageConfig = connector.lang

  private def derived(q: String, cols: Seq[String], series: Option[String] = None): PolyFrame =
    new PolyFrame(connector, q, cols, baseCollection, series, isBase = false)

  // ---------------------------------------------------------------- transformations

  /** Project attributes — `df[['a','b']]`. */
  def select(attrs: String*): PolyFrame = {
    require(attrs.nonEmpty, "select needs at least one attribute")
    val items = attrs.map(a => lang.sub("ATTRIBUTES", "project_attribute", "attribute" -> a))
    val q = lang.sub("QUERIES", "q_project",
      "subquery" -> query, "attrs" -> lang.joinFragments(items))
    derived(q, attrs, series = if (attrs.size == 1) Some(attrs.head) else None)
  }

  /** Single-attribute projection — `df['a']`. */
  def apply(attr: String): PolyFrame = select(attr)

  /** Boolean/computed series — `df['lang'] == 'en'` as a standalone frame
    * (Table I operation 3). The projected column is named after the
    * expression (`is_eq`, ...).
    */
  def projectExpr(e: PFExpr, alias: String = null): PolyFrame = {
    val a = Option(alias).getOrElse(PFExpr.seriesAlias(e))
    val q = lang.sub("QUERIES", "q_project_value",
      "subquery" -> query, "statement" -> LanguageConfig.translate(e, lang), "alias" -> a)
    derived(q, Seq(a), series = Some(a))
  }

  /** Row selection — `df[cond]`. */
  def filter(cond: PFExpr): PolyFrame = {
    val q = lang.sub("QUERIES", "q_filter",
      "subquery" -> query, "condition" -> LanguageConfig.translate(cond, lang))
    derived(q, columns)
  }

  /** Element-wise function over a series — `df['s'].map(str.upper)`.
    * `fn` must exist in [STRING FUNCTIONS] or [TYPE CONVERSION].
    */
  def map(fn: String): PolyFrame = {
    val attr = seriesName.getOrElse(
      throw new IllegalStateException("map() requires a single-attribute series"))
    val stmt = LanguageConfig.translate(PFExpr.Func(fn, PFExpr.Attr(attr)), lang)
    val item = lang.sub("ATTRIBUTES", "attribute_alias", "alias" -> attr, "statement" -> stmt)
    val q = lang.sub("QUERIES", "q_project", "subquery" -> query, "attrs" -> item)
    derived(q, Seq(attr), series = Some(attr))
  }

  /** Sort — `df.sort_values(attr, ascending)`. */
  def sortValues(attr: String, ascending: Boolean = true): PolyFrame = {
    val key = if (ascending) "sort_asc_attr" else "sort_desc_attr"
    val q = lang.sub("QUERIES", "q_sort",
      "subquery" -> query, "sort_attrs" -> lang.sub("ATTRIBUTES", key, "attribute" -> attr))
    derived(q, columns)
  }

  /** Group by — `df.groupby(keys)`, combined with [[Grouped.agg]]. */
  def groupBy(keys: String*): PolyFrame.Grouped = PolyFrame.Grouped(this, keys)

  /** Inner equi-join — `pd.merge(df, df2, left_on, right_on)`.
    *
    * Pipeline-style backends (MongoDB `$lookup`, Cypher's second MATCH)
    * join against a *collection*, so `right` must be an (optionally
    * transformed) frame rooted at a base collection — true for every
    * benchmark workload, as in the paper (which could not shard-join in
    * MongoDB at all).
    */
  def join(right: PolyFrame, leftOn: String, rightOn: String): PolyFrame = {
    val q = lang.sub("QUERIES", "q_join",
      "subquery"         -> query,
      "right_subquery"   -> right.query,
      "right_collection" -> right.baseCollection,
      "left_on"          -> leftOn,
      "right_on"         -> rightOn)
    derived(q, columns ++ right.columns)
  }

  private def aggItem(fn: String, attr: String): (String, String) = {
    val alias = s"${fn}_$attr"
    val agg   = lang.sub("FUNCTIONS", fn, "attribute" -> attr)
    alias -> lang.sub("ATTRIBUTES", "agg_alias", "alias" -> alias, "agg" -> agg)
  }

  /** One-hot encode a series — Pandas `get_dummies`. A *generic rule*: the
    * distinct values are fetched with the group-by rewrite, then each
    * dummy column is `to_int(attr = value)` via the language's TYPE
    * CONVERSION and COMPARISON rules.
    */
  def getDummies(): PolyFrame = {
    val attr = seriesName.getOrElse(
      throw new IllegalStateException("get_dummies() requires a single-attribute series"))
    val distinct = groupBy(attr).agg("count").collectAll()
    val idx      = distinct.columns.indexOf(attr)
    val values   = distinct.rows.map(_(idx)).filter(_ != null).map(_.toString).sorted
    val items = values.map { v =>
      val stmt = LanguageConfig.translate(
        PFExpr.Func("to_int", PFExpr.Cmp("eq", PFExpr.Attr(attr), PFExpr.Lit(v))), lang)
      lang.sub("ATTRIBUTES", "attribute_alias", "alias" -> s"${attr}_$v", "statement" -> stmt)
    }
    val q = lang.sub("QUERIES", "q_project", "subquery" -> query, "attrs" -> lang.joinFragments(items))
    derived(q, values.map(v => s"${attr}_$v"))
  }

  // ------------------------------------------------- action query texts
  // Exposed so tests can hand the exact shipped query to an oracle.

  /** The query `head(n)` ships. */
  def headQuery(n: Int): String =
    lang.sub("LIMIT", "limit", "subquery" -> query, "num" -> n.toString)

  /** The query `collectAll()` ships. */
  def collectQuery: String = lang.sub("LIMIT", "return_all", "subquery" -> query)

  /** The query `count()` ships (when not served from metadata). */
  def countQuery: String = lang.sub("QUERIES", "q_count_all", "subquery" -> query)

  /** The query `aggValue(fn)` ships. */
  def aggValueQuery(fn: String): String = {
    val attr = seriesName.getOrElse(
      throw new IllegalStateException(s"$fn() requires a single-attribute series"))
    val (_, item) = aggItem(fn, attr)
    val q = lang.sub("QUERIES", "q_agg_value", "subquery" -> query, "aggs" -> item)
    lang.sub("LIMIT", "return_all", "subquery" -> q)
  }

  // ---------------------------------------------------------------- actions

  /** First n rows — appends the LIMIT rule and evaluates. */
  def head(n: Int = 5): LocalResult = connector.run(headQuery(n), baseCollection)

  /** Materialize all rows (internal helper for small results). */
  def collectAll(): LocalResult = connector.run(collectQuery, baseCollection)

  /** `len(df)` — total count. Served from backend metadata when the
    * backend maintains one and this frame is the untransformed base
    * (the Neo4j fast path from the paper's expression 1 discussion).
    */
  def count(): Long = {
    val meta = if (isBase) connector.countMetadata(baseCollection) else None
    meta.getOrElse(connector.run(countQuery, baseCollection).scalarLong)
  }

  /** Scalar aggregate of a series — fn in min/max/avg/std/sum/count. */
  def aggValue(fn: String): LocalResult =
    connector.run(aggValueQuery(fn), baseCollection)

  def max(): Double = aggValue("max").scalarDouble
  def min(): Double = aggValue("min").scalarDouble
  def avg(): Double = aggValue("avg").scalarDouble
  def std(): Double = aggValue("std").scalarDouble
  def sum(): Double = aggValue("sum").scalarDouble

  /** Pandas `describe()` — a *generic rule*: min/max/avg/std/count of each
    * given attribute, chained with the attribute separator into a single
    * aggregate query (paper §III-C-2).
    */
  def describe(attrs: Seq[String]): LocalResult = {
    require(attrs.nonEmpty, "describe needs attributes")
    val fns   = Seq("min", "max", "avg", "std", "count")
    val items = for (a <- attrs; f <- fns) yield aggItem(f, a)._2
    val q = lang.sub("QUERIES", "q_agg_value",
      "subquery" -> query, "aggs" -> lang.joinFragments(items))
    connector.run(lang.sub("LIMIT", "return_all", "subquery" -> q), baseCollection)
  }
}

object PolyFrame {

  /** Entry point — `AFrame('Test', 'Users')` in the paper: wraps an
    * existing collection without touching any data.
    */
  def apply(connector: DatabaseConnector, namespace: String, collection: String,
            columns: Seq[String] = Nil): PolyFrame = {
    val q = connector.lang.sub("QUERIES", "q_all",
      "namespace" -> namespace, "collection" -> collection)
    new PolyFrame(connector, q, columns, collection, seriesName = None, isBase = true)
  }

  /** Deferred group-by: `df.groupby(keys).agg(...)`. */
  final case class Grouped(pf: PolyFrame, keys: Seq[String]) {
    require(keys.nonEmpty, "groupBy needs at least one key")

    /** `agg('count')` — aggregate over the group key(s), as the paper's
      * expression 4 does.
      */
    def agg(fn: String): PolyFrame = aggImpl(keys.map(k => fn -> k))

    /** `groupby(k)['a'].agg(fn)`. */
    def agg(fn: String, attr: String): PolyFrame = aggImpl(Seq(fn -> attr))

    private def aggImpl(items: Seq[(String, String)]): PolyFrame = {
      val lang = pf.connector.lang
      val aggAliased = items.map { case (fn, attr) =>
        val alias = s"${fn}_$attr"
        val agg   = lang.sub("FUNCTIONS", fn, "attribute" -> attr)
        lang.sub("ATTRIBUTES", "agg_alias", "alias" -> alias, "agg" -> agg)
      }
      val aliases = items.map { case (fn, attr) => s"${fn}_$attr" }
      val q =
        if (lang.has("GROUPBY", "id_field")) {
          // MongoDB shape: group under _id, restore keys, drop _id.
          val ids      = keys.map(k => lang.sub("GROUPBY", "id_field", "attribute" -> k))
          val restores = keys.map(k => lang.sub("GROUPBY", "restore_field", "attribute" -> k))
          lang.sub("QUERIES", "q_groupby",
            "subquery"       -> pf.query,
            "id_fields"      -> lang.joinFragments(ids),
            "aggs"           -> lang.joinFragments(aggAliased),
            "restore_fields" -> lang.joinFragments(restores))
        } else {
          val keyItems = keys.map(k => lang.sub("ATTRIBUTES", "group_key", "attribute" -> k))
          lang.sub("QUERIES", "q_groupby",
            "subquery"    -> pf.query,
            "select_list" -> lang.joinFragments(keyItems ++ aggAliased),
            "group_keys"  -> lang.joinFragments(keyItems))
        }
      new PolyFrame(pf.connector, q, keys ++ aliases, pf.baseCollection, None, isBase = false)
    }
  }
}
