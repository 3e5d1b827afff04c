package repro.core

/** Column-expression AST for PolyFrame.
  *
  * PolyFrame records Pandas-style expressions (`df['ten'] == 4`,
  * `df['a'] + 1`, `df['x'].isna()`) as small trees; the per-language
  * rewrite rules (sections ARITHMETIC / LOGICAL / COMPARISON STATEMENTS,
  * TYPE CONVERSION, STRING FUNCTIONS, FUNCTIONS of a language
  * configuration) translate each node into a query fragment.
  */
sealed trait PFExpr {
  def &&(other: PFExpr): PFExpr = PFExpr.Logical("and", this, other)
  def ||(other: PFExpr): PFExpr = PFExpr.Logical("or", this, other)
  def unary_! : PFExpr          = PFExpr.Not(this)
}

object PFExpr {
  /** Reference to an attribute of the current frame. */
  final case class Attr(name: String) extends PFExpr {
    def ===(v: Any): PFExpr = Cmp("eq", this, Lit(v))
    def =!=(v: Any): PFExpr = Cmp("ne", this, Lit(v))
    def >(v: Any): PFExpr   = Cmp("gt", this, Lit(v))
    def <(v: Any): PFExpr   = Cmp("lt", this, Lit(v))
    def >=(v: Any): PFExpr  = Cmp("ge", this, Lit(v))
    def <=(v: Any): PFExpr  = Cmp("le", this, Lit(v))
    def isna: PFExpr        = IsNa(this)
    def +(v: Any): PFExpr   = Arith("add", this, Lit(v))
    def -(v: Any): PFExpr   = Arith("sub", this, Lit(v))
    def *(v: Any): PFExpr   = Arith("mul", this, Lit(v))
    def /(v: Any): PFExpr   = Arith("div", this, Lit(v))
    def %(v: Any): PFExpr   = Arith("mod", this, Lit(v))
  }
  /** Literal (String, Int, Long, Double, Boolean, or null). */
  final case class Lit(value: Any) extends PFExpr
  /** Comparison — op in eq/ne/gt/lt/ge/le. */
  final case class Cmp(op: String, left: PFExpr, right: PFExpr) extends PFExpr
  /** Arithmetic — op in add/sub/mul/div/mod. */
  final case class Arith(op: String, left: PFExpr, right: PFExpr) extends PFExpr
  /** Logical conjunction/disjunction — op in and/or. */
  final case class Logical(op: String, left: PFExpr, right: PFExpr) extends PFExpr
  final case class Not(e: PFExpr) extends PFExpr
  /** Missing-value test (Pandas `isna`). */
  final case class IsNa(e: PFExpr) extends PFExpr
  /** Scalar function application — upper/lower (STRING FUNCTIONS) or
    * to_int/to_str (TYPE CONVERSION).
    */
  final case class Func(name: String, operand: PFExpr) extends PFExpr

  /** Default alias for a boolean-series projection (`af['lang'] == 'en'`
    * projects a column named after the comparison, e.g. `is_eq`).
    */
  def seriesAlias(e: PFExpr): String = e match {
    case Cmp(op, _, _)     => s"is_$op"
    case IsNa(_)           => "is_na"
    case Arith(op, _, _)   => op
    case Logical(op, _, _) => op
    case Not(_)            => "not"
    case Func(name, _)     => name
    case Attr(n)           => n
    case Lit(_)            => "value"
  }
}

/** Pandas-flavoured construction helpers: `col("ten") === 4 && col("two") === 0`. */
object dsl {
  def col(name: String): PFExpr.Attr = PFExpr.Attr(name)
  def lit(v: Any): PFExpr.Lit        = PFExpr.Lit(v)
}
