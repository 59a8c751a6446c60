package repro.algebra

/** Compile the algebra IR to DuckDB SQL for the correctness oracle.
  *
  * `repro.Oracle` loads every table as all-VARCHAR, so each base-table
  * access is wrapped in a projection that casts columns back to their
  * declared type. Output column names match the Spark side exactly.
  */
object ToSql {

  private def lit(v: Any): String = v match {
    case s: String        => "'" + s.replace("'", "''") + "'"
    case d: java.sql.Date => s"DATE '$d'"
    case x                => x.toString
  }

  def expr(e: Expr): String = e match {
    case Col(n)           => n
    case Lit(v)           => lit(v)
    case Param(n)         => sys.error(s"unbound parameter $$$n — call Algebra.bind first")
    case Arith(o, l, r)   => s"(${expr(l)} $o ${expr(r)})"
  }

  def pred(p: Pred): String = p match {
    case Cmp(o, l, r) => s"(${expr(l)} $o ${expr(r)})"
    case PAnd(l, r)   => s"(${pred(l)} AND ${pred(r)})"
    case POr(l, r)    => s"(${pred(l)} OR ${pred(r)})"
    case PNot(q)      => s"(NOT ${pred(q)})"
    case PTrue        => "TRUE"
  }

  /** Result type of an expression under a column-type environment. */
  def exprType(e: Expr, env: Map[String, SqlType]): SqlType = e match {
    case Col(n)   => env.getOrElse(n, sys.error(s"unknown column $n"))
    case Lit(_: Long) | Lit(_: Int) => TLong
    case Lit(_: Double)             => TDouble
    case Lit(_: String)             => TString
    case Lit(_: java.sql.Date)      => TDate
    case Lit(v)                     => sys.error(s"untyped literal $v")
    case Param(n)                   => sys.error(s"unbound parameter $$$n")
    case Arith("/", _, _)           => TDouble
    case Arith(_, l, r) =>
      if (exprType(l, env) == TDouble || exprType(r, env) == TDouble) TDouble else TLong
  }

  /** Output column types of a (sub)query — mirrors Spark's typing so the
    * DuckDB side is cast to textually identical results.
    */
  def outTypes(op: Op): Map[String, SqlType] = op match {
    case TableRef(_, schema)   => schema.toMap
    case Select(_, c)          => outTypes(c)
    case TopK(_, _, c)         => outTypes(c)
    case Distinct(c)           => outTypes(c)
    case Project(items, c)     =>
      val env = outTypes(c); items.map { case (e, a) => a -> exprType(e, env) }.toMap
    case Aggregate(g, aggs, c) =>
      val env = outTypes(c)
      g.map(n => n -> env(n)).toMap ++ aggs.map { a =>
        a.alias -> (a.fn match {
          case FCount => TLong
          case FAvg   => TDouble
          case FSum   => if (exprType(a.input, env) == TDouble) TDouble else TLong
          case FMin | FMax => exprType(a.input, env)
        })
      }.toMap
    case Join(l, r, _)  => outTypes(l) ++ outTypes(r)
    case UnionAll(l, _) => outTypes(l)
  }

  private def aggSql(a: Agg, env: Map[String, SqlType]): String = {
    // Spark's COUNT returns BIGINT and SUM stays integral over integral
    // input; DuckDB returns HUGEINT/DECIMAL — cast so the oracle's textual
    // canonicalization agrees.
    val base = s"${a.fn.sql}(${expr(a.input)})"
    val cast = a.fn match {
      case FCount => s"CAST($base AS BIGINT)"
      case FSum   =>
        if (exprType(a.input, env) == TDouble) s"CAST($base AS DOUBLE)"
        else s"CAST($base AS BIGINT)"
      case FAvg   => s"CAST($base AS DOUBLE)"
      case _      => base
    }
    s"$cast AS ${a.alias}"
  }

  /** Sum over integral columns stays integral on the Spark side; the oracle
    * canonicalizes numerics to %.6f, so DOUBLE casts on both sides agree.
    */
  def compile(op: Op): String = {
    var n = 0
    def alias(): String = { n += 1; s"sq$n" }
    def go(op: Op): String = op match {
      case TableRef(name, schema) =>
        val casts = schema.map { case (c, t) => s"CAST($c AS ${t.duck}) AS $c" }
        s"(SELECT ${casts.mkString(", ")} FROM $name)"
      case Select(p, c) =>
        s"(SELECT * FROM ${go(c)} AS ${alias()} WHERE ${pred(p)})"
      case Project(items, c) =>
        val cols = items.map { case (e, a) => s"${expr(e)} AS $a" }
        s"(SELECT ${cols.mkString(", ")} FROM ${go(c)} AS ${alias()})"
      case Aggregate(g, aggs, c) =>
        val env = outTypes(c)
        val sel = (g ++ aggs.map(aggSql(_, env))).mkString(", ")
        val grp = if (g.isEmpty) "" else s" GROUP BY ${g.mkString(", ")}"
        s"(SELECT $sel FROM ${go(c)} AS ${alias()}$grp)"
      case TopK(order, k, c) =>
        val ord = order.map { case (cn, asc) => s"$cn ${if (asc) "ASC" else "DESC"}" }
        s"(SELECT * FROM ${go(c)} AS ${alias()} ORDER BY ${ord.mkString(", ")} LIMIT $k)"
      case Join(l, r, on) =>
        val la = alias(); val ra = alias()
        val cond = on.map { case (lc, rc) => s"$la.$lc = $ra.$rc" }.mkString(" AND ")
        s"(SELECT * FROM ${go(l)} AS $la JOIN ${go(r)} AS $ra ON $cond)"
      case UnionAll(l, r) =>
        s"(${go(l)} UNION ALL ${go(r)})"
      case Distinct(c) =>
        s"(SELECT DISTINCT * FROM ${go(c)} AS ${alias()})"
    }
    s"SELECT * FROM ${go(op)} AS q"
  }
}
