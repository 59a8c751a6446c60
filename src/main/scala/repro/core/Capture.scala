package repro.core

import org.apache.spark.sql.{Column, DataFrame, Encoders}
import org.apache.spark.sql.catalyst.encoders.ExpressionEncoder
import org.apache.spark.sql.expressions.{Aggregator, UserDefinedFunction}
import org.apache.spark.sql.{functions => F}
import org.apache.spark.sql.functions._
import repro.algebra._

/** Provenance-sketch capture by query instrumentation (paper Sec. 7, Fig. 6).
  *
  * The input query is compiled bottom-up like `ToSpark`, but every sketched
  * base table gains an annotation column `_ps_<table>` (rule r0/INIT) that is
  * propagated through σ/Π/τ/⋈/∪ unchanged (r1, r2, r4–r6), merged with a
  * BITOR aggregate at every γ/δ (r3), and folded into a single bitvector per
  * table by a final global BITOR (r7).
  *
  * The Sec. 7.3 optimizations are reproduced as configuration:
  *   - init: `CaseInit` chained CASE (O(|F|)/row) vs `BinSearchInit`
  *     binary-search UDF (O(log|F|)/row);
  *   - merge: `NaiveMerge` copies the bitset buffer on every row (Postgres'
  *     stock bit_or), `NoCopyMerge` mutates word-wise, `DelayMerge`
  *     propagates the fragment *index* until the first aggregate and only
  *     then materializes bitsets;
  *   - preciseMinMax: r3's min/max refinement — only extreme-achieving rows
  *     contribute, via a join-back on the aggregate value.
  */
object Capture {

  sealed trait InitMethod
  case object CaseInit extends InitMethod
  case object BinSearchInit extends InitMethod

  sealed trait MergeMethod
  case object NaiveMerge extends MergeMethod
  case object DelayMerge extends MergeMethod
  case object NoCopyMerge extends MergeMethod

  final case class Config(init: InitMethod = BinSearchInit,
                          merge: MergeMethod = DelayMerge,
                          preciseMinMax: Boolean = true)

  /** Whether a λ column currently holds a fragment index or a bitset. */
  private sealed trait LState
  private case object FragIdx extends LState
  private case object Bitset extends LState

  private def lcol(table: String): String = s"_ps_$table"

  // --- aggregators ------------------------------------------------------

  private def arrayEnc: ExpressionEncoder[Array[Long]] = ExpressionEncoder[Array[Long]]()

  /** Delay-method merge: fragment indexes in, bitset out; mutates buffer. */
  final class FragToBitsetAgg(nFragments: Int) extends Aggregator[Int, Array[Long], Array[Long]] {
    def zero: Array[Long] = new Array[Long](BitSketch.nWords(nFragments))
    def reduce(b: Array[Long], i: Int): Array[Long] = { b(i >> 6) |= 1L << (i & 63); b }
    def merge(a: Array[Long], b: Array[Long]): Array[Long] = {
      var i = 0; while (i < a.length) { a(i) |= b(i); i += 1 }; a
    }
    def finish(r: Array[Long]): Array[Long] = r
    def bufferEncoder: ExpressionEncoder[Array[Long]] = arrayEnc
    def outputEncoder: ExpressionEncoder[Array[Long]] = arrayEnc
  }

  /** Bitset BITOR. `copy = true` reproduces the unoptimized Postgres
    * behaviour (fresh bitset per input row); `false` is the No-copy method.
    */
  final class BitsetOrAgg(nWords: Int, copy: Boolean) extends Aggregator[Array[Long], Array[Long], Array[Long]] {
    def zero: Array[Long] = new Array[Long](nWords)
    def reduce(b: Array[Long], in: Array[Long]): Array[Long] = {
      val tgt = if (copy) b.clone() else b
      var i = 0; while (i < nWords) { tgt(i) |= in(i); i += 1 }; tgt
    }
    def merge(a: Array[Long], b: Array[Long]): Array[Long] = {
      val tgt = if (copy) a.clone() else a
      var i = 0; while (i < nWords) { tgt(i) |= b(i); i += 1 }; tgt
    }
    def finish(r: Array[Long]): Array[Long] = r
    def bufferEncoder: ExpressionEncoder[Array[Long]] = arrayEnc
    def outputEncoder: ExpressionEncoder[Array[Long]] = arrayEnc
  }

  // --- INIT (r0 / Sec. 7.1) --------------------------------------------

  /** Fragment index of the partition attribute, by CASE chain or UDF. */
  def fragIndexColumn(p: RangePartition, init: InitMethod): Column = init match {
    case CaseInit      => p.caseColumn(col(p.attr)).cast("int")
    case BinSearchInit => binSearchUdf(p)(col(p.attr))
  }

  private def binSearchUdf(p: RangePartition): UserDefinedFunction = p.attrType match {
    case TLong   => udf((v: Long) => p.fragmentOf(v))
    case TInt    => udf((v: Int) => p.fragmentOf(v))
    case TDouble => udf((v: Double) => p.fragmentOf(v))
    case TString => udf((v: String) => p.fragmentOf(v))
    case TDate   => udf((v: java.sql.Date) => p.fragmentOf(v))
  }

  /** Singleton bitset (SNG) for the fragment of the attribute value. */
  private def sngUdf(p: RangePartition): UserDefinedFunction = {
    val nw = BitSketch.nWords(p.nFragments)
    def sng(i: Int): Array[Long] = { val w = new Array[Long](nw); w(i >> 6) |= 1L << (i & 63); w }
    p.attrType match {
      case TLong   => udf((v: Long) => sng(p.fragmentOf(v)))
      case TInt    => udf((v: Int) => sng(p.fragmentOf(v)))
      case TDouble => udf((v: Double) => sng(p.fragmentOf(v)))
      case TString => udf((v: String) => sng(p.fragmentOf(v)))
      case TDate   => udf((v: java.sql.Date) => sng(p.fragmentOf(v)))
    }
  }

  // --- capture ----------------------------------------------------------

  /** Instrument `q` and execute it, returning one sketch per partition.
    * Partitions must be safe for `q` (check with `SafetyChecker` first) for
    * the sketches to be usable; capture itself is partition-agnostic.
    */
  def capture(q: Op, partitions: Seq[RangePartition],
              catalog: Map[String, DataFrame],
              cfg: Config = Config()): Map[String, CapturedSketch] = {
    val parts = partitions.map(p => p.table -> p).toMap
    require(parts.size == partitions.size, "one partition per table")
    val (df, states) = prop(q, parts, catalog, cfg)
    require(states.nonEmpty, "no sketched table is accessed by the query")
    // r7: final global BITOR over every annotation column.
    val aggs = states.toSeq.map { case (t, st) => mergeAgg(parts(t), st, cfg)(col(lcol(t))).as(lcol(t)) }
    val row = df.agg(aggs.head, aggs.tail: _*).head()
    states.keys.map { t =>
      val words = row.getAs[scala.collection.Seq[Long]](lcol(t)).toArray
      t -> CapturedSketch(parts(t), BitSketch.fromWords(parts(t).nFragments, words))
    }.toMap
  }

  private def mergeAgg(p: RangePartition, st: LState, cfg: Config): UserDefinedFunction = st match {
    case FragIdx => F.udaf(new FragToBitsetAgg(p.nFragments), Encoders.scalaInt)
    case Bitset  => F.udaf(new BitsetOrAgg(BitSketch.nWords(p.nFragments),
                      copy = cfg.merge == NaiveMerge), arrayEnc)
  }

  private def prop(op: Op, parts: Map[String, RangePartition],
                   catalog: Map[String, DataFrame], cfg: Config): (DataFrame, Map[String, LState]) =
    op match {
      case TableRef(name, schema) =>
        val base = catalog.getOrElse(name, sys.error(s"table $name not in catalog"))
          .select(schema.map(f => col(f._1)): _*)
        parts.get(name) match {
          case None => (base, Map.empty)
          case Some(p) =>
            require(schema.exists(_._1 == p.attr), s"partition attr ${p.attr} not in $name")
            cfg.merge match {
              case DelayMerge =>
                (base.withColumn(lcol(name), fragIndexColumn(p, cfg.init)), Map(name -> FragIdx))
              case _ =>
                (base.withColumn(lcol(name), sngUdf(p)(col(p.attr))), Map(name -> Bitset))
            }
        }
      case Select(pred, c) =>
        val (df, st) = prop(c, parts, catalog, cfg)
        (df.filter(ToSpark.pred(pred)), st)
      case Project(items, c) =>
        val (df, st) = prop(c, parts, catalog, cfg)
        val cols = items.map { case (e, a) => ToSpark.expr(e).as(a) } ++ st.keys.map(t => col(lcol(t)))
        (df.select(cols.toSeq: _*), st)
      case Aggregate(g, aggs, c) =>
        val (df, st) = prop(c, parts, catalog, cfg)
        if (st.isEmpty) (ToSpark.compile(op, catalog), st)
        else if (cfg.preciseMinMax && aggs.size == 1 &&
                 (aggs.head.fn == FMin || aggs.head.fn == FMax))
          minMaxPrecise(df, g, aggs.head, st, parts, cfg)
        else {
          val cols = aggs.map(a => sparkAgg(a)) ++
            st.map { case (t, s) => mergeAgg(parts(t), s, cfg)(col(lcol(t))).as(lcol(t)) }
        val out =
          if (g.isEmpty) df.agg(cols.head, cols.tail: _*)
          else df.groupBy(g.map(col): _*).agg(cols.head, cols.tail: _*)
          (out, st.map { case (t, _) => t -> (Bitset: LState) })
        }
      case TopK(order, k, c) =>
        val (df, st) = prop(c, parts, catalog, cfg)
        (df.orderBy(order.map { case (n, asc) => if (asc) col(n).asc else col(n).desc }: _*).limit(k), st)
      case Join(l, r, on) =>
        val (lf, ls) = prop(l, parts, catalog, cfg)
        val (rf, rs) = prop(r, parts, catalog, cfg)
        val cond = on.map { case (lc, rc) => lf(lc) === rf(rc) }.reduce(_ && _)
        (lf.join(rf, cond, "inner"), ls ++ rs)
      case UnionAll(l, r) =>
        val (lf, ls) = prop(l, parts, catalog, cfg)
        val (rf, rs) = prop(r, parts, catalog, cfg)
        require(ls.keySet == rs.keySet && ls == rs,
          "union branches must carry identical sketch annotations")
        (lf.unionByName(rf), ls)
      case Distinct(c) =>
        // δ: not in Fig. 6 but needed for completeness — group on all value
        // columns and BITOR the annotations of collapsed duplicates.
        val (df, st) = prop(c, parts, catalog, cfg)
        if (st.isEmpty) (df.distinct(), st)
        else {
          val valueCols = c.columns
          val cols = st.map { case (t, s) => mergeAgg(parts(t), s, cfg)(col(lcol(t))).as(lcol(t)) }.toSeq
          (df.groupBy(valueCols.map(col): _*).agg(cols.head, cols.tail: _*),
           st.map { case (t, _) => t -> (Bitset: LState) })
        }
    }

  private def sparkAgg(a: Agg): Column = {
    val in = ToSpark.expr(a.input)
    (a.fn match {
      case FSum => sum(in); case FCount => count(in); case FMin => min(in)
      case FMax => max(in); case FAvg => avg(in)
    }).as(a.alias)
  }

  /** r3 for min/max: only rows achieving the group extreme contribute. */
  private def minMaxPrecise(df: DataFrame, g: Seq[String], a: Agg,
                            st: Map[String, LState], parts: Map[String, RangePartition],
                            cfg: Config): (DataFrame, Map[String, LState]) = {
    val in = ToSpark.expr(a.input)
    val aggDf = {
      val c = (if (a.fn == FMin) min(in) else max(in)).as(a.alias)
      if (g.isEmpty) df.agg(c) else df.groupBy(g.map(col): _*).agg(c)
    }
    // Rename the base side to dodge ambiguity, precompute the agg input.
    var base = df.withColumn("_ps_val", in)
    for (gc <- g) base = base.withColumnRenamed(gc, s"_ps_g_$gc")
    val cond = (g.map(gc => aggDf(gc) === base(s"_ps_g_$gc")) :+ (base("_ps_val") === aggDf(a.alias)))
      .reduce(_ && _)
    val joined = aggDf.join(base, cond, "inner")
    val merges = st.map { case (t, s) => mergeAgg(parts(t), s, cfg)(col(lcol(t))).as(lcol(t)) }.toSeq
    val out = joined.groupBy((g :+ a.alias).map(col): _*).agg(merges.head, merges.tail: _*)
    (out, st.map { case (t, _) => t -> (Bitset: LState) })
  }
}
