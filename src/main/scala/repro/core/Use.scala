package repro.core

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.functions.udf
import repro.algebra._

/** Using provenance sketches (paper Sec. 8).
  *
  * `Q[P]` is the identity on every operator except table accesses, which are
  * wrapped in a selection decoding the sketch (Eq. 2). Two decodings are
  * provided, matching the paper's optimizations (Sec. 8.1): the OR of merged
  * adjacent ranges (exploitable by zone maps / Parquet pushdown) and an
  * O(log n) binary-search membership UDF (faster for sketches with very many
  * selected fragments on systems without skipping, Fig. 11c/f).
  */
object Use {

  /** IR-level instrumentation Q[P]. */
  def instrument(q: Op, sketches: Map[String, CapturedSketch]): Op =
    Algebra.transformTables(q) { t =>
      sketches.get(t.name) match {
        case Some(s) => Select(s.toPred, t)
        case None    => t
      }
    }

  /** Membership test via binary search over the partition's ranges. */
  def membershipColumn(s: CapturedSketch): Column = {
    val p = s.partition
    val bits = s.bits
    def test(i: Int): Boolean = bits.get(i)
    val f = p.attrType match {
      case TLong   => udf((v: Long) => test(p.fragmentOf(v)))
      case TInt    => udf((v: Int) => test(p.fragmentOf(v)))
      case TDouble => udf((v: Double) => test(p.fragmentOf(v)))
      case TString => udf((v: String) => test(p.fragmentOf(v)))
      case TDate   => udf((v: java.sql.Date) => test(p.fragmentOf(v)))
    }
    f(org.apache.spark.sql.functions.col(p.attr))
  }

  /** Catalog with sketched tables pre-filtered at the DataFrame level. */
  def filteredCatalog(catalog: Map[String, DataFrame],
                      sketches: Map[String, CapturedSketch],
                      binarySearch: Boolean = false): Map[String, DataFrame] =
    catalog.map { case (name, df) =>
      name -> (sketches.get(name) match {
        case Some(s) if binarySearch => df.filter(membershipColumn(s))
        case Some(s)                 => df.filter(s.toColumn)
        case None                    => df
      })
    }

  /** Runtime re-validation for τ_{O,C} (paper footnote 1): under the sketch,
    * every top-k input must still hold at least C tuples, otherwise the
    * sketch-restricted answer may be short and the caller must fall back.
    */
  def revalidateTopK(q: Op, sketches: Map[String, CapturedSketch],
                     catalog: Map[String, DataFrame]): Boolean = {
    def topKs(op: Op): Seq[TopK] = (op match {
      case t: TopK => Seq(t)
      case _       => Seq.empty
    }) ++ op.children.flatMap(topKs)
    topKs(q).forall { tk =>
      val input = instrument(tk.child, sketches)
      ToSpark.compile(input, catalog).limit(tk.k).count() >= tk.k
    }
  }
}
