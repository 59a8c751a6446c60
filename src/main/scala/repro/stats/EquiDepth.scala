package repro.stats

import org.apache.spark.sql.DataFrame
import repro.algebra.Lineage.compareAny

/** One-dimensional equi-depth histogram statistics.
  *
  * PBDS derives partition ranges from "the one-dimensional equi-depth
  * histograms maintained as statistics by the DBMS" (paper Sec. 9.3). Spark
  * keeps no such stats for arbitrary DataFrames, so this substrate computes
  * them: a deterministic sample is sorted and boundary values picked at equal
  * ranks. Also provides the min/max column stats used to bound attribute
  * values in `pred(Q)` (Sec. 5.2).
  */
object EquiDepth {

  /** `n-1` boundary values splitting `attr` into `n` ≈equal-depth fragments.
    * Duplicate boundaries (heavy hitters) are deduplicated, so the result
    * may define fewer than `n` fragments.
    */
  def boundaries(df: DataFrame, attr: String, n: Int,
                 sampleCap: Long = 200000L, seed: Long = 7): IndexedSeq[Any] = {
    require(n >= 1, "need at least one fragment")
    if (n == 1) return Vector.empty
    val cnt = df.count()
    if (cnt == 0) return Vector.empty
    val fraction = math.min(1.0, sampleCap.toDouble / cnt)
    val sampled =
      (if (fraction < 1.0) df.select(attr).sample(withReplacement = false, fraction, seed)
       else df.select(attr))
        .collect().map(_.get(0))
    val sorted = sampled.sortWith((a, b) => compareAny(a, b) < 0)
    if (sorted.isEmpty) return Vector.empty
    val raw = (1 until n).map { i =>
      sorted(math.min(sorted.length - 1, (i.toLong * sorted.length / n).toInt))
    }
    // dedupe + drop a trailing boundary equal to the global max (it would
    // leave the last fragment empty)
    val deduped = raw.foldLeft(Vector.empty[Any]) { (acc, b) =>
      if (acc.nonEmpty && compareAny(acc.last, b) == 0) acc else acc :+ b
    }
    if (deduped.nonEmpty && compareAny(deduped.last, sorted.last) == 0) deduped.init
    else deduped
  }

  /** (min, max) of a column — the statistics used by pred(Q). */
  def minMax(df: DataFrame, attr: String): (Any, Any) = {
    import org.apache.spark.sql.functions.{max, min}
    val r = df.agg(min(attr), max(attr)).head()
    (r.get(0), r.get(1))
  }
}
