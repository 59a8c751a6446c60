package repro.storage

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.algebra.Lineage.compareAny
import repro.core.{BitSketch, CapturedSketch}

/** One zone: a Parquet file with min/max statistics on the zone attribute. */
final case class FileZone(path: String, min: Any, max: Any, rows: Long)

/** Zone-mapped Parquet dataset — the physical-design substrate sketches
  * exploit (the paper's Postgres brin/zone-map analog, Sec. 8/9).
  *
  * `write` range-clusters a table into N sorted files; the zone map records
  * per-file min/max of the clustering attribute. A sketch's merged ranges
  * then prune whole files before Spark ever opens them, so runtime scales
  * with the covered fraction — the same observable behaviour as a zone-map
  * index scan in the paper's disk-based system.
  */
final class ZoneMapStore(val path: String, val attr: String, val zones: Seq[FileZone]) {

  def totalRows: Long = zones.map(_.rows).sum
  def nFiles: Int = zones.size

  // Memoized DataFrame handles: repeated executions of the same (or a
  // reused) sketch should not pay file listing + plan construction again —
  // the DBMS analog keeps prepared plans. Keyed per session and sketch.
  private val scanCache =
    scala.collection.concurrent.TrieMap.empty[(SparkSession, Option[BitSketch]), (DataFrame, Int)]

  /** Full scan — the No-PS baseline. */
  def scanAll(spark: SparkSession): DataFrame =
    scanCache.getOrElseUpdate((spark, None), (spark.read.parquet(path), nFiles))._1

  private def overlaps(z: FileZone, lo: Option[Any], hi: Option[Any]): Boolean =
    lo.forall(l => compareAny(l, z.max) < 0) && hi.forall(h => compareAny(z.min, h) <= 0)

  /** Files overlapping any of the (lo-exclusive, hi-inclusive] ranges. */
  def matchingFiles(ranges: Seq[(Option[Any], Option[Any])]): Seq[FileZone] =
    zones.filter(z => ranges.exists { case (lo, hi) => overlaps(z, lo, hi) })

  /** Sketch-driven scan: read only overlapping files, then apply the sketch
    * predicate as a residual filter (zones are file-granular). Returns the
    * DataFrame and the number of files read (the skipping measure).
    *
    * Residual decode follows Sec. 8.1: the OR of merged ranges when small
    * (Parquet pushes it down → row-group skipping inside the surviving
    * files), the O(log n) binary-search membership UDF when the sketch has
    * many disjoint ranges — evaluating thousands of disjunctions per tuple
    * would otherwise dominate, exactly the pathology the paper optimizes.
    */
  def prunedScan(spark: SparkSession, sketch: CapturedSketch): (DataFrame, Int) = {
    require(sketch.partition.attr == attr,
      s"sketch attr ${sketch.partition.attr} does not match zone attr $attr")
    scanCache.getOrElseUpdate((spark, Some(sketch.bits)), {
      val frags = sketch.fragments
      if (frags.isEmpty) (scanAll(spark).filter(lit(false)), 0)
      else if (sketch.bits.isFull) (scanAll(spark), nFiles)
      else {
        val ranges = sketch.partition.mergedRanges(frags)
        val files = matchingFiles(ranges)
        if (files.isEmpty) (scanAll(spark).filter(lit(false)), 0)
        else {
          val residual =
            if (ranges.size <= 512) sketch.toColumn
            else repro.core.Use.membershipColumn(sketch)
          (spark.read.parquet(files.map(_.path): _*).filter(residual), files.size)
        }
      }
    })
  }
}

object ZoneMapStore {

  /** Range-cluster `df` on `attr` into ~`nFiles` sorted Parquet files.
    *
    * Small row groups (128 KB) make each file carry many min/max zones, so
    * a pushed-down sketch predicate skips at fine granularity *inside* the
    * files Spark does open — the analog of the paper's btree/brin access
    * paths, which operate at page granularity, not file granularity.
    */
  def write(df: DataFrame, path: String, attr: String, nFiles: Int): ZoneMapStore = {
    df.repartitionByRange(nFiles, col(attr))
      .sortWithinPartitions(attr)
      .write.mode("overwrite")
      .option("parquet.block.size", 128 * 1024)
      .option("parquet.page.size", 32 * 1024)
      .parquet(path)
    load(df.sparkSession, path, attr)
  }

  /** Rebuild the zone map from the files on disk (one stats pass). */
  def load(spark: SparkSession, path: String, attr: String): ZoneMapStore = {
    val zones = spark.read.parquet(path)
      .groupBy(input_file_name().as("_file"))
      .agg(min(col(attr)).as("_min"), max(col(attr)).as("_max"), count(lit(1)).as("_rows"))
      .collect()
      .map(r => FileZone(r.getString(0), r.get(1), r.get(2), r.getLong(3)))
      .sortWith((a, b) => compareAny(a.min, b.min) < 0)
    new ZoneMapStore(path, attr, zones.toSeq)
  }
}
