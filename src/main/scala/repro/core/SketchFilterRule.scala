package repro.core

import scala.collection.concurrent.TrieMap

import org.apache.spark.sql.SparkSession
import org.apache.spark.sql.catalyst.expressions._
import org.apache.spark.sql.catalyst.plans.logical.{Filter, LogicalPlan}
import org.apache.spark.sql.catalyst.rules.Rule
import org.apache.spark.sql.catalyst.trees.TreeNodeTag
import org.apache.spark.sql.execution.datasources.{HadoopFsRelation, LogicalRelation}

/** Registry mapping file-source root paths to captured sketches, consulted
  * by [[SketchFilterRule]] at optimization time.
  */
final class SketchRepository {
  private val byPath = TrieMap.empty[String, CapturedSketch]

  private def normalize(p: String): String = p.stripSuffix("/").replaceFirst("^file:/*", "/")

  def register(path: String, sketch: CapturedSketch): Unit = byPath(normalize(path)) = sketch
  def unregister(path: String): Unit = byPath.remove(normalize(path))
  def clear(): Unit = byPath.clear()
  def lookup(path: String): Option[CapturedSketch] = byPath.get(normalize(path))
  def size: Int = byPath.size
}

/** The Catalyst extension point of this reproduction: a `Rule[LogicalPlan]`
  * injected via `spark.experimental.extraOptimizations` that rewrites every
  * file scan whose root path has a registered sketch into
  * `Filter(sketch-ranges, scan)`. Although the main optimizer batches have
  * already run, `FileSourceStrategy` collects filters directly above a
  * `LogicalRelation` during physical planning, so the decoded condition is
  * pushed into the Parquet reader — row-group (zone) skipping happens
  * exactly as with the paper's zone maps.
  */
final class SketchFilterRule(repo: SketchRepository) extends Rule[LogicalPlan] {

  override def apply(plan: LogicalPlan): LogicalPlan = plan transformUp {
    case lr: LogicalRelation if applicable(lr).isDefined =>
      val (sketch, attrRef) = applicable(lr).get
      lr.setTagValue(SketchFilterRule.AppliedTag, true)
      Filter(SketchFilterRule.condition(sketch, attrRef), lr)
  }

  private def applicable(lr: LogicalRelation): Option[(CapturedSketch, Attribute)] = {
    if (lr.getTagValue(SketchFilterRule.AppliedTag).contains(true)) return None
    lr.relation match {
      case fs: HadoopFsRelation =>
        for {
          root   <- fs.location.rootPaths.headOption
          sketch <- repo.lookup(root.toString)
          attr   <- lr.output.find(_.name == sketch.partition.attr)
        } yield (sketch, attr)
      case _ => None
    }
  }
}

object SketchFilterRule {
  val AppliedTag: TreeNodeTag[Boolean] = TreeNodeTag[Boolean]("pbds.sketch.applied")

  /** Decode a sketch into a resolved Catalyst predicate on `attr`. */
  def condition(s: CapturedSketch, attr: Attribute): Expression = {
    val frags = s.fragments
    if (frags.isEmpty) return Literal.FalseLiteral
    if (s.bits.isFull) return Literal.TrueLiteral
    val parts = s.partition.mergedRanges(frags).map[Expression] {
      case (None, Some(h))    => LessThanOrEqual(attr, Literal(h))
      case (Some(l), Some(h)) => And(GreaterThan(attr, Literal(l)), LessThanOrEqual(attr, Literal(h)))
      case (Some(l), None)    => GreaterThan(attr, Literal(l))
      case (None, None)       => Literal.TrueLiteral
    }
    RangePartition.balanced(parts)(Or(_, _))
  }

  /** Install the rule once per session (idempotent). */
  def install(spark: SparkSession, repo: SketchRepository): SketchFilterRule = {
    val rule = new SketchFilterRule(repo)
    val existing = spark.experimental.extraOptimizations
    if (!existing.exists(_.isInstanceOf[SketchFilterRule]))
      spark.experimental.extraOptimizations = existing :+ rule
    rule
  }
}
