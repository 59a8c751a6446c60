package repro.core

import java.nio.file.Files

import org.apache.spark.sql.catalyst.plans.logical.Filter
import repro.{Fixtures, SparkSpec}
import repro.algebra._
import repro.storage.ZoneMapStore

/** Catalyst integration: sketches injected as scan filters via
  * `experimental.extraOptimizations` (the repo's extension-point layering).
  */
class SketchFilterRuleSpec extends SparkSpec {

  private lazy val repo = new SketchRepository
  private lazy val dir: String = {
    val d = Files.createTempDirectory("rule").toString
    val df = Fixtures.sparkDf(spark, Fixtures.citiesSchema, Fixtures.citiesRows)
    ZoneMapStore.write(df, d, "popden", 2)
    SketchFilterRule.install(spark, repo)
    d
  }
  private val fPopden = RangePartition("cities", "popden", TLong, Fixtures.popdenBounds.toIndexedSeq)

  override def afterAll(): Unit = { repo.clear(); super.afterAll() }

  test("registered sketch restricts a plain parquet scan") {
    repo.register(dir, CapturedSketch(fPopden, BitSketch.fromFragments(2, Seq(1))))
    try {
      val rows = spark.read.parquet(dir).count()
      assert(rows == 4) // only g2 rows (popden > 4000)
    } finally repo.clear()
  }

  test("no registration: scan is untouched") {
    assert(spark.read.parquet(dir).count() == 7)
  }

  test("injected filter appears exactly once in the optimized plan") {
    repo.register(dir, CapturedSketch(fPopden, BitSketch.fromFragments(2, Seq(1))))
    try {
      val df = spark.read.parquet(dir).groupBy("state").count()
      val optimized = df.queryExecution.optimizedPlan
      val filters = optimized.collect { case f: Filter => f }
      assert(filters.size == 1, s"plan:\n$optimized")
      df.collect() // plan executes fine
    } finally repo.clear()
  }

  test("query semantics preserved for a safe sketch (full coverage)") {
    // a full sketch must not change any result
    repo.register(dir, CapturedSketch(fPopden, BitSketch.full(2)))
    try {
      val got = spark.read.parquet(dir).groupBy("state").count()
        .collect().map(r => (r.getString(0), r.getLong(1))).toMap
      assert(got == Map("AK" -> 1L, "CA" -> 2L, "NY" -> 2L, "TX" -> 2L))
    } finally repo.clear()
  }

  test("empty sketch yields an empty scan") {
    repo.register(dir, CapturedSketch(fPopden, BitSketch.empty(2)))
    try assert(spark.read.parquet(dir).count() == 0)
    finally repo.clear()
  }

  test("repository path normalization") {
    val r = new SketchRepository
    val s = CapturedSketch(fPopden, BitSketch.full(2))
    r.register("file:///a/b/", s)
    assert(r.lookup("/a/b").isDefined)
    assert(r.lookup("file:/a/b").isDefined)
    r.unregister("/a/b")
    assert(r.size == 0)
  }

  test("install is idempotent") {
    SketchFilterRule.install(spark, repo)
    SketchFilterRule.install(spark, repo)
    val n = spark.experimental.extraOptimizations.count(_.isInstanceOf[SketchFilterRule])
    assert(n == 1)
  }
}

/** Self-tuning manager behaviour (Sec. 9.5 strategies). */
class PbdsSpec extends SparkSpec {
  import Fixtures._
  import repro.storage.MemTableStore

  private lazy val citiesDf = sparkDf(spark, citiesSchema, citiesRows)
  private lazy val store = new MemTableStore(Map("cities" -> citiesDf))
  private val fState = RangePartition("cities", "state", TString, stateBounds.toIndexedSeq)
  private val stats = SafetyChecker.Stats(Map("popden" -> (2000L, 7000L)))

  /** Ex. 7 template: HAVING count with two parameters. */
  private val tmpl = Template("ex7", Select(Col("cnt") > Param("p2"),
    Aggregate(Seq("state"), Seq(Agg(FCount, Col("city"), "cnt")),
      Select(Col("popden") >= Param("p1"), cities))))

  private def manager(strategy: Pbds.Strategy = Pbds.Eager,
                      selEst: Double = 0.0) =
    new PbdsManager(spark, store, Map("cities" -> Seq(fState)), stats, strategy,
      selectivityEstimate = (_, _) => selEst)

  private def resultSet(df: org.apache.spark.sql.DataFrame): Set[String] =
    df.collect().map(_.toSeq.mkString("|")).toSet

  test("eager: capture on miss, use on hit, reuse on compatible binding") {
    val m = manager()
    val b1 = Map[String, Any]("p1" -> 2000L, "p2" -> 1L)
    val (df1, d1) = m.run(tmpl, b1)
    assert(d1.action == Pbds.CaptureRun)
    val plain = resultSet(df1)

    val (df2, d2) = m.run(tmpl, b1)
    assert(d2.action == Pbds.SketchUse && d2.reusedFrom.contains(b1))
    assert(resultSet(df2) == plain)

    // compatible: tighter inner selection — strictly more selective
    val b3 = Map[String, Any]("p1" -> 3000L, "p2" -> 1L)
    val (df3, d3) = m.run(tmpl, b3)
    assert(d3.action == Pbds.SketchUse && d3.reusedFrom.contains(b1))
    val direct = ToSpark.compile(Algebra.bind(tmpl.op, b3), Map("cities" -> citiesDf))
    assert(resultSet(df3) == resultSet(direct))
  }

  test("eager: incompatible binding triggers a second capture") {
    val m = manager()
    val tight = Map[String, Any]("p1" -> 4000L, "p2" -> 1L)
    val loose = Map[String, Any]("p1" -> 2000L, "p2" -> 1L)
    assert(m.run(tmpl, tight)._2.action == Pbds.CaptureRun)
    assert(m.run(tmpl, loose)._2.action == Pbds.CaptureRun) // cannot reuse tighter sketch
    assert(m.sketchesFor("ex7").size == 2)
    // and now the tight one hits the loose sketch via reuse
    assert(m.run(tmpl, tight)._2.action == Pbds.SketchUse)
  }

  test("adaptive: waits for evidence before capturing") {
    val m = manager(Pbds.Adaptive(evidenceThreshold = 3))
    val b = Map[String, Any]("p1" -> 2000L, "p2" -> 1L)
    assert(m.run(tmpl, b)._2.action == Pbds.NoPs)
    assert(m.run(tmpl, b)._2.action == Pbds.NoPs)
    assert(m.run(tmpl, b)._2.action == Pbds.CaptureRun)
    assert(m.run(tmpl, b)._2.action == Pbds.SketchUse)
  }

  test("unsafe template never uses sketches") {
    // avg-based top-1 with sketch on popden is unsafe (Ex. 5)
    val m = new PbdsManager(spark, store,
      Map("cities" -> Seq(RangePartition("cities", "popden", TLong, popdenBounds.toIndexedSeq))),
      stats)
    val t = Template("q2", TopK(Seq(("avgden", false)), 1,
      Aggregate(Seq("state"), Seq(Agg(FAvg, Col("popden"), "avgden")),
        Select(Col("popden") > Param("p"), cities))))
    for (_ <- 1 to 3)
      assert(m.run(t, Map("p" -> 0L))._2.action == Pbds.NoPs)
  }

  test("selectivity gate skips PBDS for non-selective queries") {
    val m = manager(selEst = 0.9)
    val b = Map[String, Any]("p1" -> 2000L, "p2" -> 1L)
    assert(m.run(tmpl, b)._2.action == Pbds.NoPs)
    assert(m.sketchesFor("ex7").isEmpty)
  }

  test("top-k re-validation falls back when the sketch is too small") {
    val m = manager()
    val t = Template("top5", TopK(Seq(("avgden", false), ("state", true)), 5,
      Aggregate(Seq("state"), Seq(Agg(FAvg, Col("popden"), "avgden")),
        Select(Col("popden") >= Param("p"), cities))))
    val b = Map[String, Any]("p" -> 2000L)
    assert(m.run(t, b)._2.action == Pbds.CaptureRun)
    // only 4 states exist — the top-5 input can never reach k=5 rows, so the
    // conservative re-validation refuses the sketch
    assert(m.run(t, b)._2.action == Pbds.Fallback)
  }

  test("top-k use succeeds when the sketch covers k rows") {
    val m = manager()
    val t = Template("top2", TopK(Seq(("avgden", false), ("state", true)), 2,
      Aggregate(Seq("state"), Seq(Agg(FAvg, Col("popden"), "avgden")),
        Select(Col("popden") >= Param("p"), cities))))
    val b = Map[String, Any]("p" -> 2000L)
    assert(m.run(t, b)._2.action == Pbds.CaptureRun)
    val (df, d) = m.run(t, b)
    assert(d.action == Pbds.SketchUse)
    val direct = ToSpark.compile(Algebra.bind(t.op, b), Map("cities" -> citiesDf))
    assert(resultSet(df) == resultSet(direct))
  }
}
