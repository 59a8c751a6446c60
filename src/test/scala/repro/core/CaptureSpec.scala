package repro.core

import repro.{Fixtures, SparkSpec}
import repro.algebra._
import Fixtures._
import Capture._

/** Sketch capture (Sec. 7) against the Lineage interpreter ground truth. */
class CaptureSpec extends SparkSpec {

  private lazy val citiesDf = sparkDf(spark, citiesSchema, citiesRows)
  private lazy val catalog  = Map("cities" -> citiesDf)
  private lazy val db       = citiesDb

  private val fState  = RangePartition("cities", "state", TString, stateBounds.toIndexedSeq)
  private val fPopden = RangePartition("cities", "popden", TLong, popdenBounds.toIndexedSeq)

  private def expectedFrags(q: Op, p: RangePartition): Set[Int] = {
    val prov = Lineage.provenance(q, db).filter(_._1 == p.table).map(_._2)
    val rows = db(p.table)
    prov.map(i => p.fragmentOf(rows(i.toInt)(p.attr)))
  }

  test("Ex. 3: sketch of Q2 on F_state is {f1}") {
    val s = capture(q2, Seq(fState), catalog)("cities")
    assert(s.fragments == Seq(0))
  }
  test("sketch of Q2 on F_popden is {g2}") {
    val s = capture(q2, Seq(fPopden), catalog)("cities")
    assert(s.fragments == Seq(1))
  }
  test("sketch of Q1 (selection only) on F_state is {f1}") {
    val s = capture(q1, Seq(fState), catalog)("cities")
    assert(s.fragments == Seq(0))
  }
  test("sketch of the having query matches lineage on both partitions") {
    val q = qPopState(10000L, ">")
    for (p <- Seq(fState, fPopden)) {
      val s = capture(q, Seq(p), catalog)(p.table)
      assert(s.fragments.toSet == expectedFrags(q, p), s"partition=${p.attr}")
    }
  }
  test("all init × merge configurations agree (Sec. 7.3 optimizations)") {
    val configs = for {
      init  <- Seq(CaseInit, BinSearchInit)
      merge <- Seq(NaiveMerge, DelayMerge, NoCopyMerge)
    } yield Config(init, merge)
    val expected = capture(q2, Seq(fState), catalog).apply("cities").fragments
    for (cfg <- configs) {
      val s = capture(q2, Seq(fState), catalog, cfg)("cities")
      assert(s.fragments == expected, s"cfg=$cfg")
    }
  }
  test("global min/max with precise refinement keeps only extreme rows") {
    val q = Aggregate(Seq.empty, Seq(Agg(FMax, Col("popden"), "m")), cities)
    val s = capture(q, Seq(fState), catalog, Config(preciseMinMax = true))("cities")
    assert(s.fragments == Seq(2)) // t4 New York (7000) is in f3
    val loose = capture(q, Seq(fState), catalog, Config(preciseMinMax = false))("cities")
    assert(loose.fragments == Seq(0, 2, 3)) // whole table
    assert(s.bits.subsetOf(loose.bits))
  }
  test("grouped min with precise refinement") {
    val q = Aggregate(Seq("state"), Seq(Agg(FMin, Col("popden"), "m")), cities)
    val s = capture(q, Seq(fPopden), catalog)("cities")
    assert(s.fragments.toSet == expectedFrags(q, fPopden))
  }
  test("top-k keeps only contributing groups (Q2 variants)") {
    // top-1 by avgden asc → TX group (3100): popden 3700,2500 → g1 only
    val q = TopK(Seq(("avgden", true)), 1,
      Aggregate(Seq("state"), Seq(Agg(FAvg, Col("popden"), "avgden")), cities))
    val s = capture(q, Seq(fPopden), catalog)("cities")
    assert(s.fragments.toSet == expectedFrags(q, fPopden))
  }
  test("join propagates annotations from both tables") {
    val info = TableRef("info", Seq("st2" -> TString, "pop2" -> TLong))
    val infoRows = Seq(Seq("CA", 1L), Seq("NY", 2L), Seq("TX", 3L))
    val infoDf = sparkDf(spark, info.schema, infoRows)
    val fInfo = RangePartition("info", "pop2", TLong, Vector(1L, 2L))
    val q = Aggregate(Seq("state"), Seq(Agg(FSum, Col("popden"), "s")),
      Select(Col("pop2") >= Lit(2L), Join(cities, info, Seq(("state", "st2")))))
    val cat2 = catalog + ("info" -> infoDf)
    val db2 = db + ("info" -> lineageTable(info.schema, infoRows))
    val sketches = capture(q, Seq(fState, fInfo), cat2)
    val provC = Lineage.provenance(q, db2).filter(_._1 == "cities").map(_._2)
      .map(i => fState.fragmentOf(db2("cities")(i.toInt)("state")))
    val provI = Lineage.provenance(q, db2).filter(_._1 == "info").map(_._2)
      .map(i => fInfo.fragmentOf(db2("info")(i.toInt)("pop2")))
    assert(sketches("cities").fragments.toSet == provC)
    assert(sketches("info").fragments.toSet == provI)
  }
  test("distinct merges duplicate annotations") {
    val q = Distinct(Project(Seq((Col("state"), "state")), cities))
    val s = capture(q, Seq(fPopden), catalog)("cities")
    assert(s.fragments.toSet == expectedFrags(q, fPopden))
  }
  test("union all requires matching annotations and unions them") {
    val q = Aggregate(Seq.empty, Seq(Agg(FCount, Col("state"), "c")),
      UnionAll(Select(Col("state") === Lit("CA"), cities),
               Select(Col("state") === Lit("TX"), cities)))
    // cities accessed twice — the paper's single-access assumption; our
    // implementation still produces a covering sketch for the union.
    val s = capture(q, Seq(fState), catalog)("cities")
    assert(s.fragments == Seq(0, 3))
  }
  test("empty query result yields the empty sketch") {
    val q = Select(Col("state") === Lit("ZZ"), cities)
    val s = capture(q, Seq(fState), catalog)("cities")
    assert(s.bits.isEmpty)
  }
  test("capture without any matching partition is rejected") {
    intercept[IllegalArgumentException](capture(q2, Seq.empty, catalog))
  }
  test("projection keeps annotations (arith expressions)") {
    val q = Aggregate(Seq.empty, Seq(Agg(FSum, Col("x"), "sx")),
      Select(Col("x") > Lit(5000L),
        Project(Seq(((Col("popden") + Lit(100L)), "x"), (Col("state"), "state")), cities)))
    val s = capture(q, Seq(fPopden), catalog)("cities")
    assert(s.fragments.toSet == expectedFrags(q, fPopden))
  }
}

/** Q[P] instrumentation and runtime behaviour (Sec. 8). */
class UseSpec extends SparkSpec {

  private lazy val citiesDf = sparkDf(spark, citiesSchema, citiesRows)
  private lazy val catalog  = Map("cities" -> citiesDf)
  private lazy val db       = citiesDb

  private val fState  = RangePartition("cities", "state", TString, stateBounds.toIndexedSeq)
  private val fPopden = RangePartition("cities", "popden", TLong, popdenBounds.toIndexedSeq)

  test("instrument wraps the table access in the decoded selection") {
    val s = CapturedSketch(fState, BitSketch.fromFragments(4, Seq(0)))
    Use.instrument(q2, Map("cities" -> s)) match {
      case TopK(_, _, Aggregate(_, _, Select(p, _: TableRef))) =>
        assert(p == (Col("state") <= Lit("DE~")))
      case other => fail(s"unexpected shape $other")
    }
  }
  test("Ex. 4: Q2[P_state] returns the original result") {
    val sketches = Capture.capture(q2, Seq(fState), catalog)
    val inst = Use.instrument(q2, sketches)
    assert(Lineage.sameResult(Lineage.result(inst, db), Lineage.result(q2, db)))
    // and on Spark against the DuckDB oracle
    repro.Oracle.assertEquivalent(
      ToSpark.compile(inst, catalog), ToSql.compile(inst), "cities" -> citiesDf)
  }
  test("Ex. 5: the accurate popden sketch is UNSAFE for Q2") {
    val sketches = Capture.capture(q2, Seq(fPopden), catalog)
    assert(sketches("cities").fragments == Seq(1)) // accurate: {g2}
    val r = Lineage.result(Use.instrument(q2, sketches), db)
    assert(r.head("state") == "NY") // wrong answer, as in the paper
    assert(!Lineage.sameResult(r, Lineage.result(q2, db)))
  }
  test("filteredCatalog OR-decode and binary-search membership agree") {
    val sketches = Capture.capture(q2, Seq(fState), catalog)
    val a = Use.filteredCatalog(catalog, sketches, binarySearch = false)("cities")
      .collect().map(_.toString).sorted.toSeq
    val b = Use.filteredCatalog(catalog, sketches, binarySearch = true)("cities")
      .collect().map(_.toString).sorted.toSeq
    assert(a == b && a.size == 3) // the three f1 rows
  }
  test("revalidateTopK accepts a sufficient sketch") {
    val sketches = Capture.capture(q2, Seq(fState), catalog)
    assert(Use.revalidateTopK(q2, sketches, catalog))
  }
  test("revalidateTopK flags an insufficient sketch") {
    // top-5 groups but the sketch covers only fragment f1 (2 groups: AK, CA)
    val q = TopK(Seq(("avgden", false)), 5,
      Aggregate(Seq("state"), Seq(Agg(FAvg, Col("popden"), "avgden")), cities))
    val tiny = Map("cities" -> CapturedSketch(fState, BitSketch.fromFragments(4, Seq(0))))
    assert(!Use.revalidateTopK(q, tiny, catalog))
  }
  test("sketch of all fragments decodes to PTrue (no-op filter)") {
    val s = CapturedSketch(fState, BitSketch.full(4))
    assert(s.toPred == PTrue)
    assert(Lineage.result(Use.instrument(q2, Map("cities" -> s)), db).size == 1)
  }
  test("union/covers on captured sketches (Lemma 5)") {
    val a = CapturedSketch(fState, BitSketch.fromFragments(4, Seq(0)))
    val b = CapturedSketch(fState, BitSketch.fromFragments(4, Seq(2)))
    val u = a.union(b)
    assert(u.fragments == Seq(0, 2) && u.covers(a) && u.covers(b) && !a.covers(u))
  }
}
