package repro.workloads

import org.apache.spark.sql.DataFrame
import repro.{Oracle, SparkSpec}
import repro.algebra._
import repro.core._

/** Shared helpers for workload validation: DuckDB oracle equivalence,
  * declared sketch-attribute safety, and Q[P] round-trips.
  */
trait WorkloadChecks { self: SparkSpec =>

  def rows(df: DataFrame): Seq[String] =
    df.collect().map(_.toSeq.map {
      case d: Double => f"$d%.6g"
      case x         => String.valueOf(x)
    }.mkString("|")).sorted.toSeq

  /** Capture sketches on the given table→attr map and check Q[P] ≡ Q. */
  def roundTrip(q: Op, sketchAttrs: Map[String, String],
                catalog: Map[String, DataFrame], nFrags: Int = 16): Map[String, CapturedSketch] = {
    val types = Algebra.baseTypes(q)
    val parts = sketchAttrs.map { case (t, a) =>
      RangePartition.equiDepth(catalog(t), t, a, types(a), nFrags)
    }.toSeq
    val sketches = Capture.capture(q, parts, catalog)
    val plain = rows(ToSpark.compile(q, catalog))
    val inst  = rows(ToSpark.compile(Use.instrument(q, sketches), catalog))
    assert(inst == plain, s"Q[P] result differs for sketches on $sketchAttrs")
    sketches
  }
}

class TpchLiteSpec extends SparkSpec with WorkloadChecks {
  import TpchLite._

  private val sf = 0.002
  private lazy val cat = catalog(spark, sf).map { case (k, v) => k -> v.cache() }

  private def oracleTables(q: Op): Seq[(String, DataFrame)] =
    Algebra.tables(q).map(t => t.name -> cat(t.name))

  for (w <- queries) {
    test(s"${w.name}: Spark result matches DuckDB oracle") {
      Oracle.assertEquivalent(ToSpark.compile(w.q, cat), ToSql.compile(w.q), oracleTables(w.q): _*)
    }
    test(s"${w.name}: declared sketch attributes pass the safety check") {
      assert(SafetyChecker.isSafe(w.q, w.sketchAttrs.values.toSet, stats(sf)),
        s"attrs ${w.sketchAttrs.values} should be safe for ${w.name}")
    }
    test(s"${w.name}: captured sketch round-trips (Q[P] ≡ Q)") {
      roundTrip(w.q, w.sketchAttrs, cat)
    }
  }

  test("Q3 sketch is selective (top-10 covers few fragments)") {
    val sk = roundTrip(q3, Map("orders" -> "o_orderkey"), cat, nFrags = 64)
    assert(sk("orders").selectivity <= 0.25,
      s"selectivity ${sk("orders").selectivity} not selective")
  }
  test("Q1 sketch is NOT selective (provenance ≈ whole input)") {
    val types = Algebra.baseTypes(q1)
    val p = RangePartition.equiDepth(cat("lineitem"), "lineitem", "l_orderkey", TLong, 16)
    // l_orderkey is not safe for Q1's group-by; capture anyway to measure
    // coverage — the provenance touches every fragment.
    val sk = Capture.capture(q1, Seq(p), cat)("lineitem")
    assert(sk.selectivity >= 0.95)
  }
  test("avg-based Q17 rejects an unsafe non-join attribute") {
    // sketching lineitem2's aggregation input attr would be unsafe
    assert(!SafetyChecker.isSafe(q17, Set("l2_quantity"), stats(sf)))
  }
}

class CrimesSpec extends SparkSpec with WorkloadChecks {
  import Crimes._

  private val sf = 0.002
  private lazy val cat = catalog(spark, sf).map { case (k, v) => k -> v.cache() }

  test("C-Q1 matches the DuckDB oracle") {
    Oracle.assertEquivalent(ToSpark.compile(cq1, cat), ToSql.compile(cq1), "crimes" -> cat("crimes"))
  }
  test("C-Q2 matches the DuckDB oracle") {
    val q = cq2(20)
    Oracle.assertEquivalent(ToSpark.compile(q, cat), ToSql.compile(q), "crimes" -> cat("crimes"))
  }
  test("C-Q1: area sketch safe and round-trips") {
    assert(SafetyChecker.isSafe(cq1, Set("area")))
    roundTrip(cq1, Map("crimes" -> "area"), cat)
  }
  test("C-Q2: block sketch safe and round-trips") {
    val q = cq2(20)
    assert(SafetyChecker.isSafe(q, Set("block")))
    roundTrip(q, Map("crimes" -> "block"), cat)
  }
  test("templates bind and run") {
    val q = Algebra.bind(tAreaYearHaving, Map("t" -> 5L, "y1" -> 2005, "y2" -> 2010))
    Oracle.assertEquivalent(ToSpark.compile(q, cat), ToSql.compile(q), "crimes" -> cat("crimes"))
  }
  test("template reuse: higher threshold reuses lower-threshold sketch") {
    assert(ReuseChecker.canReuse(tAreaHaving, Map("t" -> 10L), Map("t" -> 20L)))
    assert(!ReuseChecker.canReuse(tAreaHaving, Map("t" -> 20L), Map("t" -> 10L)))
  }
}

class MoviesSpec extends SparkSpec with WorkloadChecks {
  import Movies._

  private val sf = 0.001
  private lazy val cat = catalog(spark, sf).map { case (k, v) => k -> v.cache() }
  private def tabs(q: Op) = Algebra.tables(q).map(t => t.name -> cat(t.name))

  test("M-Q1 matches the DuckDB oracle") {
    Oracle.assertEquivalent(ToSpark.compile(mq1, cat), ToSql.compile(mq1), tabs(mq1): _*)
  }
  test("M-Q2 matches the DuckDB oracle") {
    val q = mq2(100)
    Oracle.assertEquivalent(ToSpark.compile(q, cat), ToSql.compile(q), tabs(q): _*)
  }
  test("M-Q3 matches the DuckDB oracle") {
    Oracle.assertEquivalent(ToSpark.compile(mq3, cat), ToSql.compile(mq3), tabs(mq3): _*)
  }
  test("M-Q1: movieid sketches safe and round-trip") {
    // (selectivity is a bench-scale property — at 270 movies the top-10
    // span nearly every fragment; see RealWorldBench for the Fig. 10 shape)
    assert(SafetyChecker.isSafe(mq1, Set("movieid", "r_movieid")))
    roundTrip(mq1, Map("ratings" -> "r_movieid", "movies" -> "movieid"), cat, nFrags = 32)
  }
  test("M-Q2: r_movieid sketch safe and round-trips") {
    val q = mq2(100)
    assert(SafetyChecker.isSafe(q, Set("r_movieid")))
    roundTrip(q, Map("ratings" -> "r_movieid"), cat)
  }
  test("M-Q3: sketches on both aggregates round-trip") {
    assert(SafetyChecker.isSafe(mq3, Set("r_movieid", "t_movieid")))
    roundTrip(mq3, Map("ratings" -> "r_movieid", "tags" -> "t_movieid"), cat)
  }
}

class StackOverflowSpec extends SparkSpec with WorkloadChecks {
  import StackOverflowW._

  private val sf = 0.001
  private lazy val cat = catalog(spark, sf).map { case (k, v) => k -> v.cache() }
  private def tabs(q: Op) = Algebra.tables(q).map(t => t.name -> cat(t.name))

  for ((name, q) <- Seq(("S-Q1", sq1), ("S-Q2", sq2), ("S-Q4", sq4), ("S-Q5", sq5(3, 50)))) {
    test(s"$name matches the DuckDB oracle") {
      Oracle.assertEquivalent(ToSpark.compile(q, cat), ToSql.compile(q), tabs(q): _*)
    }
  }
  test("S-Q1: user-key sketches safe and round-trip") {
    assert(SafetyChecker.isSafe(sq1, Set("u_id", "p_owner")))
    roundTrip(sq1, Map("users" -> "u_id", "posts" -> "p_owner"), cat, nFrags = 32)
  }
  test("S-Q5: interval HAVING safe on group keys, round-trips") {
    val q = sq5(3, 50)
    assert(SafetyChecker.isSafe(q, Set("u_id", "cm_user")))
    roundTrip(q, Map("users" -> "u_id", "comments" -> "cm_user"), cat)
  }
  test("templates reuse: tighter comment interval reuses wider sketch") {
    assert(ReuseChecker.canReuse(tCommentsInterval,
      Map("lo" -> 3L, "hi" -> 80L), Map("lo" -> 10L, "hi" -> 50L)))
    assert(!ReuseChecker.canReuse(tCommentsInterval,
      Map("lo" -> 10L, "hi" -> 50L), Map("lo" -> 3L, "hi" -> 80L)))
  }
}
