package repro.bench

import scala.util.Random

import repro.core.{ReuseChecker, SafetyChecker}
import repro.workloads.{Crimes, StackOverflowW, TpchLite}
import BenchUtil._

/** T12 — cost of the static safety and reuse checks (paper Sec. 9.5 text:
  * both ≈ 20 ms per check on Z3; ours run on the Fourier–Motzkin solver).
  * Pure solver work — no Spark needed.
  */
object CheckOverheadExperiments {

  def run(): Seq[(String, String, Double)] = {
    header("T12", "Safety / reuse check cost (ms per check), cf. Sec. 9.5",
      "check", "target", "msPerCheck")

    val stats = TpchLite.stats(0.1)
    val safetyRows = for (w <- TpchLite.queries) yield {
      val ms = timed(warmup = 2, reps = 5) {
        SafetyChecker.isSafe(w.q, w.sketchAttrs.values.toSet, stats)
      } * 1000
      row("T12", "safety", w.name, ms)
      ("safety", w.name, ms)
    }

    val rnd = new Random(3)
    val reuseTargets = Seq(
      ("crimes-areaHaving", Crimes.tAreaHaving,
        () => Map[String, Any]("t" -> (rnd.nextInt(5000).toLong + 1))),
      ("sof-commentsInterval", StackOverflowW.tCommentsInterval,
        () => { val lo = rnd.nextInt(100).toLong; Map[String, Any]("lo" -> lo, "hi" -> (lo + 10 + rnd.nextInt(200))) }),
    )
    val reuseRows = for ((name, tmpl, gen) <- reuseTargets) yield {
      val pairs = Seq.fill(10)((gen(), gen()))
      val ms = timed(warmup = 1, reps = 5) {
        pairs.foreach { case (a, b) => ReuseChecker.canReuse(tmpl, a, b) }
      } / pairs.size * 1000
      row("T12", "reuse", name, ms)
      ("reuse", name, ms)
    }
    safetyRows ++ reuseRows
  }
}
