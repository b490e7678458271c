package repro.bench

import repro.SparkSpec
import repro.core.Runner
import repro.jobs.TableIIJob
import repro.lake.ScenarioGen

/** Reproduces **Table II** (utility of METAM vs MW / Overlap / Uniform
  * within a fixed query budget on six datasets).
  *
  * Paper values (≤1000 queries): METAM 0.75–1.0 everywhere, MW 0.20–0.50,
  * Overlap 0.0–0.5, Uniform 0.1–0.5. The shape to preserve: METAM attains
  * the highest utility on every dataset, usually by a multiple of the
  * best baseline; causal datasets ("(C)") show the starkest gap.
  */
class TableIIBench extends SparkSpec {

  private val Budget = 250

  test("TABLE II: utility within the query budget (paper vs measured)") {
    val t0 = System.nanoTime()
    val measured = ScenarioGen.tableII().map { s =>
      val run = Runner.run(spark, s, TableIIJob.thetaFor(s), Budget, TableIIJob.Methods)
      val row = TableIIJob.Methods.map(m => m -> run.results(m).utilityAt(Budget)).toMap
      println(f"[bench] ${s.spec.name}%-10s n=${run.candidates.size}%4d " +
        TableIIJob.Methods.map(m => f"$m=${row(m)}%.2f").mkString(" "))
      s.spec.name -> row
    }
    val secs = (System.nanoTime() - t0) / 1e9
    println(TableIIJob.render(measured, Budget))
    println(f"[bench] Table II computed in $secs%.1f s")

    measured.foreach { case (name, row) =>
      val metam = row("METAM")
      val bestBaseline = (row - "METAM").values.max
      assert(metam >= bestBaseline - 1e-9,
        s"$name: METAM ($metam) below best baseline ($bestBaseline)")
      assert(metam >= 0.6, s"$name: METAM utility $metam below the paper's 0.75+ band")
    }
    // On the causal datasets the gap should be material (paper: ≥ 2x).
    val causal = measured.take(4)
    val dominant = causal.count { case (_, row) => row("METAM") >= 1.5 * (row - "METAM").values.max }
    assert(dominant >= 2, s"METAM dominated (1.5x) on only $dominant/4 causal datasets")
  }
}
