package repro.bench

import repro.SparkSpec
import repro.experiments.Tables

/** Reproduces paper Table 2: transformation coverage and runtime of our
  * approach vs the Auto-Join baseline, under n-gram and golden matching.
  */
class Table2Bench extends SparkSpec {

  test("Table 2: coverage and runtime, ours vs Auto-Join") {
    val cells = BenchRuns.cells
    println(Tables.renderTable2(cells))

    // Shape assertion 1 (the paper's headline): our coverage is full or near
    // full on benchmark and synthetic data under golden matching.
    for (d <- Seq("Benchmark", "Synth-50", "Synth-50L", "Synth-500", "Synth-500L")) {
      val r = BenchRuns.cell("Golden", d)
      assert(r.ours.setCov >= 0.95, s"$d golden setCov=${r.ours.setCov}")
    }

    // Shape assertion 2: coverage stays high under the (noisier) n-gram
    // matching as well.
    for (d <- Seq("Benchmark", "Synth-50", "Synth-500")) {
      val r = BenchRuns.cell("N-Gram", d)
      assert(r.ours.setCov >= 0.8, s"$d ngram setCov=${r.ours.setCov}")
    }

    // Shape assertion 3: ours dominates Auto-Join in coverage everywhere the
    // baseline ran, and by a wide margin in time on the synthetic data
    // (paper: 3-4 orders of magnitude; here Auto-Join is budget-capped).
    for (r <- cells; aj <- r.autojoin) {
      assert(r.ours.setCov >= aj.setCov - 1e-9, s"${r.matching}/${r.dataset}: ours=${r.ours.setCov} aj=${aj.setCov}")
    }
    for (d <- Seq("Synth-50", "Synth-50L", "Synth-500", "Synth-500L")) {
      val r = BenchRuns.cell("Golden", d)
      for (aj <- r.autojoin) {
        val slower = aj.budgetExceeded || aj.timeSec >= r.ours.timeSec * 3
        assert(slower, s"$d: autojoin ${aj.timeSec}s vs ours ${r.ours.timeSec}s (budget=${aj.budgetExceeded})")
      }
    }

    // Shape assertion 4: the open-data cell works through sampling plus the
    // support threshold — a small transformation set with material coverage
    // despite ~1% matching precision (paper: 3 transformations, 0.56).
    val open = BenchRuns.cell("N-Gram", "Open data")
    assert(open.ours.nTrans <= 12, s"open nTrans=${open.ours.nTrans}")
    assert(open.ours.setCov >= 0.4, s"open setCov=${open.ours.setCov}")
  }
}
