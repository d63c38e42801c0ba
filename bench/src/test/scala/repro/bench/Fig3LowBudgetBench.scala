package repro.bench

import repro.SparkSpec
import repro.exp.{CoreFigures, Harness}

/** T-fig3: low sampling budgets (500–1000) vs RMSE. Paper claims: even at
  * small sample sizes ABAE outperforms or matches uniform in all cases.
  */
class Fig3LowBudgetBench extends SparkSpec {

  test("T-fig3: low budgets vs RMSE, ABAE vs uniform") {
    val cells = CoreFigures.fig3(spark, Harness.trials(300))
    println(CoreFigures.renderRmse("T-fig3: low budgets vs RMSE (ABAE vs uniform)", cells))

    // "Outperforms or matches": allow parity with slack at these budgets
    // (weak-proxy datasets with heavy-tailed statistics are noisy here).
    cells.foreach { c =>
      assert(c.abaeRmse <= c.unifRmse * 1.25,
        s"${c.dataset}@${c.budget}: abae=${c.abaeRmse} uniform=${c.unifRmse}")
    }
    // At least the strong-proxy datasets should already win.
    val strong = cells.filter(c => Seq("night-street", "celeba").contains(c.dataset))
    assert(strong.count(_.gain > 1.0) >= strong.size / 2,
      s"strong-proxy wins: ${strong.map(c => s"${c.dataset}@${c.budget}=${c.gain}")}")
  }
}
