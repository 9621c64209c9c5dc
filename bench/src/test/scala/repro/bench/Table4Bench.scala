package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.meas.Table4

/** Reproduces Table 4: equality-saturation compilation metrics, two
  * rows (stage 1, stage 2) per kernel. Absolute numbers differ from the
  * paper's Egg (different engine, different budgets); the *shape* —
  * thousands of nodes/classes explored, memos ≳ nodes, stage 2 larger
  * than stage 1 for composed plans — should hold. */
class Table4Bench extends AnyFunSuite {

  private lazy val rows = Table4.run()

  test("Table 4: optimize all five kernels and print the metrics") {
    println("Table 4 — compilation metrics (ours vs paper):")
    println(Table4.render(rows))
    assert(rows.size == 10) // 5 kernels x 2 stages
  }

  test("every stage explores a non-trivial search space") {
    rows.foreach { r =>
      assert(r.stats.iters >= 1, s"${r.kernel}/${r.stage}")
      assert(r.stats.nodes > 10, s"${r.kernel}/${r.stage}")
      assert(r.stats.classes > 5, s"${r.kernel}/${r.stage}")
      assert(r.stats.memos >= r.stats.nodes, s"${r.kernel}/${r.stage}: memos < nodes")
    }
  }

  test("search spaces reach thousands of e-nodes (paper's order)") {
    assert(rows.exists(_.stats.nodes > 1000))
    assert(rows.map(_.stats.nodes).max > 5000)
  }

  test("optimization time is seconds, not minutes (Sec. 6.5)") {
    val total = rows.map(_.stats.timeMs).sum
    println(f"total optimization time across kernels: ${total / 1000}%.1f s")
    assert(total < 600000, "optimization should not take minutes per kernel")
  }
}
