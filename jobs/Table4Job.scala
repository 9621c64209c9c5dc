package repro.jobs

import repro.meas.Table4

/** Entrypoint reproducing Table 4 (equality-saturation compilation
  * metrics, two optimization stages per kernel). Needs no Spark. */
object Table4Job {
  def main(args: Array[String]): Unit = {
    val rows = Table4.run()
    println("Table 4 — compilation metrics (ours vs paper):")
    println(Table4.render(rows))
  }
}
