package repro.bench

import repro.SparkSpec
import repro.meas.Table2

/** Reproduces Table 2: dataset dims/density/nnz of the synthetic
  * stand-ins, printed next to the paper's numbers. */
class Table2Bench extends SparkSpec {

  test("Table 2: generate every dataset stand-in and report stats") {
    val rows = Table2.run(spark)
    println("Table 2 — datasets (paper vs synthetic stand-ins):")
    println(Table2.render(rows))
    assert(rows.size == 10)
    rows.foreach { r =>
      // density preserved within 20% (duplicate-dropping makes nnz approximate)
      val ratio = r.ourDensity / r.paperDensity
      assert(ratio > 0.8 && ratio < 1.25,
        s"${r.name}: density ratio $ratio out of range")
      assert(r.ourNnz > 0)
    }
    // six matrices, four tensors — as in the paper
    assert(rows.count(_.kind == "matrix") == 6)
    assert(rows.count(_.kind == "tensor") == 4)
  }
}
