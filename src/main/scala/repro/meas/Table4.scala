package repro.meas

import repro.core._
import repro.egraph.RunStats
import repro.exec.VNum
import repro.kernels.Kernels
import repro.storage._

/** Table 4 reproduction: compilation metrics of the two-stage
  * equality-saturation optimization — Time (ms), Iterations, Nodes,
  * e-Classes, Memos — two rows per kernel (stage 1 = storage-independent,
  * stage 2 = storage-aware), like the paper. Storage formats are
  * STOREL's Table 3 picks. */
object Table4 {

  final case class Row(kernel: String, stage: Int, stats: RunStats)

  /** Paper's Table 4 values (per kernel: (time, iters, nodes, classes,
    * memos) for stage 1 then stage 2). */
  val paper: Map[(String, Int), (Int, Int, Int, Int, Int)] = Map(
    ("BATAX", 1) -> (445, 31, 47441, 30810, 51508),
    ("BATAX", 2) -> (1212, 59, 46456, 8043, 59010),
    ("SumMMM", 1) -> (1, 6, 42, 25, 42),
    ("SumMMM", 2) -> (52, 22, 2077, 530, 2698),
    ("MTTKRP", 1) -> (10, 18, 571, 135, 821),
    ("MTTKRP", 2) -> (239, 35, 8414, 1130, 10700),
    ("MMM", 1) -> (10, 11, 910, 123, 1242),
    ("MMM", 2) -> (1708, 61, 33058, 6479, 43407),
    ("TTM", 1) -> (11, 12, 1173, 140, 1480),
    ("TTM", 2) -> (891, 61, 15891, 3244, 23981))

  def run(cfg: Optimizer.Config = Optimizer.Config(),
          w: Table3.Workload = Table3.defaultWorkload()): Seq[Row] = {
    def opt(kernel: String, tp: Expr, storages: Seq[Storage],
            extra: Map[String, Card] = Map.empty): Seq[Row] = {
      val res = Optimizer.optimize(tp, storages, extra, cfg)
      Seq(Row(kernel, 1, res.stage1), Row(kernel, 2, res.stage2))
    }
    opt("BATAX", Kernels.batax,
      Seq(Formats.csr("A", w.a), Formats.denseVec("X", w.x)),
      Map("beta" -> Card.scalar)) ++
    opt("SumMMM", Kernels.sumMmm,
      Seq(Formats.csc("A", w.a), Formats.csr("B", w.b))) ++
    opt("MTTKRP", Kernels.mttkrp,
      Seq(Formats.csf("A", w.a3), Formats.csr("B", w.bMk), Formats.csc("C", w.cMk))) ++
    opt("MMM", Kernels.mmm,
      Seq(Formats.csr("A", w.a), Formats.csr("B", w.b))) ++
    opt("TTM", Kernels.ttm,
      Seq(Formats.csf("A", w.a3), Formats.csc("B", w.bTtm)))
  }

  def render(rows: Seq[Row]): String =
    Bench.table(
      Seq("Kernel", "Stage", "Time(ms)", "Iters", "Nodes", "Classes", "Memos",
          "Paper(T/I/N/C/M)"),
      rows.map { r =>
        val p = paper.get((r.kernel, r.stage))
          .map { case (t, i, n, c, m) => s"$t/$i/$n/$c/$m" }.getOrElse("-")
        Seq(r.kernel, r.stage.toString, Bench.ms(r.stats.timeMs),
          r.stats.iters.toString, r.stats.nodes.toString,
          r.stats.classes.toString, r.stats.memos.toString, p)
      })
}
