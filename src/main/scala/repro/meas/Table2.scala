package repro.meas

import org.apache.spark.sql.SparkSession
import repro.SynthData

/** Table 2 reproduction: the dataset summary (dimensions, density,
  * number of non-zeros). The paper's SuiteSparse/FROSTT files are
  * substituted by synthetic stand-ins at reduced linear scale with the
  * same density (DESIGN.md, "Dataset substitutions"); this harness
  * *generates* every stand-in with Spark and reports the actually
  * materialized dims/density/nnz next to the paper's numbers. */
object Table2 {

  final case class Row(name: String, kind: String,
                       paperDims: String, paperDensity: Double, paperNnz: Long,
                       ourDims: String, ourDensity: Double, ourNnz: Long)

  private def fmtDims(ds: Seq[Long]): String = ds.map(d =>
    if (d >= 1000000) f"${d / 1e6}%.1fM"
    else if (d >= 1000) f"${d / 1e3}%.1fK"
    else d.toString).mkString(" x ")

  def run(spark: SparkSession): Seq[Row] =
    SynthData.table2.map { d =>
      val df = d.kind match {
        case "matrix" =>
          SynthData.sparseMatrix(spark, d.dims(0), d.dims(1), d.nnz, seed = d.name.hashCode)
        case _ =>
          SynthData.sparseTensor3(spark, d.dims(0), d.dims(1), d.dims(2), d.nnz,
            seed = d.name.hashCode)
      }
      val actualNnz = df.count()
      val density = actualNnz.toDouble / d.dims.map(_.toDouble).product
      Row(d.name, d.kind, fmtDims(d.paperDims), d.paperDensity, d.paperNnz,
        fmtDims(d.dims), density, actualNnz)
    }

  def render(rows: Seq[Row]): String =
    Bench.table(
      Seq("Tensor", "Kind", "Paper dims", "Paper density", "Paper nnz",
          "Ours dims", "Ours density", "Ours nnz"),
      rows.map(r => Seq(r.name, r.kind, r.paperDims, f"${r.paperDensity}%.1e",
        r.paperNnz.toString, r.ourDims, f"${r.ourDensity}%.1e", r.ourNnz.toString)))
}
