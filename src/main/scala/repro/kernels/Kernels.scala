package repro.kernels

import repro.core._
import repro.core.Sugar._
import repro.exec._
import repro.storage.{CooMat, Coo3}
import scala.collection.mutable.LongMap

/** The five tensor programs of the evaluation (Table 3), written in
  * SDQLite over *logical* tensor names, exactly as an end user would
  * (Fig. 2's "TP" box). Composition with storage mappings happens in
  * the optimizer. Reference implementations (plain Scala over COO) give
  * the ground truth for every correctness test.
  */
object Kernels {

  /** MMM: Q(i,j) = Σ_k A(i,k)·B(k,j). */
  val mmm: Expr = compile(
    sum(gen("i", "k")("a", "A"), gen("k", "j")("b", "B"))(
      dict(v("i"), v("j"))(mul(v("a"), v("b")))))

  /** ΣMMM: Q() = Σ_{i,j,k} A(i,k)·B(k,j). */
  val sumMmm: Expr = compile(
    sum(gen("i", "k")("a", "A"), gen("k", "j")("b", "B"))(
      mul(v("a"), v("b"))))

  /** BATAX: Q(j) = Σ_{i,k} β·A(i,j)·A(i,k)·X(k), in the one-pass form of
    * Sec. 6.3 (A iterated once, its row re-iterated for j and k). */
  val batax: Expr = compile(
    sum(gen("i")("Ai", "A"))(
      sum(gen("j")("Aij", "Ai"))(
        sum(gen("k")("Aik", "Ai"))(
          dict(v("j"))(mul(v("beta"), v("Aij"), v("Aik"), get(v("X"), v("k"))))))))

  /** TTM: Q(i,j,k) = Σ_l A(i,j,l)·B(k,l). */
  val ttm: Expr = compile(
    sum(gen("i", "j", "l")("a", "A"), gen("k", "l")("b", "B"))(
      dict(v("i"), v("j"), v("k"))(mul(v("a"), v("b")))))

  /** MTTKRP: Q(i,j) = Σ_{k,l} A(i,k,l)·B(k,j)·C(l,j) (Fig. 1(a)). */
  val mttkrp: Expr = compile(
    sum(gen("i", "k", "l")("a", "A"),
        gen("k", "j")("b", "B"),
        gen("l", "j")("c", "C"))(
      dict(v("i"), v("j"))(mul(v("a"), v("b"), v("c")))))

  val all: Map[String, Expr] = Map(
    "MMM" -> mmm, "SumMMM" -> sumMmm, "BATAX" -> batax,
    "TTM" -> ttm, "MTTKRP" -> mttkrp)

  // ---- ground-truth reference implementations ------------------------------

  /** Reference MMM over COO matrices: nested hash {i -> {j -> v}}. */
  def refMmm(a: CooMat, b: CooMat): Value = {
    val bRows = b.entries.groupBy(_._1)
    val out = LongMap.empty[Value]
    a.entries.foreach { case (i, k, av) =>
      bRows.get(k).foreach { row =>
        val acc = out.getOrElseUpdate(i.toLong, new VHashN(LongMap.empty)).asInstanceOf[VHashN]
        row.foreach { case (_, j, bv) =>
          acc.m.update(j.toLong, acc.m.getOrElse(j.toLong, 0.0) + av * bv)
        }
      }
    }
    if (out.isEmpty) VZero else new VHashV(out)
  }

  def refSumMmm(a: CooMat, b: CooMat): Double = {
    // Σ_k (Σ_i A(i,k)) · (Σ_j B(k,j))
    val colSumA = LongMap.empty[Double]
    a.entries.foreach { case (_, k, v) => colSumA.update(k.toLong, colSumA.getOrElse(k.toLong, 0.0) + v) }
    val rowSumB = LongMap.empty[Double]
    b.entries.foreach { case (k, _, v) => rowSumB.update(k.toLong, rowSumB.getOrElse(k.toLong, 0.0) + v) }
    var s = 0.0
    colSumA.foreachEntry { (k, ca) => s += ca * rowSumB.getOrElse(k, 0.0) }
    s
  }

  def refBatax(beta: Double, a: CooMat, x: Array[Double]): Value = {
    // Q = β · Aᵀ(Ax)
    val t = new Array[Double](a.m) // t(i) = Σ_k A(i,k)·x(k)
    a.entries.foreach { case (i, k, v) => if (k < x.length) t(i) += v * x(k) }
    val out = LongMap.empty[Double]
    a.entries.foreach { case (i, j, v) =>
      val q = beta * v * t(i)
      if (q != 0) out.update(j.toLong, out.getOrElse(j.toLong, 0.0) + q)
    }
    if (out.isEmpty) VZero else new VHashN(out)
  }

  def refTtm(a: Coo3, b: CooMat): Value = {
    val bRowsByCol = b.entries.groupBy(_._2) // l -> [(k, l, v)]
    val l1 = LongMap.empty[Value]
    a.entries.foreach { case (i, j, l, av) =>
      bRowsByCol.get(l).foreach { bs =>
        val l2 = l1.getOrElseUpdate(i.toLong, new VHashV(LongMap.empty)).asInstanceOf[VHashV]
        val l3 = l2.m.getOrElseUpdate(j.toLong, new VHashN(LongMap.empty)).asInstanceOf[VHashN]
        bs.foreach { case (k, _, bv) =>
          l3.m.update(k.toLong, l3.m.getOrElse(k.toLong, 0.0) + av * bv)
        }
      }
    }
    if (l1.isEmpty) VZero else new VHashV(l1)
  }

  def refMttkrp(a: Coo3, b: CooMat, c: CooMat): Value = {
    val bRow = b.entries.groupBy(_._1) // k -> [(k, j, v)]
    val cRow = c.entries.groupBy(_._1) // l -> [(l, j, v)]
    val out = LongMap.empty[Value]
    a.entries.foreach { case (i, k, l, av) =>
      (bRow.get(k), cRow.get(l)) match {
        case (Some(bs), Some(cs)) =>
          val cByJ = cs.map(e => (e._2, e._3)).toMap
          val acc = out.getOrElseUpdate(i.toLong, new VHashN(LongMap.empty)).asInstanceOf[VHashN]
          bs.foreach { case (_, j, bv) =>
            cByJ.get(j).foreach { cv =>
              acc.m.update(j.toLong, acc.m.getOrElse(j.toLong, 0.0) + av * bv * cv)
            }
          }
        case _ => ()
      }
    }
    if (out.isEmpty) VZero else new VHashV(out)
  }
}
