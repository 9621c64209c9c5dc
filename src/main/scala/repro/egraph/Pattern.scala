package repro.egraph

import scala.collection.mutable

/** Pattern language for e-matching. Metavariables ([[PVar]]) bind
  * e-classes; [[POpVar]] additionally captures the matched op string
  * (used by rules that apply to any dictionary flag combination). */
sealed trait Pat
final case class PVar(name: String) extends Pat
final case class PNode(op: String, children: Vector[Pat]) extends Pat
final case class POpVar(opVar: String, pred: String => Boolean,
                        children: Vector[Pat]) extends Pat

object Pat {
  def pv(n: String): Pat = PVar(n)
  def node(op: String, cs: Pat*): Pat = PNode(op, cs.toVector)
}

/** A match: metavariable -> e-class id (canonical at match time), plus
  * captured op strings. */
final case class Subst(cls: Map[String, Int], ops: Map[String, String]) {
  def apply(n: String): Int = cls(n)
  def op(n: String): String = ops(n)
}

object Matcher {

  /** All substitutions under which `pat` matches e-class `cls`. */
  def matches(eg: EGraph, pat: Pat, cls: Int): Seq[Subst] =
    go(eg, pat, eg.find(cls), Subst(Map.empty, Map.empty))

  private def go(eg: EGraph, pat: Pat, cls: Int, s: Subst): Seq[Subst] = pat match {
    case PVar(n) =>
      s.cls.get(n) match {
        case Some(bound) => if (eg.find(bound) == eg.find(cls)) Seq(s) else Seq.empty
        case None => Seq(s.copy(cls = s.cls.updated(n, eg.find(cls))))
      }
    case PNode(op, cs) =>
      nodesOf(eg, cls).filter(_.op == op).flatMap(n => goChildren(eg, cs, n.children, s))
    case POpVar(opVar, pred, cs) =>
      nodesOf(eg, cls).filter(n => pred(n.op)).flatMap { n =>
        val s1 = s.ops.get(opVar) match {
          case Some(prev) => if (prev == n.op) Some(s) else None
          case None => Some(s.copy(ops = s.ops.updated(opVar, n.op)))
        }
        s1.toSeq.flatMap(goChildren(eg, cs, n.children, _))
      }
  }

  private def nodesOf(eg: EGraph, cls: Int): Seq[ENode] =
    eg.classes.getOrElse(eg.find(cls), mutable.ArrayBuffer.empty).toSeq

  private def goChildren(eg: EGraph, pats: Vector[Pat], kids: Vector[Int],
                         s: Subst): Seq[Subst] =
    if (pats.length != kids.length) Seq.empty
    else pats.zip(kids).foldLeft(Seq(s)) { case (acc, (p, c)) =>
      acc.flatMap(go(eg, p, c, _))
    }
}
