package repro.core

import repro.egraph._

/** The rewrite-rule base (Fig. 3 and Sec. 5.6). Rule names follow the
  * paper where a rule is shown there (A*, C*, L*, D*, F*, T*); the rest
  * are the unlisted members of the paper's "44 rules": constant folding,
  * if-merging, loop interchange, loop-invariant code motion, let
  * inlining, sub-array iteration, unnesting, and the physical
  * dense/hash lowering rules.
  *
  * De Bruijn discipline (binder arities: let=1, sum=2, merge=3): a rule
  * whose RHS moves a matched subterm across binders uses [[RRemap]],
  * which extracts the class's smallest representative and shifts its
  * free indices; side conditions `k,v ∉ FV(e)` become free-variable
  * checks on that representative.
  */
object Rules {
  import Rule.{simple, fvAvoid, allOf}

  // ---- pattern/template shorthand -----------------------------------------
  private def pv(n: String) = PVar(n)
  private def p(op: String, cs: Pat*) = PNode(op, cs.toVector)
  private def pb(op: String, a: Pat, b: Pat) = p("bin:" + op, a, b)
  private def r(op: String, cs: RT*) = RNode(op, cs: _*)
  private def rb(op: String, a: RT, b: RT) = r("bin:" + op, a, b)
  private def variable(i: Int) = p(s"var:$i")

  private val isDict: String => Boolean = _.startsWith("dict:")
  private val isUniqueDict: String => Boolean = op => op.startsWith("dict:u")
  private val isLogicalDict: String => Boolean =
    op => op.startsWith("dict:") && op.endsWith("l")
  private val isNum: String => Boolean = _.startsWith("num:")

  /** Any-flag dictionary pattern, op captured as `dv`. */
  private def pdict(dv: String, k: Pat, v: Pat) = POpVar(dv, isDict, Vector(k, v))

  /** Keep the captured dict's phys flag but drop @unique (the RHS key is
    * no longer one-per-iteration). */
  private def dropUnique(dv: String): (RuleCtx, Subst) => String =
    (_, s) => { val fl = s.op(dv).drop(5); s"dict:-${fl(1)}" }
  private def keepOp(dv: String): (RuleCtx, Subst) => String = (_, s) => s.op(dv)

  private def shiftF(delta: Int, cutoff: Int = 0): Int => Int =
    i => if (i >= cutoff) i + delta else i

  // conditions
  private def strictIn(n: String, ix: Int): (RuleCtx, Subst) => Boolean =
    (ctx, s) => Expr.isStrictIn(ctx.repr(s(n)), ix)
  private def linearIn(n: String, ix: Int): (RuleCtx, Subst) => Boolean =
    (ctx, s) => Expr.isLinearIn(ctx.repr(s(n)), ix)
  private def reprIsSum(n: String): (RuleCtx, Subst) => Boolean =
    (ctx, s) => ctx.repr(s(n)).isInstanceOf[Sum]
  private def scalarTyped(n: String): (RuleCtx, Subst) => Boolean =
    (ctx, s) => Expr.dictDepth(ctx.repr(s(n)), ctx.symIsScalar).contains(0)
  private def dictTyped(n: String): (RuleCtx, Subst) => Boolean =
    (ctx, s) => Expr.dictDepth(ctx.repr(s(n)), ctx.symIsScalar).exists(_ >= 1)
  private def reprSorted(n: String): (RuleCtx, Subst) => Boolean =
    (ctx, s) => ctx.repr(s(n)) match {
      case SubArr(_, _, _) | Rng(_, _) => true
      case _ => false
    }

  // ---- associativity / commutativity (A1-A4, C1-C2) ------------------------
  private val assocComm = Seq(
    simple("A1l", pb("*", pb("*", pv("a"), pv("b")), pv("c")),
      rb("*", RVar("a"), rb("*", RVar("b"), RVar("c")))),
    simple("A1r", pb("*", pv("a"), pb("*", pv("b"), pv("c"))),
      rb("*", rb("*", RVar("a"), RVar("b")), RVar("c"))),
    // NOTE: no commutativity for * — `{i->a} * {j->b} = {i->{j->a*b}}`
    // is the (non-commutative) module product; the paper's Fig. 3 lists
    // commutativity only for + and == for the same reason.
    simple("C1", pb("+", pv("a"), pv("b")), rb("+", RVar("b"), RVar("a"))),
    simple("AAdd", pb("+", pb("+", pv("a"), pv("b")), pv("c")),
      rb("+", RVar("a"), rb("+", RVar("b"), RVar("c")))),
    simple("C2", pb("==", pv("a"), pv("b")), rb("==", RVar("b"), RVar("a"))),
    simple("CAnd", pb("&&", pv("a"), pv("b")), rb("&&", RVar("b"), RVar("a"))),
    // A2: {k -> a*b} <-> {k -> a} * b
    simple("A2l", pdict("d", pv("k"), pb("*", pv("a"), pv("b"))),
      rb("*", RNodeF(keepOp("d"), RVar("k"), RVar("a")), RVar("b"))),
    simple("A2r", pb("*", pdict("d", pv("k"), pv("a")), pv("b")),
      RNodeF(keepOp("d"), RVar("k"), rb("*", RVar("a"), RVar("b")))),
    // A3: {k -> a*b} <-> a * {k -> b} — ONLY for scalar a: the module
    // product does not commute past a dictionary factor (a dict-valued
    // `a` would swap key nesting levels)
    simple("A3l", pdict("d", pv("k"), pb("*", pv("a"), pv("b"))),
      rb("*", RVar("a"), RNodeF(keepOp("d"), RVar("k"), RVar("b"))),
      cond = scalarTyped("a")),
    simple("A3r", pb("*", pv("a"), pdict("d", pv("k"), pv("b"))),
      RNodeF(keepOp("d"), RVar("k"), rb("*", RVar("a"), RVar("b"))),
      cond = scalarTyped("a")),
    // Sec 5.6: force dictionary products into explicit loops —
    // a * d -> sum(<k,v> in d) {@unique k -> a' * v}  (a scalar, d dict)
    simple("MulLoopL", pb("*", pv("a"), pv("b")),
      r("sum", RVar("b"),
        RNode("dict:ul", RLit(Vr(1)), rb("*", RRemap("a", shiftF(+2)), RLit(Vr(0))))),
      cond = allOf(scalarTyped("a"), dictTyped("b"))),
    // d * x -> sum(<k,v> in d) {@unique k -> v * x'}   (d dict, x anything)
    simple("MulLoopR", pb("*", pv("a"), pv("b")),
      r("sum", RVar("a"),
        RNode("dict:ul", RLit(Vr(1)), rb("*", RLit(Vr(0)), RRemap("b", shiftF(+2))))),
      cond = dictTyped("a")),
    // A4: if (c) then a*b <-> a * (if (c) then b)
    simple("A4l", p("if", pv("c"), pb("*", pv("a"), pv("b"))),
      rb("*", RVar("a"), r("if", RVar("c"), RVar("b")))),
    simple("A4r", pb("*", pv("a"), p("if", pv("c"), pv("b"))),
      r("if", RVar("c"), rb("*", RVar("a"), RVar("b")))),
  )

  // ---- algebraic simplifications (L1-L6 and friends) -----------------------
  private val zero = RLit(Num(0))
  private val simplif = Seq(
    simple("L1a", pb("+", pv("a"), p("num:0.0")), RVar("a")),
    simple("L1b", pb("+", p("num:0.0"), pv("a")), RVar("a")),
    simple("L2a", pb("*", pv("a"), p("num:0.0")), zero),
    simple("L2b", pb("*", p("num:0.0"), pv("a")), zero),
    simple("L3a", pb("*", pv("a"), p("num:1.0")), RVar("a")),
    simple("L3b", pb("*", p("num:1.0"), pv("a")), RVar("a")),
    simple("L5", pb("-", pv("a"), p("num:0.0")), RVar("a")),
    simple("L6", pb("-", pv("a"), pv("a")), zero),
    simple("EqRefl", pb("==", pv("a"), pv("a")), RLit(Num(1))),
    // if (true) then e -> e ; if (false) then e -> 0
    Rule("IfT", p("if", POpVar("c", op => isNum(op) && op.drop(4).toDouble != 0.0,
        Vector.empty), pv("e")),
      (ctx, s) => Some(s("e"))),
    simple("IfF", p("if", p("num:0.0"), pv("e")), zero),
    // constant folding on scalar binops
    Rule("Fold",
      POpVar("op", _.startsWith("bin:"), Vector(
        POpVar("x", isNum, Vector.empty), POpVar("y", isNum, Vector.empty))),
      (ctx, s) => {
        val x = s.op("x").drop(4).toDouble
        val y = s.op("y").drop(4).toDouble
        val res: Option[Double] = s.op("op").drop(4) match {
          case "+" => Some(x + y)
          case "-" => Some(x - y)
          case "*" => Some(x * y)
          case "/" => if (y != 0) Some(x / y) else None
          case "%" => if (y != 0 && x.isWhole && y.isWhole)
            Some((x.toLong % y.toLong).toDouble) else None
          case "idiv" => if (y != 0 && x.isWhole && y.isWhole)
            Some(Math.floorDiv(x.toLong, y.toLong).toDouble) else None
          case "min" => Some(math.min(x, y))
          case "==" => Some(if (x == y) 1.0 else 0.0)
          case "!=" => Some(if (x != y) 1.0 else 0.0)
          case "<"  => Some(if (x < y) 1.0 else 0.0)
          case "<=" => Some(if (x <= y) 1.0 else 0.0)
          case ">"  => Some(if (x > y) 1.0 else 0.0)
          case ">=" => Some(if (x >= y) 1.0 else 0.0)
          case "&&" => Some(if (x != 0 && y != 0) 1.0 else 0.0)
          case "||" => Some(if (x != 0 || y != 0) 1.0 else 0.0)
          case _ => None
        }
        res.map(d => ctx.eg.addExpr(Num(d)))
      }),
    // if (c1) then if (c2) then e <-> if (c1 && c2) then e
    simple("IfIf1", p("if", pv("c1"), p("if", pv("c2"), pv("e"))),
      r("if", rb("&&", RVar("c1"), RVar("c2")), RVar("e"))),
    simple("IfIf2", p("if", pb("&&", pv("c1"), pv("c2")), pv("e")),
      r("if", RVar("c1"), r("if", RVar("c2"), RVar("e")))),
  )

  // ---- distributivity / factorization (D1-D4) ------------------------------
  private val factor = Seq(
    simple("D1l", pb("+", pb("*", pv("a"), pv("b")), pb("*", pv("a"), pv("c"))),
      rb("*", RVar("a"), rb("+", RVar("b"), RVar("c")))),
    simple("D1r", pb("*", pv("a"), pb("+", pv("b"), pv("c"))),
      rb("+", rb("*", RVar("a"), RVar("b")), rb("*", RVar("a"), RVar("c")))),
    // D2: sum(<k,v> in e1) a*b -> a' * sum(<k,v> in e1) b    (a invariant)
    simple("D2l", p("sum", pv("e1"), pb("*", pv("a"), pv("b"))),
      rb("*", RRemap("a", shiftF(-2)), r("sum", RVar("e1"), RVar("b"))),
      cond = fvAvoid("a", Set(0, 1))),
    simple("D2r", pb("*", pv("a"), p("sum", pv("e1"), pv("b"))),
      r("sum", RVar("e1"), rb("*", RRemap("a", shiftF(+2)), RVar("b")))),
    // D3: sum(<k,v> in e1) a*b -> (sum(<k,v> in e1) a) * b'   (b invariant)
    simple("D3l", p("sum", pv("e1"), pb("*", pv("a"), pv("b"))),
      rb("*", r("sum", RVar("e1"), RVar("a")), RRemap("b", shiftF(-2))),
      cond = fvAvoid("b", Set(0, 1))),
    simple("D3r", pb("*", p("sum", pv("e1"), pv("a")), pv("b")),
      r("sum", RVar("e1"), rb("*", RVar("a"), RRemap("b", shiftF(+2))))),
    // D4: sum(<k,v> in e1) {k2 -> v2} -> {k2' -> sum(<k,v> in e1) v2}  (k2 inv.)
    simple("D4l", p("sum", pv("e1"), pdict("d", pv("k2"), pv("v2"))),
      RNodeF(dropUnique("d"), RRemap("k2", shiftF(-2)),
        r("sum", RVar("e1"), RVar("v2"))),
      cond = fvAvoid("k2", Set(0, 1))),
    simple("D4r", pdict("d", pv("k2"), p("sum", pv("e1"), pv("v2"))),
      r("sum", RVar("e1"),
        RNodeF(dropUnique("d"), RRemap("k2", shiftF(+2)), RVar("v2")))),
  )

  // ---- fusion (F1-F4, unnesting, LICM, interchange, let, sub-arrays) -------
  private val fusion = Seq(
    // F1: sum(<k,v> in e1) if (k == e2) then e3
    //   -> let k = e2' in let v = e1'(k) in e3        (k,v ∉ FV(e2))
    simple("F1",
      p("sum", pv("e1"), p("if", pb("==", variable(1), pv("e2")), pv("e3"))),
      r("let", RRemap("e2", shiftF(-2)),
        r("let", r("get", RRemap("e1", shiftF(+1)), RLit(Vr(0))),
          RVar("e3"))),
      cond = allOf(fvAvoid("e2", Set(0, 1)), strictIn("e3", 0))),
    // F1r: sum(<k,v> in lo:hi) if (k == e2) then e3
    //   -> let k = e2' in if (lo' <= k && k < hi') then let v = k in e3
    // (sound without strictness: range membership IS the bounds check)
    simple("F1r",
      p("sum", p("rng", pv("lo"), pv("hi")),
        p("if", pb("==", variable(1), pv("e2")), pv("e3"))),
      r("let", RRemap("e2", shiftF(-2)),
        r("if", rb("&&", rb("<=", RRemap("lo", shiftF(+1)), RLit(Vr(0))),
                         rb("<", RLit(Vr(0)), RRemap("hi", shiftF(+1)))),
          r("let", RLit(Vr(0)), RVar("e3")))),
      cond = fvAvoid("e2", Set(0, 1))),
    // F1s: sum(<k,v> in e(lo:hi)) if (k == e2) then e3
    //   -> let k = e2' in if (lo' <= k && k < hi') then let v = e'(k) in e3
    simple("F1s",
      p("sum", p("sub", pv("e"), pv("lo"), pv("hi")),
        p("if", pb("==", variable(1), pv("e2")), pv("e3"))),
      r("let", RRemap("e2", shiftF(-2)),
        r("if", rb("&&", rb("<=", RRemap("lo", shiftF(+1)), RLit(Vr(0))),
                         rb("<", RLit(Vr(0)), RRemap("hi", shiftF(+1)))),
          r("let", r("get", RRemap("e", shiftF(+1)), RLit(Vr(0))), RVar("e3")))),
      cond = fvAvoid("e2", Set(0, 1))),
    // F2: sum(<k1,v1> in sum(<k2,v2> in e1) {k2 -> e2}) e3
    //   -> sum(<k2,v2> in e1) let k1 = k2 in let v1 = e2' in e3'
    simple("F2",
      p("sum", p("sum", pv("e1"), pdict("d", variable(1), pv("e2"))), pv("e3")),
      r("sum", RVar("e1"),
        r("let", RLit(Vr(1)),
          r("let", RRemap("e2", i => if (i == 0) 1 else if (i == 1) 2 else i + 1),
            RRemap("e3", i => if (i <= 1) i else i + 2)))),
      cond = strictIn("e3", 0)),
    // F3: sum(<k1,v1> in sum(<k2,v2> in e1) {@unique ek -> ev}) e3
    //   -> sum(<k2,v2> in e1) let k1 = ek in let v1 = ev' in e3'
    simple("F3",
      p("sum", p("sum", pv("e1"),
        POpVar("d", isUniqueDict, Vector(pv("ek"), pv("ev")))), pv("e3")),
      r("sum", RVar("e1"),
        r("let", RVar("ek"),
          r("let", RRemap("ev", i => if (i == 0) 1 else if (i == 1) 2 else i + 1),
            RRemap("e3", i => if (i <= 1) i else i + 2)))),
      cond = strictIn("e3", 0)),
    // U1: same as F3 without @unique, sound when e3 is linear in v1
    simple("U1",
      p("sum", p("sum", pv("e1"), pdict("d", pv("ek"), pv("ev"))), pv("e3")),
      r("sum", RVar("e1"),
        r("let", RVar("ek"),
          r("let", RRemap("ev", i => if (i == 0) 1 else if (i == 1) 2 else i + 1),
            RRemap("e3", i => if (i <= 1) i else i + 2)))),
      cond = allOf(linearIn("e3", 0), strictIn("e3", 0))),
    // F4: sum(<k1,v1> in e1) sum(<k2,v2> in e2') if (v1 == v2) then e3
    //   -> merge(<k1,k2,v> in <e1, e2>) e3'         (k1,v1 ∉ FV(e2'))
    simple("F4",
      p("sum", pv("e1"), p("sum", pv("e2"),
        p("if", pb("==", variable(2), variable(0)), pv("e3")))),
      RNode("merge", RVar("e1"), RRemap("e2", shiftF(-2)),
        RRemap("e3", i => i match {
          case 0 => 0; case 1 => 1; case 2 => 0; case 3 => 2; case n => n - 1
        })),
      cond = allOf(fvAvoid("e2", Set(0, 1)), reprSorted("e1"), reprSorted("e2"))),
    // LetInline: let x = e1 in e2 -> e2[e1/x]   (small or single-use e1)
    Rule("LetInline", p("let", pv("e1"), pv("e2")),
      (ctx, s) => {
        // Inlining only ADDS an equivalent plan — extraction decides
        // whether recomputation beats materialization. Bound only to
        // keep term duplication from flooding the graph.
        val bound = ctx.repr(s("e1"))
        val body = ctx.repr(s("e2"))
        if (bound.size <= 48 || Expr.occurrences(body, 0) <= 1)
          Some(ctx.eg.addExpr(Expr.subst(body, 0, bound)))
        else None
      }),
    // LICM: sum(<k,v> in e1) {k2 -> a * t} with t an invariant sum
    //   -> let t' in sum(<k,v> in e1') {k2' -> a' * %2}
    simple("LICM",
      p("sum", pv("e1"), pdict("d", pv("k2"), pb("*", pv("a"), pv("t")))),
      r("let", RRemap("t", shiftF(-2)),
        r("sum", RRemap("e1", shiftF(+1)),
          RNodeF(keepOp("d"),
            RRemap("k2", shiftF(+1, 2)),
            rb("*", RRemap("a", shiftF(+1, 2)), RLit(Vr(2)))))),
      cond = allOf(fvAvoid("t", Set(0, 1)), reprIsSum("t"))),
    // X1 (interchange): sum(<k1,v1> in e1) sum(<k2,v2> in e2') body
    //   -> sum(<k2,v2> in e2) sum(<k1,v1> in e1') body'   (e2' invariant)
    simple("X1",
      p("sum", pv("e1"), p("sum", pv("e2"), pv("body"))),
      r("sum", RRemap("e2", shiftF(-2)),
        r("sum", RRemap("e1", shiftF(+2)),
          RRemap("body", i => i match {
            case 0 => 2; case 1 => 3; case 2 => 0; case 3 => 1; case n => n
          }))),
      cond = fvAvoid("e2", Set(0, 1))),
  )

  // ---- dictionary rules (T1-T6) --------------------------------------------
  private val dictionary = Seq(
    simple("T1", p("sum", pv("e"), pdict("d", variable(1), variable(0))),
      RVar("e")),
    simple("T2", pb("+", p("get", pv("a"), pv("i")), p("get", pv("b"), pv("i"))),
      r("get", rb("+", RVar("a"), RVar("b")), RVar("i"))),
    simple("T3", pb("+", pdict("d1", pv("k"), pv("a")), pdict("d2", pv("k"), pv("b"))),
      RNodeF(dropUnique("d1"), RVar("k"), rb("+", RVar("a"), RVar("b")))),
    // T4: (a:b)(i) -> if (i >= a && i < b) then i
    simple("T4", p("get", p("rng", pv("a"), pv("b")), pv("i")),
      r("if", rb("&&", rb(">=", RVar("i"), RVar("a")), rb("<", RVar("i"), RVar("b"))),
        RVar("i"))),
    // T5: e(a:b)(i) -> if (i >= a && i < b) then e(i)
    simple("T5", p("get", p("sub", pv("e"), pv("a"), pv("b")), pv("i")),
      r("if", rb("&&", rb(">=", RVar("i"), RVar("a")), rb("<", RVar("i"), RVar("b"))),
        r("get", RVar("e"), RVar("i")))),
    // T6: {k -> v}(i) -> if (i == k) then v
    simple("T6", p("get", pdict("d", pv("k"), pv("v")), pv("i")),
      r("if", rb("==", RVar("i"), RVar("k")), RVar("v"))),
    // T8: (if (c) then d)(i) -> if (c) then d(i) — lookups see through
    // conditionals (the zero dictionary looks up to 0)
    simple("T8", p("get", p("if", pv("c"), pv("d")), pv("i")),
      r("if", RVar("c"), r("get", RVar("d"), RVar("i")))),
    // T9: sum(<k,v> in if (c) then e) body -> if (c) then sum(<k,v> in e) body
    simple("T9", p("sum", p("if", pv("c"), pv("e")), pv("body")),
      r("if", RVar("c"), r("sum", RVar("e"), RVar("body")))),
    // T7 (lookup distributes over sum, cf. T2):
    // (sum(<k,v> in e1) {ek -> ev})(i) -> sum(<k,v> in e1) if (i' == ek) then ev
    simple("T7",
      p("get", p("sum", pv("e1"), pdict("d", pv("ek"), pv("ev"))), pv("i")),
      r("sum", RVar("e1"),
        r("if", rb("==", RRemap("i", shiftF(+2)), RVar("ek")), RVar("ev")))),
  )

  // ---- physical rules (Sec. 5.6) -------------------------------------------
  private val physical = Seq(
    // logical dict -> @dense / @hash (cost decides which survives)
    simple("PhysDense", POpVar("d", isLogicalDict, Vector(pv("k"), pv("v"))),
      RNodeF((_, s) => s.op("d").dropRight(1) + "d", RVar("k"), RVar("v"))),
    simple("PhysHash", POpVar("d", isLogicalDict, Vector(pv("k"), pv("v"))),
      RNodeF((_, s) => s.op("d").dropRight(1) + "h", RVar("k"), RVar("v"))),
    // S1: sum over a sub-array -> sum over its position range
    simple("S1",
      p("sum", p("sub", pv("e"), pv("lo"), pv("hi")), pv("body")),
      r("sum", r("rng", RVar("lo"), RVar("hi")),
        r("let", r("get", RRemap("e", shiftF(+2)), RLit(Vr(1))),
          RRemap("body", i => i match { case 0 => 0; case 1 => 2; case n => n + 1 })))),
  )

  /** Stage-1 rules: storage-independent logical optimization. */
  val logical: Seq[Rule] =
    assocComm ++ simplif ++ factor ++ fusion ++ dictionary

  /** The Taco model (Sec. 6's baseline): storage-aware loop fusion and
    * output assembly, but NO cost-based factorization — excludes the
    * distributivity rules D1–D3, loop-invariant code motion, and loop
    * interchange (D4, plain dict output assembly, stays: it models how
    * Taco writes results through output indices). */
  val tacoLike: Seq[Rule] =
    (assocComm ++ simplif ++
      factor.filter(r => r.name.startsWith("D4")) ++
      fusion.filterNot(r => r.name == "LICM" || r.name == "X1") ++
      dictionary) ++ physical

  /** Stage-2 adds the physical lowering rules. */
  val physicalStage: Seq[Rule] = logical ++ physical

  val all: Seq[Rule] = physicalStage

  /** Rule-count sanity: the paper reports "about 44" rules. */
  def count: Int = all.size
}
