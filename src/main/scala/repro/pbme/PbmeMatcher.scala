package repro.pbme

import repro.datalog._

/** Structural matcher deciding whether a program is TC-shaped or SG-shaped
  * (modulo variable renaming), so the engine can route it to PBME (§5.3).
  */
object PbmeMatcher {

  sealed trait Shape { def idb: String; def edb: String }
  final case class TcShape(idb: String, edb: String) extends Shape
  final case class SgShape(idb: String, edb: String) extends Shape

  def matchProgram(analysis: Analyzer.Analysis): Option[Shape] = {
    val p = analysis.program
    if (p.rules.size != 2) return None
    if (analysis.idbs.size != 1 || analysis.edbs.size != 1) return None
    val idb = analysis.idbs.head
    val edb = analysis.edbs.head
    if (analysis.arities(idb) != 2 || analysis.arities(edb) != 2) return None
    matchTc(p, idb, edb).orElse(matchSg(p, idb, edb))
  }

  /** { R(x,y) :- E(x,y).   R(x,y) :- R(x,z), E(z,y). } */
  private def matchTc(p: Program, idb: String, edb: String): Option[TcShape] = {
    val base = p.rules.find(r =>
      r.body.sizeIs == 1 && (r.body.head match {
        case BAtom(`edb`, Seq(Var(a), Var(b)), false) =>
          a != b && headIsVars(r.head, Seq(a, b))
        case _ => false
      }))
    val rec = p.rules.find { r =>
      r.comparisons.isEmpty && r.negatedAtoms.isEmpty && r.positiveAtoms.sizeIs == 2 && {
        val atoms = r.positiveAtoms
        (for {
          ra <- atoms.find(_.pred == idb)
          ea <- atoms.find(_.pred == edb)
        } yield (ra.terms, ea.terms) match {
          // right-linear: R(x,z), E(z,y) with head R(x,y)
          case (Seq(Var(x), Var(z1)), Seq(Var(z2), Var(y))) =>
            z1 == z2 && x != z1 && y != z1 && x != y && headIsVars(r.head, Seq(x, y))
          case _ => false
        }).getOrElse(false)
      }
    }
    if (base.isDefined && rec.isDefined && base != rec) Some(TcShape(idb, edb)) else None
  }

  /** { S(x,y) :- E(p,x), E(p,y), x != y.   S(x,y) :- E(a,x), S(a,b), E(b,y). } */
  private def matchSg(p: Program, idb: String, edb: String): Option[SgShape] = {
    val base = p.rules.find { r =>
      r.negatedAtoms.isEmpty && r.positiveAtoms.sizeIs == 2 &&
      r.positiveAtoms.forall(_.pred == edb) && r.comparisons.sizeIs == 1 && {
        (r.positiveAtoms.map(_.terms), r.comparisons.head) match {
          case (Seq(Seq(Var(p1), Var(x)), Seq(Var(p2), Var(y))), BCmp(CmpOp.Ne, EVar(cx), EVar(cy))) =>
            p1 == p2 && x != y && Set(cx, cy) == Set(x, y) &&
              headIsVars(r.head, Seq(x, y))
          case _ => false
        }
      }
    }
    val rec = p.rules.find { r =>
      r.comparisons.isEmpty && r.negatedAtoms.isEmpty && r.positiveAtoms.sizeIs == 3 &&
      r.positiveAtoms.count(_.pred == edb) == 2 && r.positiveAtoms.count(_.pred == idb) == 1 && {
        val Seq(e1, e2) = r.positiveAtoms.filter(_.pred == edb)
        val s = r.positiveAtoms.find(_.pred == idb).get
        def matches(ea: BAtom, eb: BAtom): Boolean = (ea.terms, s.terms, eb.terms) match {
          case (Seq(Var(a1), Var(x)), Seq(Var(a2), Var(b1)), Seq(Var(b2), Var(y))) =>
            a1 == a2 && b1 == b2 && Set(a1, b1, x, y).size == 4 &&
              headIsVars(r.head, Seq(x, y))
          case _ => false
        }
        matches(e1, e2) || matches(e2, e1)
      }
    }
    if (base.isDefined && rec.isDefined && base != rec) Some(SgShape(idb, edb)) else None
  }

  private def headIsVars(h: Head, vars: Seq[String]): Boolean =
    h.terms.sizeIs == vars.size && h.terms.zip(vars).forall {
      case (HExpr(EVar(v)), expected) => v == expected
      case _                          => false
    }
}
