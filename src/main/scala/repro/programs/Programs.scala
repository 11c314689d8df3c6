package repro.programs

import repro.datalog.{Parser, Program}

/** The eight benchmark Datalog programs of §6.2, verbatim from the paper
  * (modulo ASCII syntax: `!` for ¬, `_` for anonymous variables).
  */
object Programs {

  /** Transitive closure (Example 1). EDB: arc(x,y). */
  val tcSource: String =
    """
    tc(x, y) :- arc(x, y).
    tc(x, y) :- tc(x, z), arc(z, y).
    """
  lazy val tc: Program = Parser.parse(tcSource)

  /** Same generation (§5.3). EDB: arc(x,y). */
  val sgSource: String =
    """
    sg(x, y) :- arc(p, x), arc(p, y), x != y.
    sg(x, y) :- arc(a, x), sg(a, b), arc(b, y).
    """
  lazy val sg: Program = Parser.parse(sgSource)

  /** Reachability from the vertices in id(y). EDBs: id(y), arc(x,y). */
  val reachSource: String =
    """
    reach(y) :- id(y).
    reach(y) :- reach(x), arc(x, y).
    """
  lazy val reach: Program = Parser.parse(reachSource)

  /** Connected components via recursive MIN label propagation. EDB: arc(x,y). */
  val ccSource: String =
    """
    cc3(x, MIN(x)) :- arc(x, _).
    cc3(y, MIN(z)) :- cc3(x, z), arc(x, y).
    cc2(x, MIN(y)) :- cc3(x, y).
    cc(x) :- cc2(_, x).
    """
  lazy val cc: Program = Parser.parse(ccSource)

  /** Single-source shortest path. EDBs: id(y), arc(x,y,d). */
  val ssspSource: String =
    """
    sssp2(y, MIN(0)) :- id(y).
    sssp2(y, MIN(d1 + d2)) :- sssp2(x, d1), arc(x, y, d2).
    sssp(x, MIN(d)) :- sssp2(x, d).
    """
  lazy val sssp: Program = Parser.parse(ssspSource)

  /** Andersen's points-to analysis (non-linear recursion).
    * EDBs: addressOf, assign, load, store (all binary).
    */
  val andersenSource: String =
    """
    pointsTo(y, x) :- addressOf(y, x).
    pointsTo(y, x) :- assign(y, z), pointsTo(z, x).
    pointsTo(y, w) :- load(y, x), pointsTo(x, z), pointsTo(z, w).
    pointsTo(z, w) :- store(y, x), pointsTo(y, z), pointsTo(x, w).
    """
  lazy val andersen: Program = Parser.parse(andersenSource)

  /** Context-sensitive points-to analysis (mutual + non-linear recursion).
    * EDBs: assign(x,y), dereference(x,y).
    */
  val cspaSource: String =
    """
    valueFlow(y, x) :- assign(y, x).
    valueFlow(x, y) :- assign(x, z), memoryAlias(z, y).
    valueFlow(x, y) :- valueFlow(x, z), valueFlow(z, y).
    memoryAlias(x, w) :- dereference(y, x), valueAlias(y, z), dereference(z, w).
    valueAlias(x, y) :- valueFlow(z, x), valueFlow(z, y).
    valueAlias(x, y) :- valueFlow(z, x), memoryAlias(z, w), valueFlow(w, y).
    valueFlow(x, x) :- assign(x, y).
    valueFlow(x, x) :- assign(y, x).
    memoryAlias(x, x) :- assign(y, x).
    memoryAlias(x, x) :- assign(x, y).
    """
  lazy val cspa: Program = Parser.parse(cspaSource)

  /** Context-sensitive dataflow analysis (linear recursion, many iterations).
    * EDBs: nullEdge(x,y), arc(x,y).
    */
  val csdaSource: String =
    """
    null(x, y) :- nullEdge(x, y).
    null(x, y) :- null(x, w), arc(w, y).
    """
  lazy val csda: Program = Parser.parse(csdaSource)

  /** Complement of transitive closure (Example 2, stratified negation). */
  val ntcSource: String =
    """
    tc(x, y) :- arc(x, y).
    tc(x, y) :- tc(x, z), arc(z, y).
    node(x) :- arc(x, y).
    node(y) :- arc(x, y).
    ntc(x, y) :- node(x), node(y), !tc(x, y).
    """
  lazy val ntc: Program = Parser.parse(ntcSource)

  /** TC + per-source reachable-count (§3.3 aggregation example, rule r3). */
  val gtcSource: String = tcSource +
    """
    gtc(x, COUNT(y)) :- tc(x, y).
    """
  lazy val gtc: Program = Parser.parse(gtcSource)

  /** All benchmark programs by name. */
  lazy val byName: Map[String, Program] = Map(
    "TC" -> tc, "SG" -> sg, "REACH" -> reach, "CC" -> cc, "SSSP" -> sssp,
    "AA" -> andersen, "CSPA" -> cspa, "CSDA" -> csda,
  )
}
