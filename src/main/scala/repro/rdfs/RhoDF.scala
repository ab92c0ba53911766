package repro.rdfs

import repro.core._

/** The ρDF fragment of RDFS (§7.4) as a Datalog program over a single
  * extensional triple relation t(s,p,o). Schema constants (rdf:type,
  * rdfs:subClassOf, ...) are fixed Long ids shared with the data
  * generators.
  */
object RhoDF {

  val Type: Long      = 1L
  val SubClassOf: Long = 2L
  val SubPropOf: Long  = 3L
  val Domain: Long     = 4L
  val Range: Long      = 5L
  /** First id free for generator vocabularies. */
  val FirstFreeId: Long = 10L

  private def v(n: String) = Var(n)

  /** ρDF rules: sub-property (transitivity + inheritance), sub-class
    * (transitivity + type inheritance), domain and range.
    */
  val program: Program = {
    val t = "t"
    def atom(p: String, ts: Term*) = Atom(p, ts.toVector)
    Program(Vector[(Vector[Atom], Atom)](
      // extensional loaders
      (Vector(atom(t, v("P"), Cst(SubPropOf), v("Q"))), atom("SP", v("P"), v("Q"))),
      (Vector(atom(t, v("C"), Cst(SubClassOf), v("D"))), atom("SC", v("C"), v("D"))),
      (Vector(atom(t, v("P"), Cst(Domain), v("C"))), atom("DOM", v("P"), v("C"))),
      (Vector(atom(t, v("P"), Cst(Range), v("C"))), atom("RNG", v("P"), v("C"))),
      (Vector(atom(t, v("X"), Cst(Type), v("C"))), atom("TYPE", v("X"), v("C"))),
      (Vector(atom(t, v("S"), v("P"), v("O"))), atom("T", v("S"), v("P"), v("O"))),
      // ρDF inference
      (Vector(atom("SP", v("P"), v("Q")), atom("SP", v("Q"), v("R"))),
        atom("SP", v("P"), v("R"))),
      (Vector(atom("T", v("S"), v("P"), v("O")), atom("SP", v("P"), v("Q"))),
        atom("T", v("S"), v("Q"), v("O"))),
      (Vector(atom("SC", v("C"), v("D")), atom("SC", v("D"), v("E"))),
        atom("SC", v("C"), v("E"))),
      (Vector(atom("TYPE", v("X"), v("C")), atom("SC", v("C"), v("D"))),
        atom("TYPE", v("X"), v("D"))),
      (Vector(atom("DOM", v("P"), v("C")), atom("T", v("S"), v("P"), v("O"))),
        atom("TYPE", v("S"), v("C"))),
      (Vector(atom("RNG", v("P"), v("C")), atom("T", v("S"), v("P"), v("O"))),
        atom("TYPE", v("O"), v("C"))),
    ))
  }
}
