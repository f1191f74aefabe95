package repro.cfg

/** The grammars used in the paper's evaluation (§4.3 and §5).
  *
  * Terminal naming: the paper's `subClassOf⁻¹` / `type⁻¹` are spelled
  * `subClassOf_r` / `type_r` here (graph loaders append `_r` for the
  * inverse edge of each RDF triple).
  */
object Queries {

  val SubClassOf  = "subClassOf"
  val SubClassOfR = "subClassOf_r"
  val Type        = "type"
  val TypeR       = "type_r"

  /** Paper Fig. 3 / Fig. 10 — Query 1, the classical same-generation
    * query over `subClassOf` and `type` (concepts on the same layer):
    *
    *   S → subClassOf⁻¹ S subClassOf | type⁻¹ S type
    *     | subClassOf⁻¹ subClassOf   | type⁻¹ type
    */
  val q1: Grammar = Grammar.parse(
    s"S -> $SubClassOfR S $SubClassOf | $TypeR S $Type | $SubClassOfR $SubClassOf | $TypeR $Type"
  )

  /** Q1 transformed to CNF by our transformer (equivalent to paper Fig. 4). */
  lazy val q1Cnf: CnfGrammar = CNF.transform(q1)

  /** Paper Fig. 4 — the reference CNF of Q1, transcribed verbatim.
    * Used to cross-check our own transformation.
    */
  val q1CnfPaper: CnfGrammar = CnfGrammar(
    binary = Seq(
      ("S", "S1", "S5"),
      ("S", "S3", "S6"),
      ("S", "S1", "S2"),
      ("S", "S3", "S4"),
      ("S5", "S", "S2"),
      ("S6", "S", "S4"),
    ),
    term = Seq(
      ("S1", SubClassOfR),
      ("S2", SubClassOf),
      ("S3", TypeR),
      ("S4", Type),
    ),
  )

  /** Paper Fig. 11 — Query 2, concepts on adjacent layers:
    *
    *   S → B subClassOf | subClassOf
    *   B → subClassOf⁻¹ B subClassOf | subClassOf⁻¹ subClassOf
    */
  val q2: Grammar = Grammar.parse(
    s"S -> B $SubClassOf | $SubClassOf",
    s"B -> $SubClassOfR B $SubClassOf | $SubClassOfR $SubClassOf",
  )

  /** Q2 in CNF (our transformer). */
  lazy val q2Cnf: CnfGrammar = CNF.transform(q2)

  /** The worked example of §4.3 uses the Q1 grammar; its graph lives in
    * `repro.graph.LabeledGraph.paperExample`. The paper's own CNF
    * (Fig. 4) is [[q1CnfPaper]].
    */
  val exampleCnf: CnfGrammar = q1CnfPaper
}
