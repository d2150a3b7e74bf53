package repro.queries

import scala.collection.immutable.ListMap
import repro.core._
import repro.core.NRC._
import repro.data.BioData._

/** The biomedical benchmark queries (App. C): the five-step E2E driver-gene
  * pipeline (C.2) and the clinical exploration queries C1–C3 (C.3), as NRC
  * programs over the synthetic ICGC-like inputs of [[repro.data.BioData]].
  *
  * Two places where the paper's printed NRC is internally inconsistent are
  * repaired minimally (recorded in EXPERIMENTS.md):
  *   - Step₂ references `h.hscore`, which does not exist on `HybridMatrix`;
  *     we bind the hybrid scores with `for y in h.scores` and join them to
  *     the network through Biomart, matching the step's prose description.
  *   - C₂/C₃ join `SOImpact` on a `gene` attribute it does not have; we join
  *     `CopyNumber` (which the prose names) instead.
  */
object BioQueries {

  private def in(name: String, t: BagTpe) = InputBag(name, t)
  private def p(v: VarDef, a: String) = Proj(VarRef(v), a)

  val samplesBag: Expr        = in("Samples", BagTpe(samplesTpe))
  val occurrencesBag: Expr    = in("Occurrences", occurrencesTpe)
  val copyNumberBag: Expr     = in("CopyNumber", BagTpe(copyNumberTpe))
  val networkBag: Expr        = in("Network", networkTpe)
  val geneExpressionBag: Expr = in("GeneExpression", BagTpe(geneExpressionTpe))
  val soImpactBag: Expr       = in("SOImpact", BagTpe(soImpactTpe))
  val biomartBag: Expr        = in("Biomart", BagTpe(biomartTpe))

  val scoresTpe: BagTpe = BagTpe.of("gene" -> StringTpe, "score" -> RealTpe)
  val hybridTpe: BagTpe = BagTpe.of(
    "sample" -> StringTpe, "aliquot" -> StringTpe, "scores" -> scoresTpe)
  val nodesTpe: BagTpe = BagTpe.of("node" -> StringTpe, "score" -> RealTpe)
  val sampleNetworkTpe: BagTpe = BagTpe.of(
    "sample" -> StringTpe, "aliquot" -> StringTpe, "nodes" -> nodesTpe)

  /** The qualitative→quantitative impact mapping of Step₁. */
  private def impactScore(t: VarDef): Expr = {
    def is(v: String) = Cmp("==", p(t, "impact"), Const(v, StringTpe))
    ScalarIf(is("HIGH"), Const(0.8, RealTpe),
      ScalarIf(is("MODERATE"), Const(0.5, RealTpe),
        ScalarIf(is("LOW"), Const(0.3, RealTpe),
          ScalarIf(is("MODIFIER"), Const(0.15, RealTpe), Const(0.01, RealTpe)))))
  }

  /** Step₁ — hybrid scores: integrate mutation impact and copy number per
    * sample (C.2.1).
    */
  def step1: Expr = {
    val s = VarDef("s", samplesTpe)
    val o = VarDef("o", occurrencesTpe.elem)
    val t = VarDef("t", candidatesTpe.elem)
    val cn = VarDef("cn", copyNumberTpe)
    val c = VarDef("c", consequencesTpe.elem)
    val v = VarDef("v", soImpactTpe)
    val score = Arith("*", Arith("*", Arith("*",
      Arith("*", impactScore(t), p(v, "value")),
      Arith("+", p(cn, "cnum"), Const(0.01, RealTpe))),
      p(t, "sift")), p(t, "poly"))
    ForUnion(s, samplesBag, Sng(Tup(
      "sample" -> p(s, "sample"), "aliquot" -> p(s, "aliquot"),
      "scores" -> SumByE(
        ForUnion(o, occurrencesBag,
          IfThenBag(Cmp("==", p(o, "sample"), p(s, "sample")),
            ForUnion(t, Proj(VarRef(o), "candidates"),
              ForUnion(cn, copyNumberBag,
                IfThenBag(And(Cmp("==", p(s, "aliquot"), p(cn, "aliquot")),
                              Cmp("==", p(cn, "gene"), p(t, "gene"))),
                  ForUnion(c, Proj(VarRef(t), "consequences"),
                    ForUnion(v, soImpactBag,
                      IfThenBag(Cmp("==", p(c, "conseq"), p(v, "conseq")),
                        Sng(Tup("gene" -> p(t, "gene"), "score" -> score)))))))))),
        Seq("gene"), Seq("score")))))
  }

  /** Step₂ — per-sample network aggregation (C.2.2, with the `h.hscore` fix
    * described above).
    */
  def step2: Expr = {
    val h = VarDef("h", hybridTpe.elem)
    val n2 = VarDef("n2", networkTpe.elem)
    val e = VarDef("e", networkTpe.elem("edges").asInstanceOf[BagTpe].elem)
    val b = VarDef("b", biomartTpe)
    val y = VarDef("y", scoresTpe.elem)
    ForUnion(h, in("HybridMatrix", hybridTpe), Sng(Tup(
      "sample" -> p(h, "sample"), "aliquot" -> p(h, "aliquot"),
      "nodes" -> SumByE(
        ForUnion(n2, networkBag,
          ForUnion(e, Proj(VarRef(n2), "edges"),
            ForUnion(b, biomartBag,
              IfThenBag(Cmp("==", p(e, "edgeProtein"), p(b, "protein")),
                ForUnion(y, Proj(VarRef(h), "scores"),
                  IfThenBag(Cmp("==", p(y, "gene"), p(b, "gene")),
                    Sng(Tup("node" -> p(n2, "nodeProtein"),
                      "score" -> Arith("*", p(e, "distance"), p(y, "score")))))))))),
        Seq("node"), Seq("score")))))
  }

  /** Step₃ — effect scores: combine network aggregates with hybrid scores
    * (C.2.3).
    */
  def step3: Expr = {
    val h2 = VarDef("h2", hybridTpe.elem)
    val s2 = VarDef("s2", sampleNetworkTpe.elem)
    val nd = VarDef("nd", nodesTpe.elem)
    val b2 = VarDef("b2", biomartTpe)
    val y2 = VarDef("y2", scoresTpe.elem)
    ForUnion(h2, in("HybridMatrix", hybridTpe), Sng(Tup(
      "sample" -> p(h2, "sample"), "aliquot" -> p(h2, "aliquot"),
      "scores" -> ForUnion(s2, in("SampleNetwork", sampleNetworkTpe),
        IfThenBag(And(Cmp("==", p(h2, "sample"), p(s2, "sample")),
                      Cmp("==", p(h2, "aliquot"), p(s2, "aliquot"))),
          ForUnion(nd, Proj(VarRef(s2), "nodes"),
            ForUnion(b2, biomartBag,
              IfThenBag(Cmp("==", p(nd, "node"), p(b2, "protein")),
                ForUnion(y2, Proj(VarRef(h2), "scores"),
                  IfThenBag(Cmp("==", p(y2, "gene"), p(b2, "gene")),
                    Sng(Tup("gene" -> p(y2, "gene"),
                      "score" -> Arith("*", p(nd, "score"), p(y2, "score"))))))))))))))
  }

  /** Step₄ — connection scores: combine effect scores with expression
    * (C.2.3, with the per-aliquot expression join).
    */
  def step4: Expr = {
    val e3 = VarDef("e3", hybridTpe.elem)
    val y3 = VarDef("y3", scoresTpe.elem)
    val g  = VarDef("g", geneExpressionTpe)
    ForUnion(e3, in("EffectMatrix", hybridTpe), Sng(Tup(
      "sample" -> p(e3, "sample"), "aliquot" -> p(e3, "aliquot"),
      "scores" -> SumByE(
        ForUnion(y3, Proj(VarRef(e3), "scores"),
          ForUnion(g, geneExpressionBag,
            IfThenBag(And(Cmp("==", p(y3, "gene"), p(g, "gene")),
                          Cmp("==", p(e3, "aliquot"), p(g, "aliquot"))),
              Sng(Tup("gene" -> p(y3, "gene"),
                "score" -> Arith("*", p(y3, "score"), p(g, "fpkm"))))))),
        Seq("gene"), Seq("score")))))
  }

  /** Step₅ — gene connectivity across all samples (C.2.4); flat output. */
  def step5: Expr = {
    val c4 = VarDef("c4", hybridTpe.elem)
    val y4 = VarDef("y4", scoresTpe.elem)
    SumByE(
      ForUnion(c4, in("ConnectMatrix", hybridTpe),
        ForUnion(y4, Proj(VarRef(c4), "scores"),
          Sng(Tup("gene" -> p(y4, "gene"), "score" -> p(y4, "score"))))),
      Seq("gene"), Seq("score"))
  }

  /** The pipeline as an assignment sequence (each step consumes the previous
    * step's materialized output).
    */
  def e2e: Program = Program(Seq(
    Assignment("HybridMatrix", step1),
    Assignment("SampleNetwork", step2),
    Assignment("EffectMatrix", step3),
    Assignment("ConnectMatrix", step4),
    Assignment("Connectivity", step5)))

  // ------------------------------------------------------ clinical queries

  /** C₁ — group occurrences by sample; four-level nested output (C.3.1). */
  def c1: Expr = {
    val s = VarDef("cs", samplesTpe)
    val o = VarDef("co", occurrencesTpe.elem)
    val t = VarDef("ct", candidatesTpe.elem)
    val c = VarDef("cc", consequencesTpe.elem)
    val v = VarDef("cv", soImpactTpe)
    ForUnion(s, samplesBag, Sng(Tup(
      "sample" -> p(s, "sample"),
      "mutations" -> ForUnion(o, occurrencesBag,
        IfThenBag(Cmp("==", p(s, "sample"), p(o, "sample")),
          Sng(Tup(
            "mutationId" -> p(o, "mutationId"),
            "candidates" -> ForUnion(t, Proj(VarRef(o), "candidates"),
              Sng(Tup(
                "gene" -> p(t, "gene"), "sift" -> p(t, "sift"),
                "consequences" -> ForUnion(c, Proj(VarRef(t), "consequences"),
                  ForUnion(v, soImpactBag,
                    IfThenBag(Cmp("==", p(c, "conseq"), p(v, "conseq")),
                      Sng(Tup("conseq" -> p(v, "conseq"),
                        "score" -> p(v, "value"))))))))))))))))
  }

  /** C₂ — as C₁ with a copy-number join at the candidates level (C.3.2). */
  def c2: Expr = {
    val s = VarDef("ds", samplesTpe)
    val o = VarDef("do2", occurrencesTpe.elem)
    val t = VarDef("dt", candidatesTpe.elem)
    val g = VarDef("dg", copyNumberTpe)
    val c = VarDef("dc", consequencesTpe.elem)
    val v = VarDef("dv", soImpactTpe)
    ForUnion(s, samplesBag, Sng(Tup(
      "sample" -> p(s, "sample"),
      "mutations" -> ForUnion(o, occurrencesBag,
        IfThenBag(Cmp("==", p(s, "sample"), p(o, "sample")),
          Sng(Tup(
            "mutationId" -> p(o, "mutationId"),
            "candidates" -> ForUnion(t, Proj(VarRef(o), "candidates"),
              ForUnion(g, copyNumberBag,
                IfThenBag(Cmp("==", p(g, "gene"), p(t, "gene")),
                  Sng(Tup(
                    "gene" -> p(t, "gene"), "cnum" -> p(g, "cnum"),
                    "consequences" -> ForUnion(c, Proj(VarRef(t), "consequences"),
                      ForUnion(v, soImpactBag,
                        IfThenBag(Cmp("==", p(c, "conseq"), p(v, "conseq")),
                          Sng(Tup("conseq" -> p(v, "conseq"),
                            "score" -> p(v, "value"))))))))))))))))))
  }

  /** C₃ — as C₂, aggregating copy number × consequence score per gene
    * (C.3.3).
    */
  def c3: Expr = {
    val s = VarDef("es", samplesTpe)
    val o = VarDef("eo", occurrencesTpe.elem)
    val t = VarDef("et", candidatesTpe.elem)
    val g = VarDef("eg", copyNumberTpe)
    val c = VarDef("ec", consequencesTpe.elem)
    val v = VarDef("ev", soImpactTpe)
    ForUnion(s, samplesBag, Sng(Tup(
      "sample" -> p(s, "sample"),
      "mutations" -> ForUnion(o, occurrencesBag,
        IfThenBag(Cmp("==", p(s, "sample"), p(o, "sample")),
          Sng(Tup(
            "mutationId" -> p(o, "mutationId"),
            "candidates" -> SumByE(
              ForUnion(t, Proj(VarRef(o), "candidates"),
                ForUnion(g, copyNumberBag,
                  IfThenBag(Cmp("==", p(g, "gene"), p(t, "gene")),
                    ForUnion(c, Proj(VarRef(t), "consequences"),
                      ForUnion(v, soImpactBag,
                        IfThenBag(Cmp("==", p(c, "conseq"), p(v, "conseq")),
                          Sng(Tup("gene" -> p(t, "gene"),
                            "score" -> Arith("*", p(g, "cnum"), p(v, "value")))))))))),
              Seq("gene"), Seq("score")))))))))
  }

  def clinical: ListMap[String, Expr] = ListMap("C1" -> c1, "C2" -> c2, "C3" -> c3)
}
