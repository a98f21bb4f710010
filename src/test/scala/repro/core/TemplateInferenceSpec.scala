package repro.core

import repro.SparkSpec
import repro.corpus.{Corpora, SpreadsheetGen}
import repro.eval.{Metrics, Strategies}

/** Template inference pipeline (paper §4.4, Algorithm 1) on Spark. */
class TemplateInferenceSpec extends SparkSpec {

  /** Tiny corpus: 3 multi-file templates + singletons, gold regions. */
  private lazy val files = {
    val plan = Vector(
      Corpora.TemplatePlan("ti-t0", SpreadsheetGen.FewRegions, 3),
      Corpora.TemplatePlan("ti-t1", SpreadsheetGen.FewRegions, 3),
      Corpora.TemplatePlan("ti-t2", SpreadsheetGen.One, 4),
      Corpora.TemplatePlan("ti-t3", SpreadsheetGen.ManyRegions, 1),
      Corpora.TemplatePlan("ti-t4", SpreadsheetGen.One, 1))
    Corpora.generate(spark, "ti", plan)
  }
  private lazy val layouts =
    files.map(f => LayoutGraph.build(f.fileId, Mondrian.regionsFromBoxes(f.grid, f.regionBoxes)))

  test("candidate pairs link files sharing similar regions") {
    val cands = TemplateInference.candidatePairs(spark, layouts.flatMap(_.regions), 0.75)
    val tmpl = files.map(f => f.fileId -> f.templateId).toMap
    // every same-template pair must be a candidate (same schema regions)
    for (Seq(a, b) <- files.combinations(2) if tmpl(a.fileId) == tmpl(b.fileId)) {
      val key = if (a.fileId < b.fileId) (a.fileId, b.fileId) else (b.fileId, a.fileId)
      assert(cands.contains(key), s"missing candidate $key")
    }
  }
  test("candidate pairs are deduplicated and ordered") {
    val cands = TemplateInference.candidatePairs(spark, layouts.flatMap(_.regions), 0.75)
    assert(cands.distinct.size == cands.size)
    assert(cands.forall { case (a, b) => a < b })
  }

  test("gold regions + high threshold recover the planned templates well") {
    // τ_f = 0.95 here: gold layouts of one template differ through gap and
    // row-count jitter, so 0.99 is deliberately over-selective (the paper's
    // completeness also drops toward τ_f = 1, Figure 8)
    val result = TemplateInference.infer(spark, layouts, TemplateInference.Params(tauLayout = 0.95))
    val gold = files.map(_.templateId)
    val pred = files.map(f => result.templateOf(f.fileId))
    val (h, c, v) = Metrics.vMeasure(gold.map(_.hashCode) zip pred)
    assert(h > 0.8, s"homogeneity $h")
    assert(c > 0.7, s"completeness $c")
    assert(v > 0.75, s"v-measure $v")
  }

  test("threshold 1.0 makes nearly every file its own template (perfect homogeneity)") {
    val edges = TemplateInference.scoredEdges(spark, layouts, 0.75)
    val t = TemplateInference.templatesFromEdges(files.map(_.fileId), edges, 1.0 + 1e-9)
    val gold = files.map(_.templateId.hashCode)
    val pred = files.map(f => t(f.fileId))
    val (h, _, _) = Metrics.vMeasure(gold zip pred)
    assert(h == 1.0)
  }

  test("lowering the threshold merges more (completeness monotone)") {
    val edges = TemplateInference.scoredEdges(spark, layouts, 0.75)
    def nTemplates(tau: Double) =
      TemplateInference.templatesFromEdges(files.map(_.fileId), edges, tau).values.toSet.size
    assert(nTemplates(0.7) <= nTemplates(0.9))
    assert(nTemplates(0.9) <= nTemplates(1.01))
  }

  test("templates are transitively closed") {
    val result = TemplateInference.infer(spark, layouts, TemplateInference.Params(tauLayout = 0.95))
    for ((a, b, _) <- result.edges)
      assert(result.templateOf(a) == result.templateOf(b))
  }

  test("spark and sequential Algorithm 1 agree on the fixed point") {
    // sequential index pruning is a subset of all-pairs candidates; with
    // gold regions both must find the same same-template groups
    val seq = TemplateInference.sequential(layouts, TemplateInference.Params(tauLayout = 0.99))
    val par = TemplateInference.infer(spark, layouts, TemplateInference.Params(tauLayout = 0.99))
    def groups(m: Map[String, Int]) = m.groupBy(_._2).values.map(_.keys.toSet).toSet
    assert(groups(seq.templateOf) == groups(par.templateOf))
  }

  test("files without regions form singleton templates") {
    val empty = LayoutGraph.build("empty-file", Vector.empty)
    val result = TemplateInference.infer(spark, layouts :+ empty, TemplateInference.Params())
    assert(result.templateOf.contains("empty-file"))
    assert(result.templateOf.values.count(_ == result.templateOf("empty-file")) == 1)
  }

  test("scoredEdges respects the size-bound pruning") {
    val edges = TemplateInference.scoredEdges(spark, layouts, 0.75, minTau = 0.7)
    val sizeOf = layouts.map(g => g.fileId -> g.size).toMap
    for ((a, b, _) <- edges)
      assert(LayoutGraph.sizeBound(sizeOf(a), sizeOf(b)) >= 0.7)
  }

  test("detected-region pipeline (static radius) still groups same-template files") {
    val regions = Strategies.detect(spark, "Static Radius", "ti-deco", files, files)
    val ls = Strategies.layouts(files, regions)
    val result = TemplateInference.infer(spark, ls, TemplateInference.Params(tauLayout = 0.99))
    val gold = files.map(_.templateId.hashCode)
    val pred = files.map(f => result.templateOf(f.fileId))
    val (_, _, v) = Metrics.vMeasure(gold zip pred)
    assert(v > 0.6, s"v-measure with detected regions $v")
  }
}
