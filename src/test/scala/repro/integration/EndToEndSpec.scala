package repro.integration

import repro.SparkSpec
import repro.baselines.Emb
import repro.bench.Methods
import repro.core.{ApproxPPR, NRP}
import repro.eval.{GraphReconstruction, LinkPrediction, NodeClassification}
import repro.graph.Generators

/** Integration tests: the paper's qualitative findings at unit-test scale
  * — the directional claims the benches then quantify at bench scale.
  */
class EndToEndSpec extends SparkSpec {

  private lazy val sbm = Generators.dcsbm(spark, n = 400, avgDeg = 8, numLabels = 4,
    directed = true, seed = 81)
  private lazy val split = LinkPrediction.split(sbm.graph, 0.3, seed = 1)
  private lazy val nrpEmb: Emb = {
    val r = NRP(split.train, NRP.Params(k = 32, l1 = 15, l2 = 8))
    Emb(r.x, r.y)
  }
  private lazy val pprEmb: Emb = {
    val e = ApproxPPR(split.train, kPrime = 16, alpha = 0.15, l1 = 15, eps = 0.2).local
    Emb(e.x, e.y)
  }

  test("link prediction: both PPR methods beat random, NRP >= ApproxPPR") {
    val aucNrp = LinkPrediction.auc(nrpEmb, split)
    val aucPpr = LinkPrediction.auc(pprEmb, split)
    assert(aucPpr > 0.6, s"ApproxPPR AUC $aucPpr should beat random")
    assert(aucNrp > 0.6, s"NRP AUC $aucNrp should beat random")
    assert(aucNrp >= aucPpr - 0.02,
      s"NRP ($aucNrp) should not trail ApproxPPR ($aucPpr) — Fig. 4 shape")
  }

  test("reweighting improves link prediction over l2=0 (Fig. 8d shape)") {
    val base = ApproxPPR(split.train, kPrime = 16, alpha = 0.15, l1 = 15, eps = 0.2).local
    val sweep = NRP.reweightSweep(split.train, base.x.map(_.clone()), base.y.map(_.clone()),
      NRP.Params(k = 32), Seq(0, 8))
    val auc0 = LinkPrediction.auc(Emb(sweep(0).x, sweep(0).y), split)
    val auc8 = LinkPrediction.auc(Emb(sweep(8).x, sweep(8).y), split)
    assert(auc8 > auc0, s"l2=8 AUC $auc8 should beat l2=0 AUC $auc0")
  }

  test("graph reconstruction: NRP precision@100 far exceeds the random rate") {
    val r = NRP(sbm.graph, NRP.Params(k = 32, l1 = 15, l2 = 8))
    val prec = GraphReconstruction.precisionAtK(Emb(r.x, r.y), sbm.graph, Seq(100))
    val randomRate = sbm.graph.m.toDouble / (sbm.graph.n.toDouble * (sbm.graph.n - 1))
    assert(prec(100) > 10 * randomRate && prec(100) > 0.3,
      s"prec@100 = ${prec(100)}, random rate $randomRate")
  }

  test("node classification: NRP features beat the majority-class baseline") {
    val r = NRP(sbm.graph, NRP.Params(k = 32, l1 = 15, l2 = 8))
    val (micro, _) = NodeClassification.evaluate(Emb(r.x, r.y), sbm.labels, sbm.numLabels, 0.5)
    val majority = 1.0 / sbm.numLabels // balanced labels
    assert(micro > majority + 0.1, s"micro-F1 $micro vs majority $majority")
  }

  test("method registry: every method produces usable embeddings on a tiny graph") {
    val g = Generators.dcsbm(spark, n = 60, avgDeg = 4, numLabels = 3, seed = 91).graph
    for (m <- Methods.all) {
      val emb = m.run(g, 8, 20L)
      assert(emb.x.length == 60, s"${m.name} row count")
      assert(emb.x.flatten.forall(v => !v.isNaN && !v.isInfinite), s"${m.name} finite")
      val auc = {
        val s = LinkPrediction.split(g, 0.3, seed = 2)
        LinkPrediction.auc(emb, s)
      }
      assert(auc >= 0.0 && auc <= 1.0, s"${m.name} auc")
    }
  }
}
