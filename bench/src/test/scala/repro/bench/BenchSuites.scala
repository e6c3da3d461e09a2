package repro.bench

import repro.SparkSpec

/** Benchmark suites — one per reproduced exhibit (DESIGN.md §4). Each
  * prints the regenerated table; EXPERIMENTS.md records these rows next
  * to the paper's numbers. Suites run sequentially in one JVM, sharing
  * the SparkSession and the embedding cache in [[Tables]].
  *
  * Naming note: ScalaTest runs suites alphabetically; prefixes keep the
  * cheap tables first and the heavyweight sweeps last.
  */
class B01_Table1Bench extends SparkSpec {
  test("T1: Table 1 PPR rows reproduce (v2/v4/v9 within ±0.0015)") {
    val rows = Tables.table1(spark)
    for (s <- Seq("v2", "v4", "v9"); j <- 0 until 9)
      assert(math.abs(rows(s)(j) - Tables.table1Paper(s)(j)) <= 0.0015, s"$s col ${j + 1}")
  }
}

class B02_DatasetStatsBench extends SparkSpec {
  test("T3: dataset statistics table") {
    val rows = Tables.datasetStats(spark)
    assert(rows.size == 5)
  }
}

class B03_LinkPredictionBench extends SparkSpec {
  test("T4: link prediction AUC vs k") {
    val rows = Tables.linkPrediction(spark)
    def auc(ds: String, m: String, k: Int): Double =
      rows.find(r => r._1 == ds && r._2 == m && r._3 == k).get._4
    // Fig. 4 shape: NRP leads the PPR family and beats random by a wide margin.
    for (ds <- Seq("wiki-lite", "blog-lite")) {
      assert(auc(ds, "NRP", 64) > 0.70, s"$ds NRP k=64 = ${auc(ds, "NRP", 64)}")
      assert(auc(ds, "NRP", 64) >= auc(ds, "ApproxPPR", 64) - 0.01,
        s"$ds: NRP should not trail ApproxPPR")
    }
  }
}

class B04_ReconstructionBench extends SparkSpec {
  test("T5: graph reconstruction precision@K") {
    val rows = Tables.reconstruction(spark)
    def prec(ds: String, m: String, k: Int): Double =
      rows.find(r => r._1 == ds && r._2 == m && r._3 == k).get._4
    for (ds <- Seq("wiki-lite", "blog-lite"))
      assert(prec(ds, "NRP", 100) > 0.5, s"$ds NRP prec@100 = ${prec(ds, "NRP", 100)}")
  }
}

class B05_ClassificationBench extends SparkSpec {
  test("T6: node classification Micro-F1 vs train fraction") {
    val rows = Tables.classification(spark)
    def f1(ds: String, m: String, frac: Double): Double =
      rows.find(r => r._1 == ds && r._2 == m && r._3 == frac).get._4
    for (ds <- Seq("wiki-lite", "blog-lite"))
      assert(f1(ds, "NRP", 0.5) > 1.0 / 8 + 0.1, s"$ds NRP micro-F1 beats majority")
  }
}

class B06_EvolvingBench extends SparkSpec {
  test("T9: evolving-graph link prediction") {
    val rows = Tables.evolving(spark)
    def auc(ds: String, m: String): Double =
      rows.find(r => r._1 == ds && r._2 == m).get._3
    for (ds <- Seq("vk-lite", "digg-lite"))
      assert(auc(ds, "NRP") > 0.55, s"$ds NRP AUC = ${auc(ds, "NRP")}")
  }
}

class B07_EfficiencyBench extends SparkSpec {
  test("T7: embedding construction time vs k") {
    val rows = Tables.efficiency(spark)
    assert(rows.exists(r => r._1 == "twitter-lite" && r._2 == "NRP"))
  }
}

class B08_ParamSweepBench extends SparkSpec {
  test("T8/T11: NRP parameter sweeps (AUC and running time)") {
    val points = Tables.paramSweeps(spark)
    // Fig. 8d shape: enabling reweighting (l2 10 vs 0) must not hurt, and
    // Fig. 8c shape: l1=20 must beat l1=1.
    for (ds <- Seq("wiki-lite", "blog-lite")) {
      val l2 = points.filter(p => p.dataset == ds && p.param == "l2")
      val auc0 = l2.find(_.value == 0).get.auc
      val auc10 = l2.find(_.value == 10).get.auc
      assert(auc10 >= auc0 - 0.01, s"$ds: l2=10 ($auc10) vs l2=0 ($auc0)")
      val l1 = points.filter(p => p.dataset == ds && p.param == "l1")
      assert(l1.find(_.value == 20).get.auc > l1.find(_.value == 1).get.auc,
        s"$ds: l1=20 should beat l1=1")
    }
  }
}

class B09_ScalabilityBench extends SparkSpec {
  test("T10: NRP scales near-linearly on Erdős–Rényi graphs") {
    val rows = Tables.scalability(spark)
    val varyM = rows.filter(_._1 == "vary-m").sortBy(_._2)
    // time at 8x edges should stay well under 8x+slack of time at 1x —
    // i.e. growth is at-most-linear-ish, not quadratic.
    val t1 = varyM.head._3; val t8 = varyM.last._3
    assert(t8 < 16 * math.max(t1, 1.0), s"t(m=8x)=$t8 vs t(m=1x)=$t1")
  }
}
