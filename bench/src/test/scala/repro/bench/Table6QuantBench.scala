package repro.bench

import org.scalatest.funsuite.AnyFunSuite

/** Table 6 — the quantitative coverage / influence analysis (see
  * [[Tables.table6]]): five methods, three datasets, k = 10, averaged over a
  * query sample (the paper samples 1K of its 10K workload; we sample 30 at
  * our scale).
  */
class Table6QuantBench extends AnyFunSuite {

  private val paper = Map(
    "aminer" -> Map(
      "TF-IDF" -> (0.1968, 0.0765), "DIV" -> (0.1766, 0.0777), "Sumblr" -> (0.2140, 0.5470),
      "REL" -> (0.2400, 0.1159), "k-SIR" -> (0.2663, 0.8430)),
    "reddit" -> Map(
      "TF-IDF" -> (0.2387, 0.0175), "DIV" -> (0.2050, 0.0107), "Sumblr" -> (0.2419, 0.4315),
      "REL" -> (0.2885, 0.0143), "k-SIR" -> (0.3162, 0.5862)),
    "twitter" -> Map(
      "TF-IDF" -> (0.2200, 0.0295), "DIV" -> (0.2118, 0.0296), "Sumblr" -> (0.2213, 0.1611),
      "REL" -> (0.2722, 0.1268), "k-SIR" -> (0.3052, 0.6516)),
  )

  private val methods = Tables.Methods

  test("Table 6: k-SIR wins coverage and influence on every dataset") {
    val perDataset = Tables.table6(nQueries = 30, k = 10)

    val rows = perDataset.flatMap { r =>
      Seq(
        r.dataset +: "Coverage" +: methods.map(m => f"${r.coverage(m)}%.4f"),
        "" +: "  (paper)" +: methods.map(m => f"${paper(r.dataset)(m)._1}%.4f"),
        r.dataset +: "Influence" +: methods.map(m => f"${r.influence(m)}%.4f"),
        "" +: "  (paper)" +: methods.map(m => f"${paper(r.dataset)(m)._2}%.4f"),
      )
    }
    BenchData.printTable(
      "Table 6: quantitative analysis (30 queries/dataset, k=10)",
      Seq("dataset", "metric") ++ methods,
      rows,
    )

    // Paper shape assertions (after printing, so failures still show data).
    perDataset.foreach { r =>
      methods.filterNot(_ == "k-SIR").foreach { m =>
        assert(r.coverage("k-SIR") >= r.coverage(m),
          s"${r.dataset}: coverage k-SIR=${r.coverage("k-SIR")} < $m=${r.coverage(m)}")
        assert(r.influence("k-SIR") >= r.influence(m),
          s"${r.dataset}: influence k-SIR=${r.influence("k-SIR")} < $m=${r.influence(m)}")
      }
      // Only k-SIR and Sumblr are influence-aware: Sumblr clearly beats the
      // influence-blind keyword baselines (paper's second observation).
      Seq("TF-IDF", "DIV").foreach { m =>
        assert(r.influence("Sumblr") > r.influence(m),
          s"${r.dataset}: influence Sumblr=${r.influence("Sumblr")} <= $m=${r.influence(m)}")
      }
    }
    // REL beats TF-IDF on coverage (topic-aware relevance) — strictly on
    // most datasets, never by-more-than-noise worse (aminer is a near-tie
    // at our query-sample size; see EXPERIMENTS.md).
    val relWins = perDataset.count(r => r.coverage("REL") > r.coverage("TF-IDF"))
    assert(relWins >= 2, s"REL should beat TF-IDF on coverage on most datasets, won $relWins/3")
    perDataset.foreach { r =>
      assert(r.coverage("REL") >= 0.95 * r.coverage("TF-IDF"),
        s"${r.dataset}: REL=${r.coverage("REL")} vs TF-IDF=${r.coverage("TF-IDF")}")
    }
  }
}
