package repro.jobs

import repro.bench.{BenchData, Tables}

/** spark-submit entrypoint reproducing Table 6 (coverage / influence).
  *
  * Usage: spark-submit --class repro.jobs.Table6Job repro.jar [nQueries] [k]
  */
object Table6Job {
  def main(args: Array[String]): Unit = {
    val nQueries = args.headOption.map(_.toInt).getOrElse(30)
    val k = args.lift(1).map(_.toInt).getOrElse(10)
    val rows = Tables.table6(nQueries, k).flatMap { r =>
      Seq(
        r.dataset +: "Coverage" +: Tables.Methods.map(m => f"${r.coverage(m)}%.4f"),
        r.dataset +: "Influence" +: Tables.Methods.map(m => f"${r.influence(m)}%.4f"),
      )
    }
    BenchData.printTable(
      s"Table 6: quantitative analysis ($nQueries queries/dataset, k=$k)",
      Seq("dataset", "metric") ++ Tables.Methods,
      rows,
    )
  }
}
