package repro.jobs

import repro.bench.{BenchData, Tables}

/** spark-submit entrypoint reproducing Table 5 (user-study proxy).
  *
  * Usage: spark-submit --class repro.jobs.Table5Job repro.jar [nQueries] [k]
  */
object Table5Job {
  def main(args: Array[String]): Unit = {
    val nQueries = args.headOption.map(_.toInt).getOrElse(20)
    val k = args.lift(1).map(_.toInt).getOrElse(5)
    val rows = Tables.table5(nQueries, k).flatMap { r =>
      Seq(
        r.dataset +: "Represent." +: Tables.Methods.map(m => f"${r.repr(m)}%.2f"),
        r.dataset +: "Impact" +: Tables.Methods.map(m => f"${r.impact(m)}%.2f"),
      )
    }
    BenchData.printTable(
      s"Table 5: user-study proxy (ranks 1-5, $nQueries queries/dataset, k=$k)",
      Seq("dataset", "aspect") ++ Tables.Methods,
      rows,
    )
  }
}
