package repro.jobs

import repro.bench.{BenchData, Tables}

/** spark-submit entrypoint reproducing the §5.3 efficiency comparison
  * (the headline claims behind Figures 9–11).
  *
  * Usage: spark-submit --class repro.jobs.EfficiencyJob repro.jar [nQueries] [k] [eps]
  */
object EfficiencyJob {
  def main(args: Array[String]): Unit = {
    val nQueries = args.headOption.map(_.toInt).getOrElse(25)
    val k = args.lift(1).map(_.toInt).getOrElse(BenchData.DefaultK)
    val eps = args.lift(2).map(_.toDouble).getOrElse(BenchData.Epsilon)
    val rows = BenchData.all.flatMap { ds =>
      val (acc, totalActive) = Tables.efficiency(ds, k, eps, nQueries)
      val celf = acc("CELF")
      Tables.EffMethods.map { m =>
        val a = acc(m)
        Seq(ds.name, m, f"${a.ms / nQueries}%.2f", f"${celf.ms / a.ms}%.1fx",
          f"${a.score / celf.score}%.4f", f"${a.evaluated.toDouble / totalActive * 100}%.1f%%")
      }
    }
    BenchData.printTable(
      s"Efficiency (k=$k, ε=$eps, $nQueries queries/dataset)",
      Seq("dataset", "method", "ms/query", "speedup vs CELF", "quality vs CELF", "evaluated"),
      rows,
    )
  }
}
