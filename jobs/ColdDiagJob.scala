package repro.jobs

import repro.core._
import repro.engine.ExecutionTree
import repro.harness.Datasets
import repro.spreadsheet.Ops

/** Diagnostic: isolate the cold-path cost of each phase (scan/convert,
  * 1-column next-items, 5-column next-items) on the same parquet file.
  */
object ColdDiagJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.get("cold-diag")
    val rows  = args.headOption.map(_.toLong).getOrElse(10_000_000L)
    val dir   = sys.props("java.io.tmpdir") + "/repro-cold-diag"
    val path  = Datasets.writeParquet(spark, rows, dir)

    def timed[A](label: String)(f: => A): A = {
      val t0 = System.nanoTime()
      val r  = f
      println(f"[cold-diag] $label: ${(System.nanoTime() - t0) / 1e6}%.0f ms")
      r
    }

    timed("scan+convert (numRows)") {
      Datasets.flightsCold(spark, path, "d0").numRows
    }
    timed("moments") {
      ExecutionTree.run(Datasets.flightsCold(spark, path, "d1"), MomentsSketch("DepDelay"))
    }
    timed("nextItems 1 col") {
      ExecutionTree.run(Datasets.flightsCold(spark, path, "d2"),
        NextItemsSketch(Seq(SortCol("DepDelay")), 20))
    }
    timed("nextItems 5 col") {
      ExecutionTree.run(Datasets.flightsCold(spark, path, "d3"),
        NextItemsSketch(Ops.SortCols5, 20))
    }
    spark.stop()
  }
}
