package repro.harness

import org.apache.spark.sql.SparkSession
import repro.engine.ComputationCache
import repro.spreadsheet.{Questions, Spreadsheet}

/** T7 — Fig. 11: the Q1–Q20 case study, scripted. The paper reports
  * human action counts and wall-clock (dominated by operator thinking);
  * we report the scripted action counts (comparable) and the machine
  * execution time of the same action sequences (reported, not compared —
  * see DESIGN.md §5).
  */
object T7CaseStudy {

  final case class Row(q: String, actions: Int, paperActions: Int,
                       machineMs: Double, paperTime: String, answer: String)

  /** Fig. 11's (actions, time) per question; '-' marks Q20's no-answer. */
  val PaperNumbers: Map[String, (Int, String)] = Map(
    "Q1" -> (5, "1:11"), "Q2" -> (3, "1:32"), "Q3" -> (4, "1:13"), "Q4" -> (5, "0:47*"),
    "Q5" -> (5, "2:26"), "Q6" -> (4, "2:15*"), "Q7" -> (2, "1:08"), "Q8" -> (5, "2:56"),
    "Q9" -> (1, "0:34"), "Q10" -> (1, "1:08*"), "Q11" -> (3, "1:18"), "Q12" -> (5, "6:44"),
    "Q13" -> (6, "6:27"), "Q14" -> (2, "0:20"), "Q15" -> (4, "1:56"), "Q16" -> (3, "1:07"),
    "Q17" -> (3, "1:07"), "Q18" -> (2, "1:08"), "Q19" -> (2, "0:40"), "Q20" -> (0, "2:23†"),
  )

  def run(spark: SparkSession, rows: Long = 1_000_000L): Seq[Row] = {
    val table = Datasets.flightsTable(spark, rows, "casestudy")
    val sheet = new Spreadsheet(new ComputationCache())
    try Questions.all.map { case (q, fn) =>
      val a = fn(sheet, table)
      val (pActs, pTime) = PaperNumbers(q)
      Row(q, a.actions, pActs, a.ms, pTime, a.text)
    }
    finally table.drop()
  }

  def render(rows: Seq[Row]): String =
    TableText.render("T7 (Fig. 11): case study Q1–Q20",
      Seq("Q", "Actions (ours)", "Actions (paper)", "Machine (ms)", "Paper time", "Answer"),
      rows.map(r => Seq(r.q, r.actions.toString, r.paperActions.toString,
        TableText.fmtMs(r.machineMs), r.paperTime, r.answer)))
}
