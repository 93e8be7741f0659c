package repro.bench

import repro.SparkSpec
import repro.harness._

/** T2 — Fig. 5. Paper (8 servers, 650M–13B rows): Hillview at least as
  * fast as Spark on most operations even at 2× the data; Hillview 100x
  * totals 7.3–15.2 s but first partials arrive much earlier; Spark ships
  * an order of magnitude more bytes to the master except for O11.
  * Shapes checked here (single node, 2M–10M rows): every operation stays
  * interactive, first partials precede finals, and the vizketch root
  * traffic stays small relative to the data.
  */
class T2EndToEndWarmBench extends SparkSpec {

  test("T2: end-to-end warm — Hillview vs Spark baseline") {
    val rows = T2EndToEndWarm.run(spark)
    println(T2EndToEndWarm.render(rows))

    val hv = rows.filter(_.system == "Hillview")
    val sp = rows.filter(_.system == "Spark")
    assert(hv.size == 33 && sp.size == 33) // 11 ops × 3 sizes

    // Interactivity: everything completes well inside human timescales.
    rows.foreach(r => assert(r.totalMs < 60000, s"${r.system} ${r.op}@${r.size}: ${r.totalMs}ms"))

    // Progressiveness: the first partial never arrives after the final.
    hv.foreach(r => assert(r.firstPartialMs <= r.totalMs + 1e-6, s"${r.op}@${r.size}"))

    // Vizketch summaries are small: at the largest size, every operation's
    // root traffic is far below the raw data volume (~10M × 19 cols).
    hv.filter(_.size == "5x").foreach(r =>
      assert(r.bytes < 16L * 1024 * 1024, s"${r.op} shipped ${r.bytes} bytes"))

    // Aggregate comparison for the summary table in EXPERIMENTS.md.
    val hvTotal = hv.filter(_.size == "5x").map(_.totalMs).sum
    val spTotal = sp.filter(_.size == "5x").map(_.totalMs).sum
    println(f"== T2 summary: 5x totals — Hillview ${hvTotal}%.0f ms vs Spark ${spTotal}%.0f ms ==")
    val hvBytes = hv.filter(_.size == "5x").map(_.bytes).sum
    val spBytes = sp.filter(_.size == "5x").map(_.bytes).sum
    println(s"== T2 summary: 5x root bytes — Hillview $hvBytes vs Spark $spBytes ==")
  }
}

/** T3 — Fig. 6. Paper: cold 5x/10x complete in ~3 s, 100x up to 24 s,
  * first visualizations within 2.5–4 s. Shape: cold costs more than warm
  * but stays interactive, and partials arrive early.
  */
class T3EndToEndColdBench extends SparkSpec {

  test("T3: end-to-end cold from parquet") {
    val dir  = java.nio.file.Files.createTempDirectory("repro-cold-bench").toString
    val rows = T3EndToEndCold.run(spark, dir)
    println(T3EndToEndCold.render(rows))

    assert(rows.size == 18) // 9 ops × 2 sizes
    rows.foreach { r =>
      // Generous bound: this VM's kernel pageout daemon adds large
      // occasional stalls to disk-heavy phases (see DESIGN.md).
      assert(r.totalMs < 240000, s"${r.op}@${r.size}: ${r.totalMs}ms")
      assert(r.firstPartialMs <= r.totalMs + 1e-6)
    }
  }
}

/** T7 — Fig. 11. Paper: 1–6 actions per question, human time 0:20–6:44
  * (mostly thinking). Shape: the same questions are answerable by the
  * same kinds of action sequences, with machine time far under the
  * paper's human time.
  */
class T7CaseStudyBench extends SparkSpec {

  test("T7: case study Q1-Q20") {
    val rows = T7CaseStudy.run(spark)
    println(T7CaseStudy.render(rows))
    assert(rows.size == 20)
    rows.foreach { r =>
      assert(r.actions >= 1 && r.actions <= 6, s"${r.q}: ${r.actions} actions")
      assert(r.answer.nonEmpty)
      assert(r.machineMs < 120000, s"${r.q} took ${r.machineMs}ms")
    }
    // Ground-truth spot checks (the dataset is constructed so these hold).
    val byQ = rows.map(r => r.q -> r).toMap
    assert(byQ("Q1").answer.startsWith("UA"))
    assert(byQ("Q2").answer.startsWith("HA"))
    assert(byQ("Q9").answer.startsWith("EV"))
    assert(byQ("Q19").answer.contains("EV"))
    assert(byQ("Q20").answer.contains("cannot determine"))
  }
}
