package repro.baseline

import java.sql.{Connection, DriverManager}

/** §7.2.1 baseline: "a common high-end commercial in-memory database
  * system performing a histogram calculation". The commercial system is
  * unnamed and unavailable; DuckDB (in-process, vectorized, in-memory
  * table) stands in — see DESIGN.md. The comparison point is unchanged: a
  * general-purpose SQL engine computing a histogram it was not
  * specialized for, versus a vizketch.
  */
object DuckDbBaseline {

  /** Load `values` into an in-memory DuckDB table. Load time is NOT part
    * of the measurement (the paper's DB holds the data already).
    */
  def connectionWithData(values: Array[Double], table: String = "t"): Connection = {
    Class.forName("org.duckdb.DuckDBDriver")
    val conn = DriverManager.getConnection("jdbc:duckdb:")
    conn.createStatement.execute(s"CREATE TABLE $table (x DOUBLE)")
    val appender = conn.asInstanceOf[org.duckdb.DuckDBConnection]
      .createAppender("main", table)
    var i = 0
    while (i < values.length) {
      appender.beginRow(); appender.append(values(i)); appender.endRow()
      i += 1
    }
    appender.close()
    conn
  }

  /** Pin DuckDB to `threads` worker threads (1 for the single-thread
    * comparison, matching the vizketch side).
    */
  def setThreads(conn: Connection, threads: Int): Unit =
    conn.createStatement.execute(s"SET threads TO $threads")

  /** Time the histogram GROUP-BY query; returns (median ms, bucket rows). */
  def histogramMs(conn: Connection, min: Double, max: Double, buckets: Int,
                  table: String = "t", reps: Int = 5, warmups: Int = 2): Double = {
    val width = (max - min) / buckets
    val sql =
      s"""SELECT LEAST(CAST(FLOOR((x - $min) / $width) AS INTEGER), ${buckets - 1}) AS b,
         |       COUNT(*) AS c
         |FROM $table WHERE x >= $min AND x <= $max GROUP BY b""".stripMargin
    val st = conn.createStatement
    var w = 0
    while (w < warmups) { st.executeQuery(sql).close(); w += 1 }
    val times = (0 until reps).map { _ =>
      val t0 = System.nanoTime()
      val rs = st.executeQuery(sql)
      var n  = 0
      while (rs.next()) n += 1
      rs.close()
      (System.nanoTime() - t0) / 1e6
    }.sorted
    times(times.length / 2)
  }
}
