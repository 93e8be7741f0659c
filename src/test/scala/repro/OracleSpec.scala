package repro

import org.apache.spark.sql.functions._

class OracleSpec extends SparkSpec {

  private lazy val li = SynthData.lineitem(spark, sf = 0.001, seed = 2).cache()

  test("oracle agrees on a simple aggregate") {
    val sparkDf = li.groupBy("l_returnflag").agg(count(lit(1)).as("cnt"))
    Oracle.assertEquivalent(sparkDf,
      "SELECT l_returnflag, COUNT(*) AS cnt FROM lineitem GROUP BY l_returnflag",
      "lineitem" -> li)
  }

  test("oracle agrees on numeric aggregates with casting") {
    val sparkDf = li.agg(sum("l_quantity").as("s"), count(lit(1)).as("n"))
    Oracle.assertEquivalent(sparkDf,
      "SELECT SUM(CAST(l_quantity AS DOUBLE)) AS s, COUNT(*) AS n FROM lineitem",
      "lineitem" -> li)
  }

  test("oracle catches a wrong result") {
    val wrong = li.agg((count(lit(1)) + 1).as("n"))
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(wrong, "SELECT COUNT(*) AS n FROM lineitem", "lineitem" -> li)
    }
  }

  test("oracle catches mis-aliased columns") {
    val df = li.agg(count(lit(1)).as("wrongname"))
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(df, "SELECT COUNT(*) AS n FROM lineitem", "lineitem" -> li)
    }
  }
}
