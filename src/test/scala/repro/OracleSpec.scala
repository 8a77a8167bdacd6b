package repro

import org.apache.spark.sql.functions._

class OracleSpec extends SparkSpec {

  test("oracle accepts a matching aggregate") {
    val df = SynthData.customer(spark, 0.001)
    val got = df.groupBy("c_mktsegment").agg(count(lit(1)).as("n"))
    Oracle.assertEquivalent(got,
      "SELECT c_mktsegment, COUNT(*) AS n FROM customer GROUP BY c_mktsegment",
      "customer" -> df)
  }

  test("oracle rejects a wrong result") {
    val df = SynthData.customer(spark, 0.001)
    val wrong = df.groupBy("c_mktsegment").agg((count(lit(1)) + 1).as("n"))
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(wrong,
        "SELECT c_mktsegment, COUNT(*) AS n FROM customer GROUP BY c_mktsegment",
        "customer" -> df)
    }
  }

  test("oracle rejects a column mismatch") {
    val df = SynthData.customer(spark, 0.001)
    val got = df.groupBy("c_mktsegment").agg(count(lit(1)).as("wrong_name"))
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(got,
        "SELECT c_mktsegment, COUNT(*) AS n FROM customer GROUP BY c_mktsegment",
        "customer" -> df)
    }
  }
}
