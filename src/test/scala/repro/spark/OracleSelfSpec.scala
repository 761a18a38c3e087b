package repro.spark

import repro.{Oracle, SparkSpec}

/** The oracle must itself be trustworthy: it should accept equivalent
  * results and reject wrong ones.
  */
class OracleSelfSpec extends SparkSpec {

  private def df = {
    import spark.implicits._
    Seq((1, 10.0), (2, 20.0), (3, 30.0)).toDF("k", "v")
  }

  test("oracle accepts a correct aggregate") {
    val t = df
    t.createOrReplaceTempView("t_spark")
    val sql = "SELECT sum(CAST(v AS DOUBLE)) AS total FROM t_spark"
    Oracle.assertEquivalent(spark.sql(sql), sql.replace("t_spark", "t"), "t" -> t)
  }

  test("oracle rejects a wrong result") {
    val t = df
    t.createOrReplaceTempView("t_spark")
    val wrong = spark.sql("SELECT sum(CAST(v AS DOUBLE)) + 1 AS total FROM t_spark")
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(wrong, "SELECT sum(CAST(v AS DOUBLE)) AS total FROM t", "t" -> t)
    }
  }

  test("oracle rejects mismatched column names") {
    val t = df
    t.createOrReplaceTempView("t_spark")
    val renamed = spark.sql("SELECT sum(CAST(v AS DOUBLE)) AS wrong_name FROM t_spark")
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(renamed, "SELECT sum(CAST(v AS DOUBLE)) AS total FROM t", "t" -> t)
    }
  }

  test("oracle compares row sets, not order") {
    // cast on both sides: the oracle stores DuckDB tables as VARCHAR, so
    // numeric columns must be cast in the SQL to canonicalize identically
    val t = df
    t.createOrReplaceTempView("t_spark")
    val sql = "SELECT k, CAST(v AS DOUBLE) AS v FROM t_spark"
    val reordered = spark.sql(sql + " ORDER BY k DESC")
    Oracle.assertEquivalent(reordered, sql.replace("t_spark", "t") + " ORDER BY k", "t" -> t)
  }
}
