package repro

import org.scalatest.funsuite.AnyFunSuite

/** The DuckDB oracle itself must fail loudly on wrong results — otherwise
  * every "agrees with the oracle" test in this repo proves nothing.
  */
class OracleSpec extends AnyFunSuite with SparkSpec {

  import spark.implicits._

  test("oracle accepts an identical result") {
    val df = Seq((1, "a"), (2, "b")).toDF("k", "v")
    Oracle.assertEquivalent(df, "SELECT CAST(k AS INT) AS k, v FROM t", "t" -> df)
  }

  test("oracle rejects a wrong row value") {
    val df = Seq((1, "a")).toDF("k", "v")
    val wrong = Seq((1, "z")).toDF("k", "v")
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(wrong, "SELECT CAST(k AS INT) AS k, v FROM t", "t" -> df)
    }
  }

  test("oracle rejects a missing row") {
    val df = Seq((1, "a"), (2, "b")).toDF("k", "v")
    val short = Seq((1, "a")).toDF("k", "v")
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(short, "SELECT CAST(k AS INT) AS k, v FROM t", "t" -> df)
    }
  }

  test("oracle rejects mismatched column sets") {
    val df = Seq((1, "a")).toDF("k", "v")
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(df, "SELECT CAST(k AS INT) AS kk, v FROM t", "t" -> df)
    }
  }

  test("oracle canonicalizes doubles to six decimals") {
    val df = Seq((1, 0.1234567)).toDF("k", "x")
    Oracle.assertEquivalent(df,
      "SELECT CAST(k AS INT) AS k, CAST(x AS DOUBLE) + 0.0000000004 AS x FROM t",
      "t" -> df)
  }

  test("oracle handles nulls") {
    val df = Seq((1, Option.empty[String]), (2, Some("b"))).toDF("k", "v")
    Oracle.assertEquivalent(df, "SELECT CAST(k AS INT) AS k, v FROM t", "t" -> df)
  }
}
