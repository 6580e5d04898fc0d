package repro.sparkext

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

import repro.{Oracle, SparkSpec, SynthData}

/** The Catalyst port: ModularisJoinExec / ModularisAggExec planned via
  * ModularisStrategy, oracle-checked against DuckDB.
  */
class ModularisExecSpec extends SparkSpec {

  private def withStrategy[T](f: => T): T = {
    spark.experimental.extraStrategies = Seq(ModularisStrategy)
    spark.conf.set("spark.sql.adaptive.enabled", "false")
    try f
    finally {
      spark.experimental.extraStrategies = Nil
      spark.conf.set("spark.sql.adaptive.enabled", "true")
    }
  }

  private lazy val t1: DataFrame =
    SynthData.uniformKeys(spark, 2000, 100, seed = 1).cache()
  private lazy val t2: DataFrame =
    SynthData.uniformKeys(spark, 500, 100, seed = 2)
      .withColumnRenamed("k", "k2").withColumnRenamed("v", "w").cache()

  test("equi-join is planned as ModularisJoinExec") {
    withStrategy {
      val df = t1.join(t2, t1("k") === t2("k2"))
      assert(df.queryExecution.executedPlan.toString.contains("ModularisJoin"))
    }
  }

  test("inner join result matches DuckDB") {
    withStrategy {
      val df = t1.join(t2, t1("k") === t2("k2"))
        .select(t1("k") as "k", t1("v") as "v", t2("w") as "w")
      Oracle.assertEquivalent(df,
        "SELECT t1.k AS k, CAST(t1.v AS DOUBLE) AS v, CAST(t2.w AS DOUBLE) AS w " +
        "FROM t1 JOIN t2 ON t1.k = t2.k2",
        "t1" -> t1, "t2" -> t2)
    }
  }

  test("inner join agrees with default Spark planner") {
    val expected = t1.join(t2, t1("k") === t2("k2")).count()
    val got = withStrategy { t1.join(t2, t1("k") === t2("k2")).count() }
    assert(got == expected)
  }

  test("left semi join uses the Semi BuildProbe variant and matches DuckDB") {
    withStrategy {
      val df = t1.join(t2, t1("k") === t2("k2"), "left_semi")
      assert(df.queryExecution.executedPlan.toString.contains("ModularisJoin"))
      Oracle.assertEquivalent(
        df.select(col("k"), col("v")),
        "SELECT k, CAST(v AS DOUBLE) AS v FROM t1 WHERE k IN (SELECT k2 FROM t2)",
        "t1" -> t1, "t2" -> t2)
    }
  }

  test("left anti join matches DuckDB") {
    withStrategy {
      val df = t1.join(t2, t1("k") === t2("k2"), "left_anti")
      Oracle.assertEquivalent(
        df.select(col("k"), col("v")),
        "SELECT k, CAST(v AS DOUBLE) AS v FROM t1 WHERE k NOT IN (SELECT k2 FROM t2)",
        "t1" -> t1, "t2" -> t2)
    }
  }

  test("grouped aggregation is planned as ModularisAggExec") {
    withStrategy {
      val df = t1.groupBy("k").agg(sum("v") as "sv", count(lit(1)) as "c")
      assert(df.queryExecution.executedPlan.toString.contains("ModularisAgg"))
    }
  }

  test("grouped sum/count matches DuckDB") {
    withStrategy {
      val df = t1.groupBy("k").agg(sum("v") as "sv", count(lit(1)) as "c")
      Oracle.assertEquivalent(df,
        "SELECT k, sum(CAST(v AS DOUBLE)) AS sv, count(*) AS c FROM t1 GROUP BY k",
        "t1" -> t1)
    }
  }

  test("groupless aggregation matches DuckDB") {
    withStrategy {
      val df = t1.agg(sum("v") as "sv", count(lit(1)) as "c")
      Oracle.assertEquivalent(df,
        "SELECT sum(CAST(v AS DOUBLE)) AS sv, count(*) AS c FROM t1",
        "t1" -> t1)
    }
  }

  test("groupless aggregation over empty input emits the SQL one-row result") {
    withStrategy {
      val empty = t1.filter("k < 0")
      val df = empty.agg(count(lit(1)) as "c")
      assert(df.queryExecution.executedPlan.toString.contains("ModularisAgg"))
      val rows = df.collect()
      assert(rows.length == 1 && rows(0).getLong(0) == 0L)
    }
  }

  test("join + aggregation compose (both Modularis operators in one plan)") {
    withStrategy {
      val df = t1.join(t2, t1("k") === t2("k2"))
        .groupBy(t1("k") as "k").agg(count(lit(1)) as "c")
      val s = df.queryExecution.executedPlan.toString
      assert(s.contains("ModularisJoin") && s.contains("ModularisAgg"))
      Oracle.assertEquivalent(df,
        "SELECT t1.k AS k, count(*) AS c FROM t1 JOIN t2 ON t1.k = t2.k2 GROUP BY t1.k",
        "t1" -> t1, "t2" -> t2)
    }
  }

  test("unsupported shapes fall back to the default planner") {
    withStrategy {
      // non-equi join condition → not claimed by the strategy
      val df = t1.join(t2, t1("k") < t2("k2"))
      assert(!df.queryExecution.executedPlan.toString.contains("ModularisJoin"))
      // distinct aggregate → not claimed
      val dfa = t1.groupBy("k").agg(countDistinct("v") as "c")
      assert(!dfa.queryExecution.executedPlan.toString.contains("ModularisAgg"))
    }
  }

  test("strategy works under adaptive query execution too") {
    spark.experimental.extraStrategies = Seq(ModularisStrategy)
    try {
      val df = t1.join(t2, t1("k") === t2("k2"))
        .select(t1("k") as "k", t2("w") as "w")
      Oracle.assertEquivalent(df,
        "SELECT t1.k AS k, CAST(t2.w AS DOUBLE) AS w FROM t1 JOIN t2 ON t1.k = t2.k2",
        "t1" -> t1, "t2" -> t2)
    } finally spark.experimental.extraStrategies = Nil
  }
}
