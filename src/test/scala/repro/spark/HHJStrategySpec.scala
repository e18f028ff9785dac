package repro.spark

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.types._

import repro.{Oracle, SparkSpec, SynthData}
import repro.core.hhj.{HHJConfig, PartitionRule}

/** Tests of the Catalyst-level integration: [[HHJStrategy]] plans inner
  * equi-joins into [[DynamicHHJExec]], which must both appear in the
  * physical plan and produce DuckDB-identical results.
  */
class HHJStrategySpec extends SparkSpec {

  private val cfg = HHJConfig(
    memoryFrames = 32,
    frameSize = 4 * 1024,
    partitionRule = PartitionRule.Dynamic(firstRound = 8, laterLowerBound = 2),
  )

  private def castSelect(df: DataFrame, alias: String): String =
    df.schema.fields.map { f =>
      val c = s"$alias.${f.name}"
      f.dataType match {
        case LongType | IntegerType | ShortType => s"CAST($c AS BIGINT) AS ${f.name}"
        case DoubleType | FloatType             => s"CAST($c AS DOUBLE) AS ${f.name}"
        case _                                  => s"$c AS ${f.name}"
      }
    }.mkString(", ")

  private def withStrategy[A](f: => A): A = {
    HHJStrategy.install(spark, cfg)
    try f
    finally HHJStrategy.uninstall(spark)
  }

  test("the strategy plans an inner equi-join into DynamicHHJExec") {
    withStrategy {
      val li     = SynthData.lineitem(spark, sf = 0.001)
      val ord    = SynthData.orders(spark, sf = 0.001)
      val joined = li.join(ord, li("l_orderkey") === ord("o_orderkey"))
      // SparkPlan.nodeName strips the "Exec" suffix in plan strings.
      val plan = joined.queryExecution.executedPlan.toString
      assert(plan.contains("DynamicHHJ"), s"plan did not use the operator:\n$plan")
    }
  }

  test("DataFrame API join through the strategy matches DuckDB") {
    withStrategy {
      val li  = SynthData.lineitem(spark, sf = 0.002)
      val ord = SynthData.orders(spark, sf = 0.002)
      LastStats.reset()
      val joined = li.join(ord, li("l_orderkey") === ord("o_orderkey"))
      Oracle.assertEquivalent(
        joined,
        s"SELECT ${castSelect(li, "l")}, ${castSelect(ord, "o")} FROM lineitem l JOIN orders o ON l.l_orderkey = o.o_orderkey",
        "lineitem" -> li,
        "orders"   -> ord,
      )
      assert(LastStats.spillBytes.get > 0, "the 128 KB budget must spill at this scale")
    }
  }

  test("SQL join through the strategy matches DuckDB") {
    withStrategy {
      val ord  = SynthData.orders(spark, sf = 0.002)
      val cust = SynthData.customer(spark, sf = 0.002)
      ord.createOrReplaceTempView("orders_v")
      cust.createOrReplaceTempView("customer_v")
      val joined = spark.sql(
        "SELECT * FROM orders_v o JOIN customer_v c ON o.o_custkey = c.c_custkey")
      assert(joined.queryExecution.executedPlan.toString.contains("DynamicHHJ"))
      Oracle.assertEquivalent(
        joined,
        s"SELECT ${castSelect(ord, "o")}, ${castSelect(cust, "c")} FROM orders o JOIN customer c ON o.o_custkey = c.c_custkey",
        "orders"   -> ord,
        "customer" -> cust,
      )
    }
  }

  test("multi-column equi-join plans through the operator and matches DuckDB") {
    withStrategy {
      val a = SynthData.orders(spark, sf = 0.002)
        .selectExpr("o_orderkey % 40 AS k1", "o_custkey % 10 AS k2", "o_totalprice AS av")
      val b = SynthData.orders(spark, sf = 0.002, seed = 11)
        .selectExpr("o_orderkey % 40 AS j1", "o_custkey % 10 AS j2", "o_totalprice AS bv")
        .limit(400)
      val joined = a.join(b, a("k1") === b("j1") && a("k2") === b("j2"))
      assert(joined.queryExecution.executedPlan.toString.contains("DynamicHHJ"))
      Oracle.assertEquivalent(
        joined,
        s"SELECT ${castSelect(a, "a")}, ${castSelect(b, "b")} FROM a JOIN b ON a.k1 = b.j1 AND a.k2 = b.j2",
        "a" -> a,
        "b" -> b,
      )
    }
  }

  test("non-equi joins are left to Spark's own strategies") {
    withStrategy {
      val a      = spark.range(100).toDF("x")
      val b      = spark.range(100).toDF("y")
      val joined = a.join(b, a("x") < b("y"))
      assert(!joined.queryExecution.executedPlan.toString.contains("DynamicHHJ"))
      assert(joined.count() == (0 until 100).map(x => 99 - x).sum.toLong)
    }
  }

  test("uninstall restores default planning") {
    HHJStrategy.install(spark, cfg)
    HHJStrategy.uninstall(spark)
    val li     = SynthData.lineitem(spark, sf = 0.001)
    val ord    = SynthData.orders(spark, sf = 0.001)
    val joined = li.join(ord, li("l_orderkey") === ord("o_orderkey"))
    assert(!joined.queryExecution.executedPlan.toString.contains("DynamicHHJ"))
  }

  test("aggregation on top of the operator's output is correct") {
    withStrategy {
      val li  = SynthData.lineitem(spark, sf = 0.002)
      val ord = SynthData.orders(spark, sf = 0.002)
      val agg = li.join(ord, li("l_orderkey") === ord("o_orderkey"))
        .groupBy("o_orderstatus")
        .agg(org.apache.spark.sql.functions.count("*").as("cnt"))
      Oracle.assertEquivalent(
        agg,
        "SELECT o.o_orderstatus AS o_orderstatus, COUNT(*) AS cnt FROM lineitem l " +
          "JOIN orders o ON l.l_orderkey = o.o_orderkey GROUP BY o.o_orderstatus",
        "lineitem" -> li,
        "orders"   -> ord,
      )
    }
  }
}
