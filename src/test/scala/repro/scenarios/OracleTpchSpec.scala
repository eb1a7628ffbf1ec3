package repro.scenarios

import repro.{Oracle, SparkSpec}
import repro.nrab.Eval

/** Correctness of the scenario queries themselves: the flat TPC-H
  * variants are executed through the NRAB evaluator and checked against
  * DuckDB running the equivalent SQL over the same inputs.
  */
class OracleTpchSpec extends SparkSpec {
  private lazy val d = TestData.tpch

  private def liStr = d.lineitem.selectExpr(
    "cast(l_orderkey as string) l_orderkey", "cast(l_quantity as string) l_quantity",
    "cast(l_extendedprice as string) l_extendedprice", "cast(l_discount as string) l_discount",
    "cast(l_tax as string) l_tax", "l_returnflag", "l_shipdate", "l_commitdate", "l_receiptdate")
  private def ordStr = d.orders.selectExpr(
    "cast(o_orderkey as string) o_orderkey", "cast(o_custkey as string) o_custkey",
    "o_orderdate", "o_orderpriority", "o_shippriority")
  private def custStr = d.customer.selectExpr(
    "cast(c_custkey as string) c_custkey", "c_name", "cast(c_nationkey as string) c_nationkey",
    "cast(c_acctbal as string) c_acctbal", "c_phone", "c_address", "c_comment", "c_mktsegment")

  test("Q1F original query matches DuckDB") {
    val q = TpchScenarios.q1F(d).question.query
    Oracle.assertEquivalent(
      Eval(q, d.catalog).selectExpr("round(avgDisc, 2) as avgDisc"),
      """SELECT round(sum(cast(l_tax as double)), 2) AS avgDisc
         FROM lineitem WHERE l_shipdate <= '1998-09-02'""",
      "lineitem" -> liStr)
  }

  test("Q6F original query matches DuckDB") {
    val q = TpchScenarios.q6F(d).question.query
    Oracle.assertEquivalent(
      Eval(q, d.catalog).selectExpr("round(revenue, 2) as revenue"),
      """SELECT round(sum(cast(l_extendedprice as double) * cast(l_discount as double)), 2) AS revenue
         FROM lineitem
         WHERE l_shipdate BETWEEN '1994-01-01' AND '1994-12-31'
           AND cast(l_tax as double) BETWEEN 0.05 AND 0.07
           AND cast(l_quantity as double) < 24""",
      "lineitem" -> liStr)
  }

  test("Q13F original query matches DuckDB") {
    val q = TpchScenarios.q13F(d).question.query
    Oracle.assertEquivalent(
      Eval(q, d.catalog).selectExpr("cast(c_count as long) c_count", "cast(custdist as long) custdist"),
      """SELECT c_count, count(c_custkey) AS custdist FROM (
           SELECT c_custkey, count(o_orderkey) AS c_count
           FROM customer JOIN orders ON c_custkey = o_custkey
           GROUP BY c_custkey)
         GROUP BY c_count""",
      "customer" -> custStr, "orders" -> ordStr)
  }

  test("Q3F original query matches DuckDB") {
    val q = TpchScenarios.q3F(d).question.query
    Oracle.assertEquivalent(
      Eval(q, d.catalog).selectExpr("o_orderkey", "o_orderdate", "o_shippriority",
        "round(revenue, 2) as revenue"),
      """SELECT o_orderkey, o_orderdate, o_shippriority,
                round(sum(cast(l_extendedprice as double) * (1 - cast(l_discount as double))), 2) AS revenue
         FROM customer JOIN orders ON c_custkey = o_custkey
                       JOIN lineitem ON o_orderkey = l_orderkey
         WHERE c_mktsegment = 'HOUSEHOLD' AND l_commitdate > '1995-03-25'
           AND o_orderdate < '1995-03-15'
         GROUP BY o_orderkey, o_orderdate, o_shippriority""",
      "customer" -> custStr, "orders" -> ordStr, "lineitem" -> liStr)
  }

  test("Q4F original query matches DuckDB") {
    val q = TpchScenarios.q4F(d).question.query
    Oracle.assertEquivalent(
      Eval(q, d.catalog).selectExpr("o_shippriority", "cast(order_count as long) order_count"),
      """SELECT o_shippriority, count(o_orderkey) AS order_count
         FROM (SELECT o_orderkey, o_shippriority FROM orders
               WHERE o_orderdate BETWEEN '1993-07-01' AND '1993-09-30') f
         JOIN (SELECT l_orderkey AS d_orderkey, count(*) AS cnt FROM lineitem
               WHERE l_shipdate < l_receiptdate GROUP BY l_orderkey) d
           ON o_orderkey = d_orderkey
         GROUP BY o_shippriority""",
      "orders" -> ordStr, "lineitem" -> liStr)
  }

  test("nested and flat Q6 agree on the revenue") {
    val n = Eval(TpchScenarios.q6(d).question.query, d.catalog).head().getDouble(0)
    val f = Eval(TpchScenarios.q6F(d).question.query, d.catalog).head().getDouble(0)
    assert(math.abs(n - f) < 1e-6)
  }

  test("nested and flat Q13 agree on the distribution") {
    val n = Eval(TpchScenarios.q13(d).question.query, d.catalog)
      .collect().map(r => (r.getLong(0), r.getLong(1))).toSet
    val f = Eval(TpchScenarios.q13F(d).question.query, d.catalog)
      .collect().map(r => (r.getLong(0), r.getLong(1))).toSet
    assert(n == f)
  }
}
