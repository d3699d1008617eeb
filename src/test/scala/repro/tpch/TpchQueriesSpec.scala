package repro.tpch

import repro.{Oracle, SparkSpec}

/** Every TPC-H-lite query's batch form is checked row-for-row against the
  * same SQL evaluated by DuckDB over the same generated input (SF 0.01) —
  * this validates joins, filters, grouping, and the exact-cents arithmetic
  * shared with the incremental forms.
  */
class TpchQueriesSpec extends SparkSpec {

  private lazy val tables: TpchTables = TpchData.cached(spark, sf = 0.01)

  private def oracleTablesFor(q: LiteQuery): Seq[(String, org.apache.spark.sql.DataFrame)] = {
    val names = q.dims.map(_.name).toSet ++ (if (q.usesLineitem) Set("lineitem") else Set.empty)
    tables.oracleTables.filter { case (n, _) => names.contains(n) }
  }

  for (q <- TpchQueries.all)
    test(s"${q.name} batch result matches DuckDB") {
      Oracle.assertEquivalent(q.batch(tables), q.duckSql, oracleTablesFor(q): _*)
    }
}
