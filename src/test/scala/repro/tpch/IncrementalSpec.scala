package repro.tpch

import org.apache.spark.sql.DataFrame
import repro.SparkSpec
import repro.core.ArrangementRegistry

/** The incremental (streaming) forms must equal batch recomputation over the
  * accumulated window at every epoch, with shared and with private
  * arrangements — the core correctness claim of shared state (§3.3: "the
  * shared arrangement's semantics are identical to maintaining individual
  * copies").
  */
class IncrementalSpec extends SparkSpec {

  private lazy val tables = TpchData.cached(spark, sf = 0.01)

  private lazy val slices: Array[DataFrame] = {
    val s = tables.lineitem.randomSplit(Array(1.0, 1.0, 1.0), seed = 7L)
    s.foreach { df => df.persist(); df.count() }
    s
  }

  private def rowsOf(df: DataFrame): Set[String] =
    df.collect().map(_.toSeq.map(String.valueOf).mkString("|")).toSet

  private def tablesWithWindow(window: DataFrame): TpchTables =
    tables.copy(lineitem = window)

  test("streaming queries equal batch recomputation after every epoch (shared)") {
    val reg = new ArrangementRegistry(spark, partitions = 8)
    val qs  = Seq(TpchQueries.q1, TpchQueries.q3, TpchQueries.q18)
    val instances = qs.map(q => QueryInstance.install(q, tables, reg, shared = true, q.name))
    var window: Option[DataFrame] = None
    for (slice <- slices) {
      instances.foreach(_.onEpoch(slice))
      window = Some(window.map(_.unionByName(slice)).getOrElse(slice))
      for ((q, inst) <- qs.zip(instances)) {
        val got = rowsOf(inst.result())
        val exp = rowsOf(q.batch(tablesWithWindow(window.get)))
        assert(got == exp, s"${q.name} diverged at window of ${window.get.count()} rows")
      }
    }
    instances.foreach(_.uninstall())
    reg.clear()
  }

  test("all 22 queries: final incremental result equals full batch result (shared)") {
    val reg = new ArrangementRegistry(spark, partitions = 8)
    val instances = TpchQueries.all.map(q => QueryInstance.install(q, tables, reg, shared = true, q.name))
    slices.foreach(s => instances.foreach(_.onEpoch(s)))
    for ((q, inst) <- TpchQueries.all.zip(instances)) {
      val got = rowsOf(inst.result())
      val exp = rowsOf(q.batch(tables))
      assert(got == exp, q.name)
    }
    instances.foreach(_.uninstall())
    reg.clear()
  }

  test("shared and unshared installations produce identical results") {
    val reg = new ArrangementRegistry(spark, partitions = 8)
    val q   = TpchQueries.q5
    val s1  = QueryInstance.install(q, tables, reg, shared = true, "s")
    val s2  = QueryInstance.install(q, tables, reg, shared = false, "u")
    slices.foreach { s => s1.onEpoch(s); s2.onEpoch(s) }
    assert(rowsOf(s1.result()) == rowsOf(s2.result()))
    assert(s2.privateRows > s1.privateRows, "unshared instance retains private index state")
    s1.uninstall(); s2.uninstall()
    reg.clear()
  }

  test("registry shares one build across many query installs") {
    val reg = new ArrangementRegistry(spark, partitions = 8)
    // q3 and q5 both use orders and customer (the paper's running example).
    val i3 = QueryInstance.install(TpchQueries.q3, tables, reg, shared = true, "q3")
    val rowsAfterQ3 = reg.totalRows
    val i5 = QueryInstance.install(TpchQueries.q5, tables, reg, shared = true, "q5")
    // q5 adds supplier/nation/region but re-uses orders + customer:
    val added = reg.totalRows - rowsAfterQ3
    val supplierRows = tables.supplier.count() + tables.nation.count() + tables.region.count()
    assert(added == supplierRows, s"only the new dimensions were indexed (added=$added)")
    i3.uninstall(); i5.uninstall()
    reg.clear()
  }

  test("windowed semantics: a late query starts from an empty window") {
    val reg  = new ArrangementRegistry(spark, partitions = 8)
    val q    = TpchQueries.q1
    val early = QueryInstance.install(q, tables, reg, shared = true, "early")
    early.onEpoch(slices(0))
    val late = QueryInstance.install(q, tables, reg, shared = true, "late")
    early.onEpoch(slices(1)); late.onEpoch(slices(1))
    val gotLate  = rowsOf(late.result())
    val expLate  = rowsOf(q.batch(tablesWithWindow(slices(1))))
    assert(gotLate == expLate, "the late query reflects only its own window")
    assert(rowsOf(early.result()) ==
      rowsOf(q.batch(tablesWithWindow(slices(0).unionByName(slices(1))))))
    early.uninstall(); late.uninstall()
    reg.clear()
  }
}
