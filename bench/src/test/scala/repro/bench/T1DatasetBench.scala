package repro.bench

import repro.core.Tables
import repro.util.Render

/** T1 — dataset summary at the paper's exact scale (§II-A):
  * 54,231 BTC blocks (556,459–610,689) and 2,204,650 ETH blocks.
  */
class T1DatasetBench extends BenchSpec {

  test("T1: dataset summary matches the paper's block counts") {
    val t1 = Tables.t1Dataset(Seq(BenchData.btcSpec -> btcAttrib, BenchData.ethSpec -> ethAttrib))
    BenchData.report("T1_dataset", Render.table(t1))

    val rows = t1.collect().map(r => r.getString(0) -> r).toMap
    val b = rows("bitcoin")
    assert(b.getLong(b.fieldIndex("blocks")) === 54231L)       // paper: 54,231
    assert(b.getLong(b.fieldIndex("first_block")) === 556459L) // paper: 556,459
    assert(b.getLong(b.fieldIndex("days")) === 365L)
    val e = rows("ethereum")
    assert(e.getLong(e.fieldIndex("blocks")) === 2204650L)     // paper: 2,204,650
    assert(e.getLong(e.fieldIndex("first_block")) === 6988615L)
    assert(e.getLong(e.fieldIndex("days")) === 365L)
  }
}
