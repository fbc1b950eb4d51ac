package repro.bench

import java.nio.file.Files
import repro.SparkSpec
import repro.exp.TableIExp

/** Table I: relative cost of reorganization over a full scan (α), measured
  * physically on BID-partitioned Parquet tables of increasing size.
  *
  * Paper (Table I, 16MB–4GB files):
  *   file MB :    16     64    256    1024    4096
  *   query s :  0.36   0.89    2.9    12.5    81.0
  *   reorg s :  24.6   70.0  276.6  1231.3  4854.1
  *   alpha   :  69.0   78.7   95.4    98.4    59.9
  *
  * We sweep smaller tables (see DESIGN.md §3); the claims under test are
  * (a) reorganization costs a large multiple of one scan and (b) the ratio
  * is roughly flat in file size.
  */
class TableIBench extends SparkSpec {

  test("Table I: measured alpha across file sizes") {
    val dir = Files.createTempDirectory("bench-tableI").toString
    val rows = TableIExp.run(spark, dir,
      rowCounts = Seq(1_000_000L, 3_000_000L, 8_000_000L))

    println("=== Table I (measured) ===")
    println(TableIExp.format(rows))
    println("paper: alpha in 60x-100x for 16MB-4GB files")

    for (r <- rows) {
      assert(r.querySec > 0 && r.reorgSec > 0)
      assert(r.alpha > 1.5,
        s"reorg must cost a multiple of a scan: $r")
    }
    // once past the per-job overhead floor, the ratio is clearly large
    assert(rows.last.alpha > 5.0,
      s"at the largest size reorg should cost a large multiple of a scan: ${rows.last}")
    // file sizes actually grew across the sweep
    assert(rows.map(_.fileMb) == rows.map(_.fileMb).sorted)
  }
}
