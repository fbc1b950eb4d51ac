package repro.data

import org.apache.spark.sql.functions._
import repro.SparkSpec
import repro.core.DataMatrix

class DataGenSpec extends SparkSpec {

  private val sf = 0.002

  test("tpch denorm produces the schema's columns in order") {
    val df = TpchLite.denorm(spark, sf)
    assert(df.columns.toIndexedSeq == TpchLite.schema.names)
  }

  test("tpch denorm has rows (joins preserve lineitems)") {
    val n = TpchLite.denorm(spark, sf).count()
    assert(n > 5000, s"got $n rows")
  }

  test("tpch categorical encodings stay within their dictionaries") {
    val df = TpchLite.denorm(spark, sf)
    val cats = TpchLite.schema.columns.filter(_.isCategorical)
    val aggs = cats.flatMap(c => Seq(min(col(c.name)), max(col(c.name))))
    val r = df.agg(aggs.head, aggs.tail: _*).collect()(0)
    cats.zipWithIndex.foreach { case (c, i) =>
      val mn = r.getDouble(2 * i); val mx = r.getDouble(2 * i + 1)
      assert(mn >= 0.0 && mx < c.cardinality, s"${c.name}: [$mn, $mx] vs ${c.cardinality}")
    }
  }

  test("tpch dates are encoded as day offsets in the documented domain") {
    val df = TpchLite.denorm(spark, sf)
    val r = df.agg(min("l_shipdate"), max("l_shipdate"), min("o_orderdate"), max("o_orderdate")).collect()(0)
    assert(r.getDouble(0) >= 0 && r.getDouble(1) <= TpchLite.MaxShipDay)
    assert(r.getDouble(2) >= 0 && r.getDouble(3) <= TpchLite.MaxOrderDay)
  }

  test("tpch generation is deterministic in (sf, seed)") {
    val a = TpchLite.denorm(spark, sf).agg(sum("l_quantity")).collect()(0).getDouble(0)
    val b = TpchLite.denorm(spark, sf).agg(sum("l_quantity")).collect()(0).getDouble(0)
    assert(a == b)
  }

  test("tpcds table matches its schema") {
    val df = TpcdsLite.storeSalesDenorm(spark, sf)
    assert(df.columns.toIndexedSeq == TpcdsLite.schema.names)
  }

  test("tpcds date dimensions are derived from the sold date") {
    val df = TpcdsLite.storeSalesDenorm(spark, 0.01)
    val bad = df.filter(
      col("d_year") =!= floor(col("ss_sold_date") / 365) ||
      col("d_dow") =!= col("ss_sold_date") % 7).count()
    assert(bad == 0)
  }

  test("tpcds categorical encodings stay within their dictionaries") {
    val df = TpcdsLite.storeSalesDenorm(spark, sf)
    val cats = TpcdsLite.schema.columns.filter(_.isCategorical)
    val aggs = cats.flatMap(c => Seq(min(col(c.name)), max(col(c.name))))
    val r = df.agg(aggs.head, aggs.tail: _*).collect()(0)
    cats.zipWithIndex.foreach { case (c, i) =>
      assert(r.getDouble(2 * i) >= 0.0 && r.getDouble(2 * i + 1) < c.cardinality, c.name)
    }
  }

  test("telemetry table matches its schema") {
    val df = TelemetryData.table(spark, sf)
    assert(df.columns.toIndexedSeq == TelemetryData.schema.names)
  }

  test("telemetry collectors are skewed") {
    val df = TelemetryData.table(spark, 0.01)
    val counts = df.groupBy("collector").count().collect().map(_.getLong(1))
    assert(counts.max > 3 * counts.min, "expected a skewed collector distribution")
  }

  test("telemetry arrivals span the six-month domain") {
    val r = TelemetryData.table(spark, 0.01).agg(min("arrival_h"), max("arrival_h")).collect()(0)
    assert(r.getDouble(0) >= 0 && r.getDouble(1) <= TelemetryData.MaxHour)
  }

  test("all three datasets collect into matrices cleanly") {
    for ((df, schema) <- Seq(
      (TpchLite.denorm(spark, sf), TpchLite.schema),
      (TpcdsLite.storeSalesDenorm(spark, sf), TpcdsLite.schema),
      (TelemetryData.table(spark, sf), TelemetryData.schema))) {
      val m = DataMatrix.collect(df, schema)
      assert(m.numRows > 0)
      assert(m.cols.forall(c => c.forall(v => !v.isNaN)))
    }
  }
}
