package repro.core

import repro.{Oracle, SparkSpec}

class PredicateSpec extends SparkSpec {

  test("range predicate matches inclusively") {
    val p = RangePred("x", 1.0, 2.0)
    assert(p.matches(1.0) && p.matches(2.0) && p.matches(1.5))
    assert(!p.matches(0.999) && !p.matches(2.001))
  }

  test("empty range is rejected") {
    assertThrows[IllegalArgumentException](RangePred("x", 2.0, 1.0))
  }

  test("in predicate matches set membership") {
    val p = InPred("x", Set(1.0, 3.0))
    assert(p.matches(1.0) && p.matches(3.0))
    assert(!p.matches(2.0))
  }

  test("empty in-set is rejected") {
    assertThrows[IllegalArgumentException](InPred("x", Set.empty))
  }

  test("query requires at least one predicate") {
    assertThrows[IllegalArgumentException](Query(0, 0, Nil))
  }

  test("matchesRow evaluates the conjunction") {
    val schema = TableSchema(IndexedSeq(ColumnDef("x"), ColumnDef("y")))
    val q = Query(0, 0, Seq(RangePred("x", 0, 10), InPred("y", Set(1.0))))
    assert(q.matchesRow(schema, Seq(5.0, 1.0)))
    assert(!q.matchesRow(schema, Seq(5.0, 2.0)))
    assert(!q.matchesRow(schema, Seq(50.0, 1.0)))
  }

  test("toColumn filter matches matchesRow on a DataFrame") {
    import spark.implicits._
    val schema = TableSchema(IndexedSeq(ColumnDef("x"), ColumnDef("y")))
    val rows = for (x <- 0 until 20; y <- 0 until 3) yield (x.toDouble, y.toDouble)
    val df = rows.toDF("x", "y")
    val q = Query(0, 0, Seq(RangePred("x", 3, 7), InPred("y", Set(0.0, 2.0))))
    val viaSpark = df.filter(q.toColumn).collect()
      .map(r => (r.getDouble(0), r.getDouble(1))).toSet
    val viaLocal = rows.filter { case (x, y) => q.matchesRow(schema, Seq(x, y)) }.toSet
    assert(viaSpark == viaLocal)
  }

  test("toSql on DuckDB agrees with Spark's toColumn") {
    import spark.implicits._
    val rows = for (x <- 0 until 30) yield (x.toDouble, (x % 4).toDouble)
    val df = rows.toDF("x", "y")
    val q = Query(0, 0, Seq(RangePred("x", 5, 20), InPred("y", Set(1.0, 3.0))))
    val sparkRes = df.filter(q.toColumn)
      .agg(org.apache.spark.sql.functions.count(org.apache.spark.sql.functions.lit(1)) as "cnt")
    Oracle.assertEquivalent(sparkRes,
      s"SELECT count(*) AS cnt FROM t WHERE ${q.toSql}", "t" -> df)
  }

  test("toSql handles boundary-inclusive ranges identically") {
    import spark.implicits._
    val df = Seq(1.0, 2.0, 3.0).toDF("x")
    val q = Query(0, 0, Seq(RangePred("x", 2.0, 3.0)))
    val sparkRes = df.filter(q.toColumn)
      .agg(org.apache.spark.sql.functions.count(org.apache.spark.sql.functions.lit(1)) as "cnt")
    Oracle.assertEquivalent(sparkRes,
      s"SELECT count(*) AS cnt FROM t WHERE ${q.toSql}", "t" -> df)
  }
}
