package repro.core

import repro.SparkSpec

/** LocalResult — the Pandas-DataFrame analogue actions return. */
class LocalResultSpec extends SparkSpec {

  test("normalize collapses the JVM numeric zoo to Long/Double") {
    assert(LocalResult.normalize(3: Byte) == 3L)
    assert(LocalResult.normalize(3: Short) == 3L)
    assert(LocalResult.normalize(3) == 3L)
    assert(LocalResult.normalize(3L) == 3L)
    assert(LocalResult.normalize(3.5f) == 3.5)
    assert(LocalResult.normalize(3.5) == 3.5)
    assert(LocalResult.normalize(3.0) == 3L) // whole doubles become Long
    assert(LocalResult.normalize(new java.math.BigDecimal("42")) == 42L)
    assert(LocalResult.normalize(new java.math.BigDecimal("4.25")) == 4.25)
    assert(LocalResult.normalize(java.math.BigInteger.valueOf(7)) == 7L)
    assert(LocalResult.normalize(null) == null)
    assert(LocalResult.normalize("x") == "x")
    assert(LocalResult.normalize(true) == true)
  }

  test("scalar accessors") {
    val r = LocalResult(Seq("n"), Seq(Seq(41L)))
    assert(r.scalar == 41L)
    assert(r.scalarLong == 41L)
    assert(r.scalarDouble == 41.0)
    assert(LocalResult(Seq("d"), Seq(Seq(2.5))).scalarDouble == 2.5)
    intercept[IllegalArgumentException](LocalResult(Seq("n"), Nil).scalar)
  }

  test("toDF infers Long / Double / Boolean / String columns") {
    val r = LocalResult(Seq("l", "d", "b", "s"),
      Seq(Seq(1L, 1.5, true, "a"), Seq(2L, 2.5, false, "b")))
    val df = r.toDF(spark)
    val types = df.schema.fields.map(f => f.name -> f.dataType.simpleString).toMap
    assert(types == Map("l" -> "bigint", "d" -> "double", "b" -> "boolean", "s" -> "string"))
    assert(df.count() == 2)
  }

  test("toDF widens mixed Long/Double columns to Double") {
    val r  = LocalResult(Seq("x"), Seq(Seq(1L), Seq(2.5)))
    val df = r.toDF(spark)
    assert(df.schema.fields.head.dataType.simpleString == "double")
    assert(df.collect().map(_.getDouble(0)).sorted.toSeq == Seq(1.0, 2.5))
  }

  test("toDF keeps nulls and falls back to String for mixed columns") {
    val r  = LocalResult(Seq("x"), Seq(Seq(null), Seq("a"), Seq(1L)))
    val df = r.toDF(spark)
    assert(df.schema.fields.head.dataType.simpleString == "string")
    assert(df.collect().map(_.getString(0)).toSet == Set(null, "a", "1"))
  }

  test("fromDF round-trips a Spark DataFrame") {
    import spark.implicits._
    val df = Seq((1L, "a"), (2L, "b")).toDF("k", "v")
    val r  = LocalResult.fromDF(df)
    assert(r.columns == Seq("k", "v"))
    assert(r.rows.toSet == Set(Seq(1L, "a"), Seq(2L, "b")))
  }
}
