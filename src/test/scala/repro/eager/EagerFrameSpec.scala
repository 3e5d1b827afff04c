package repro.eager

import repro.SparkSpec
import repro.wisconsin.WisconsinData
import java.nio.file.Files

/** The eager Pandas-baseline substrate: JSON loading with schema
  * inference, eager operation semantics, and the memory-budget OOM model.
  */
class EagerFrameSpec extends SparkSpec {

  private lazy val jsonPath = {
    val p = Files.createTempFile("eager", ".json")
    WisconsinData.writeJsonLines(WisconsinData.generate(spark, 1000), p)
    p
  }
  private lazy val df = EagerFrame.readJsonLines(jsonPath, MemoryBudget.unlimited)

  test("read_json infers the full schema including sparse attributes") {
    assert(df.columns.toSet == WisconsinData.columns.toSet)
    assert(df.length == 1000)
  }

  test("missing attributes load as nulls") {
    assert(df.column("tenPercent").count(_ == null) == 100)
  }

  test("select copies the requested columns") {
    val s = df.select("two", "four")
    assert(s.columns == Vector("two", "four"))
    assert(s.length == 1000)
  }

  test("comparison masks materialize full boolean arrays (eager)") {
    val m = df.maskEq("ten", 4)
    assert(m.bits.length == 1000)
    assert(m.count == 100)
  }

  test("mask conjunction (expression 3)") {
    val m = df.maskEq("ten", 4) && df.maskEq("twentyPercent", 4) && df.maskEq("two", 0)
    assert(df.filter(m).length == 100)
  }

  test("filter + head (expression 10)") {
    assert(df.filter(df.maskEq("ten", 4)).head(5).length == 5)
  }

  test("group by count (expression 4)") {
    val g = df.groupByCount("oddOnePercent")
    assert(g.length == 100)
    assert(g.column(s"count_oddOnePercent").forall(_ == 10L))
  }

  test("group by max (expression 8)") {
    val g = df.groupByMax("twenty", "four")
    assert(g.length == 20)
    val m = g.rows.map(r => r(0).asInstanceOf[Long] -> r(1).asInstanceOf[Long]).toMap
    m.foreach { case (twenty, maxFour) => assert(maxFour == twenty % 4) }
  }

  test("map upper computes the whole column before head (expression 5)") {
    val u = df.mapUpper("stringu1")
    assert(u.length == 1000)
    assert(u.column("stringu1").forall(v => v.toString == v.toString.toUpperCase))
  }

  test("max / min (expressions 6, 7)") {
    assert(df.max("unique1") == 999.0)
    assert(df.min("unique1") == 0.0)
  }

  test("sort descending materializes a full copy, head picks top (expression 9)") {
    val top = df.sortDesc("unique1").head(5)
    assert(top.column("unique1").map(_.asInstanceOf[Long]).toSeq == Seq(999L, 998L, 997L, 996L, 995L))
  }

  test("range mask (expression 11)") {
    val m = df.maskGe("onePercent", 40) && df.maskLe("onePercent", 60)
    assert(df.filter(m).length == 210)
  }

  test("merge inner-joins on keys (expression 12)") {
    val j = df.merge(df, "unique1", "unique1")
    assert(j.length == 1000)
    assert(j.columns.length == 2 * df.columns.length)
  }

  test("isna mask (expression 13)") {
    assert(df.filter(df.maskIsNa("tenPercent")).length == 100)
  }

  test("isna is false for present values") {
    assert(df.filter(df.maskIsNa("unique1")).length == 0)
  }

  test("memory budget: load fails when table exceeds budget (the M/L/XL OOM)") {
    val tiny = new MemoryBudget(10_000)
    intercept[EagerOutOfMemoryException](EagerFrame.readJsonLines(jsonPath, tiny))
  }

  test("memory budget: intermediates count and reset per expression") {
    val size = df.sizeBytes
    // load peaks at 2×size (table + parse intermediates), so 2.2× fits
    val budget = new MemoryBudget((size * 2.2).toLong)
    val d2 = EagerFrame.readJsonLines(jsonPath, budget)
    // one full-copy op fits...
    budget.resetTransient()
    d2.sortDesc("unique1")
    // ...but a chain of full copies within one expression does not
    budget.resetTransient()
    intercept[EagerOutOfMemoryException] {
      d2.sortDesc("unique1").sortDesc("unique1").sortDesc("unique1")
    }
    // and after a reset (next expression) we are healthy again
    budget.resetTransient()
    d2.sortDesc("unique1")
  }

  test("creation charges parse intermediates: 2× the table is needed to load") {
    val size = df.sizeBytes
    intercept[EagerOutOfMemoryException](
      EagerFrame.readJsonLines(jsonPath, new MemoryBudget((size * 1.9).toLong)))
  }

  test("memory estimate grows with strings") {
    val small = EagerFrame.estimate(Array(Array[Any](1L)))
    val big   = EagerFrame.estimate(Array(Array[Any]("x" * 100)))
    assert(big > small)
  }

  test("eager evaluation order: masks charge budget even if never used") {
    val budget = new MemoryBudget(Long.MaxValue / 2)
    val d2 = EagerFrame.readJsonLines(jsonPath, budget)
    budget.resetTransient()
    val before = budget.used
    d2.maskEq("ten", 4) // result discarded — eager evaluation still paid
    assert(budget.used >= before + 1000)
  }
}
