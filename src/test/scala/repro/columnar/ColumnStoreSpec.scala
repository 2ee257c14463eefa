package repro.columnar

import repro.SparkSpec

/** Column store loading and the value (adjacency-analogue) index. */
class ColumnStoreSpec extends SparkSpec {
  import spark.implicits._

  test("load preserves types: long, double, string") {
    val df = Seq((1L, 2.5, "x"), (2L, 3.5, "y")).toDF("l", "d", "s")
    val st = new ColumnStore
    val t = st.load("t", df)
    assert(t.numRows == 2)
    assert(t.col("l").isInstanceOf[LongCol])
    assert(t.col("d").isInstanceOf[DoubleCol])
    assert(t.col("s").isInstanceOf[StringCol])
    assert(t.col("l").any(1) == 2L)
    assert(t.col("d").any(0) == 2.5)
    assert(t.col("s").any(1) == "y")
  }

  test("integers are widened to long columns") {
    val df = Seq((1, 2), (3, 4)).toDF("a", "b")
    val t = new ColumnStore().load("t", df)
    assert(t.col("a").isInstanceOf[LongCol])
    assert(t.col("a").any(1) == 3L)
  }

  test("rows are ordered by __rid so position == RID") {
    val df = Seq((2L, 0L), (0L, 2L), (1L, 1L)).toDF("v", "__rid")
    val t = new ColumnStore().load("t", df)
    // __rid 0 carries v=2, __rid 1 carries v=1, __rid 2 carries v=0
    assert((0 until 3).map(i => t.col("v").any(i)) == Seq(2L, 1L, 0L))
  }

  test("value index maps value -> all row positions") {
    val df = Seq(5L, 7L, 5L, 9L).toDF("k")
    val t = new ColumnStore().load("t", df)
    val idx = t.index("k")
    assert(idx(5L).sorted.toSeq == Seq(0, 2))
    assert(idx(7L).toSeq == Seq(1))
    assert(idx.get(8L).isEmpty)
  }

  test("unknown column access fails loudly") {
    val t = new ColumnStore().load("t", Seq(1L).toDF("x"))
    intercept[RuntimeException](t.col("nope"))
  }
}
