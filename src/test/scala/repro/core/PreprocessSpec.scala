package repro.core

import repro.{Oracle, SparkSpec}

class PreprocessSpec extends SparkSpec {

  private val tables = Seq(
    TableData("t1", IndexedSeq(
      ColumnData("a", IndexedSeq("alpha beta", "alpha", "gamma")),
      ColumnData("b", IndexedSeq("delta", "delta", "epsilon")))),
    TableData("t2", IndexedSeq(
      ColumnData("c", IndexedSeq("alpha", "zeta", "zeta")))),
  )

  test("documentFrequencyDf counts columns containing each token") {
    val df = Preprocess.documentFrequencyDf(spark, tables).collect()
      .map(r => r.getString(0) -> r.getLong(1)).toMap
    assert(df("alpha") == 2)   // columns a and c
    assert(df("delta") == 1)
    assert(df("zeta") == 1)
  }

  test("documentFrequencyDf matches DuckDB on the cell-level view (oracle)") {
    val cellDf = TableModel.toCellDf(spark, tables)
    val sparkDf = Preprocess.documentFrequencyDf(spark, tables)
    Oracle.assertEquivalent(
      sparkDf,
      """SELECT token, COUNT(*) AS df FROM (
        |  SELECT DISTINCT table_id, col_idx, unnest(string_split(lower(value), ' ')) AS token
        |  FROM cells WHERE value <> ''
        |) WHERE token <> '' GROUP BY token""".stripMargin,
      "cells" -> cellDf)
  }

  test("idf is log(M/df)") {
    val idf = Preprocess.idf(spark, tables)
    val m = 3.0 // total columns
    assert(math.abs(idf("alpha") - math.log(m / 2)) < 1e-12)
    assert(math.abs(idf("delta") - math.log(m / 1)) < 1e-12)
  }

  test("idfLocal agrees with the Spark job") {
    val a = Preprocess.idf(spark, tables)
    val b = Preprocess.idfLocal(tables)
    assert(a.keySet == b.keySet)
    a.foreach { case (k, v) => assert(math.abs(v - b(k)) < 1e-12) }
  }

  test("cellScore averages token IDFs") {
    val idf = Map("alpha" -> 1.0, "beta" -> 3.0)
    assert(Preprocess.cellScore("alpha beta", idf) == 2.0)
    assert(Preprocess.cellScore("", idf) == 0.0)
  }

  test("rowScore averages over the row's cells") {
    val idf = Preprocess.idfLocal(tables)
    val s = Preprocess.rowScore(tables.head, 0, idf)
    val expected = (Preprocess.cellScore("alpha beta", idf) +
                    Preprocess.cellScore("delta", idf)) / 2
    assert(math.abs(s - expected) < 1e-12)
  }

  private val bigTable = TableData("big", IndexedSeq(
    ColumnData("x", (0 until 20).map(i => s"tok$i common").toIndexedSeq),
    ColumnData("y", (0 until 20).map(i => s"val$i common").toIndexedSeq)))

  test("mode=row keeps whole rows within the token budget") {
    val idf = Preprocess.idfLocal(Seq(bigTable))
    val out = Preprocess.preprocess(bigTable, idf, "row", maxTokens = 16)
    assert(out.numCols == 2)
    assert(out.numRows < 20 && out.numRows >= 1)
    // row alignment preserved: cells still pair up
    out.columns(0).values.zip(out.columns(1).values).foreach { case (x, y) =>
      assert(x.drop(3).takeWhile(_.isDigit) == y.drop(3).takeWhile(_.isDigit))
    }
  }

  test("mode=cell respects the per-column budget") {
    val idf = Preprocess.idfLocal(Seq(bigTable))
    val out = Preprocess.preprocess(bigTable, idf, "cell", maxTokens = 12)
    out.columns.foreach { c =>
      assert(c.tokens.size <= 12 / 2 + 1)
    }
  }

  test("mode=token keeps the highest-IDF tokens") {
    val idf = Preprocess.idfLocal(Seq(bigTable))
    val out = Preprocess.preprocess(bigTable, idf, "token", maxTokens = 8)
    out.columns.foreach { c =>
      assert(c.values.size <= 4)
      // "common" appears in every cell of both columns → lowest IDF → dropped
      assert(!c.values.contains("common"))
    }
  }

  test("unknown mode throws") {
    val idf = Map.empty[String, Double]
    intercept[IllegalArgumentException] {
      Preprocess.preprocess(bigTable, idf, "bogus", 10)
    }
  }

  test("sampling: head takes the first distinct tokens") {
    val idf = Preprocess.idfLocal(Seq(bigTable))
    val out = Preprocess.sample(bigTable, "head", idf, budget = 3)
    assert(out.columns(0).values == IndexedSeq("tok0", "common", "tok1"))
  }

  test("sampling: alphaHead sorts alphabetically") {
    val idf = Preprocess.idfLocal(Seq(bigTable))
    val out = Preprocess.sample(bigTable, "alphaHead", idf, budget = 2)
    val toks = out.columns(0).values
    assert(toks == toks.sorted)
  }

  test("sampling: tfidf_token ranks by IDF") {
    val idf = Preprocess.idfLocal(Seq(bigTable))
    val out = Preprocess.sample(bigTable, "tfidf_token", idf, budget = 5)
    assert(!out.columns(0).values.contains("common"))
  }

  test("sampling: uniform keeps the most frequent token first") {
    val idf = Preprocess.idfLocal(Seq(bigTable))
    val out = Preprocess.sample(bigTable, "uniform", idf, budget = 1)
    assert(out.columns(0).values == IndexedSeq("common"))
  }

  test("sampling: every method respects the budget") {
    val idf = Preprocess.idfLocal(Seq(bigTable))
    Seq("head", "random", "everyN", "uniform", "tfidf_token", "alphaHead",
        "tfidf_entity", "tfidf_row", "row_ordered").foreach { m =>
      val out = Preprocess.sample(bigTable, m, idf, budget = 4)
      out.columns.foreach(c => assert(c.values.size <= 4, s"method $m over budget"))
    }
  }

  test("sampling: unknown method throws") {
    intercept[IllegalArgumentException] {
      Preprocess.sample(bigTable, "nope", Map.empty, 4)
    }
  }
}
