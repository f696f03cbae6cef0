package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** Table preprocessing (paper Algorithm 2 + Appendix A/B.2).
  *
  * Pre-trained LMs cap the input length, so the paper selects the most
  * important rows/cells/tokens by TF-IDF before serialization. Our encoders
  * have no hard token cap but the same budget keeps featurization O(budget)
  * per column and, per the paper's ablation, *which* tokens are kept matters.
  *
  * IDF is a lake-wide statistic: idf(tok) = log(M / df(tok)) with M the
  * number of columns in the lake and df the number of columns containing the
  * token. It is computed as a Spark DataFrame aggregation over the cell-level
  * corpus view (and cross-checked against DuckDB in the tests).
  */
object Preprocess {

  /** Per-token document frequencies as a DataFrame: (token, df). A column is
    * one "document", matching the paper's definition in Appendix A.
    */
  def documentFrequencyDf(spark: SparkSession, tables: Seq[TableData]): DataFrame = {
    val cells = TableModel.toCellDf(spark, tables)
    cells
      .select(col("table_id"), col("col_idx"),
              explode(split(lower(col("value")), "[^0-9a-z]+")).as("token"))
      .filter(col("token") =!= "")
      .select("table_id", "col_idx", "token")
      .distinct()
      .groupBy("token")
      .agg(count(lit(1)).as("df"))
  }

  /** Lake-wide IDF map on the driver. */
  def idf(spark: SparkSession, tables: Seq[TableData]): Map[String, Double] = {
    val m  = tables.iterator.map(_.numCols).sum.toDouble
    val df = documentFrequencyDf(spark, tables).collect()
    df.iterator.map(r => r.getString(0) -> math.log(m / r.getLong(1).toDouble)).toMap
  }

  /** Driver-only IDF (no SparkSession) for unit-scale corpora. */
  def idfLocal(tables: Seq[TableData]): Map[String, Double] = {
    val m  = tables.iterator.map(_.numCols).sum.toDouble
    val df = new scala.collection.mutable.HashMap[String, Int]()
    tables.foreach(_.columns.foreach { c =>
      c.tokenSet.foreach(tok => df.update(tok, df.getOrElse(tok, 0) + 1))
    })
    df.iterator.map { case (tok, d) => tok -> math.log(m / d.toDouble) }.toMap
  }

  /** Average TF-IDF of a cell's tokens (Algorithm 2 line 2; the appendix
    * allows sum or average — we use average, the paper's default).
    */
  def cellScore(cell: String, idf: Map[String, Double]): Double = {
    val toks = Tokenizer.tokenize(cell)
    if (toks.isEmpty) 0.0
    else toks.iterator.map(t => idf.getOrElse(t, 0.0)).sum / toks.size
  }

  /** Average cell score of a row (Algorithm 2 line 4). */
  def rowScore(t: TableData, row: Int, idf: Map[String, Double]): Double = {
    val cells = t.columns.flatMap(c => c.values.lift(row))
    if (cells.isEmpty) 0.0 else cells.map(cellScore(_, idf)).sum / cells.size
  }

  /** Algorithm 2: produce the preprocessed table under a total token budget
    * `maxTokens`, in one of the three modes.
    *
    *  - "row":   keep top-scoring rows (whole rows, preserving alignment)
    *  - "cell":  keep top-scoring cells per column, budget m/|T| each
    *  - "token": keep top-TF-IDF tokens per column, budget m/|T| each
    */
  def preprocess(t: TableData, idf: Map[String, Double],
                 mode: String, maxTokens: Int): TableData = {
    require(t.numCols > 0, s"empty table ${t.id}")
    mode match {
      case "row" =>
        val ranked = (0 until t.numRows).sortBy(r => -rowScore(t, r, idf))
        val keep   = scala.collection.mutable.ArrayBuffer[Int]()
        var budget = maxTokens
        ranked.foreach { r =>
          val cost = t.columns.flatMap(_.values.lift(r))
            .map(Tokenizer.tokenize(_).size).sum
          if (budget - cost >= 0 || keep.isEmpty) { keep += r; budget -= cost }
        }
        val rows = keep.toIndexedSeq
        t.copy(columns = t.columns.map(c =>
          c.copy(values = rows.collect { case r if r < c.values.size => c.values(r) })))

      case "cell" =>
        val perCol = math.max(1, maxTokens / t.numCols)
        t.copy(columns = t.columns.map { c =>
          val ranked = c.values.sortBy(v => -cellScore(v, idf))
          val keep   = scala.collection.mutable.ArrayBuffer[String]()
          var budget = perCol
          ranked.foreach { v =>
            val cost = Tokenizer.tokenize(v).size
            if (budget - cost >= 0 || keep.isEmpty) { keep += v; budget -= cost }
          }
          c.copy(values = keep.toIndexedSeq)
        })

      case "token" =>
        val perCol = math.max(1, maxTokens / t.numCols)
        t.copy(columns = t.columns.map { c =>
          val ranked = c.tokens.sortBy(tok => -idf.getOrElse(tok, 0.0)).take(perCol)
          c.copy(values = ranked)
        })

      case other => throw new IllegalArgumentException(s"unknown mode $other")
    }
  }

  /** Appendix B.2 sampling methods: reduce each column to at most `budget`
    * tokens. All methods are deterministic except "random" (seeded).
    */
  def sample(t: TableData, method: String, idf: Map[String, Double],
             budget: Int, seed: Long = 7): TableData = {
    val rnd = new scala.util.Random(seed)
    def perColumn(f: ColumnData => Seq[String]): TableData =
      t.copy(columns = t.columns.map(c => c.copy(values = f(c).toIndexedSeq)))

    method match {
      case "head"        => perColumn(_.tokens.distinct.take(budget))
      case "random"      => perColumn(c => rnd.shuffle(c.tokens.distinct).take(budget))
      case "everyN" => perColumn { c =>
        val toks = c.tokens.distinct
        val n    = math.max(1, toks.size / math.max(1, budget))
        toks.grouped(n).map(_.head).take(budget).toSeq
      }
      case "uniform" => perColumn { c =>
        val freq = c.tokens.groupBy(identity).view.mapValues(_.size)
        c.tokens.distinct.sortBy(tok => -freq(tok)).take(budget)
      }
      case "tfidf_token" =>
        perColumn(_.tokens.distinct.sortBy(tok => -idf.getOrElse(tok, 0.0)).take(budget))
      case "alphaHead"   => perColumn(_.tokens.distinct.sorted.take(budget))
      case "tfidf_entity" => perColumn { c =>
        val cells = c.values.distinct.sortBy(v => -cellScore(v, idf))
        val out   = scala.collection.mutable.ArrayBuffer[String]()
        cells.iterator.takeWhile(_ => out.size < budget).foreach { v =>
          out ++= Tokenizer.tokenize(v).take(budget - out.size)
        }
        out.toSeq
      }
      case "tfidf_row" =>
        val ranked = (0 until t.numRows).sortBy(r => -rowScore(t, r, idf))
        t.copy(columns = t.columns.map { c =>
          val out = scala.collection.mutable.ArrayBuffer[String]()
          ranked.iterator.takeWhile(_ => out.size < budget).foreach { r =>
            c.values.lift(r).foreach(v => out ++= Tokenizer.tokenize(v).take(budget - out.size))
          }
          c.copy(values = out.toIndexedSeq)
        })
      case "row_ordered" =>
        t.copy(columns = t.columns.map { c =>
          c.copy(values = c.values.flatMap(Tokenizer.tokenize(_)).take(budget))
        })
      case other => throw new IllegalArgumentException(s"unknown method $other")
    }
  }
}
