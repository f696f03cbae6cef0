package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class AugmentSpec extends AnyFunSuite {

  private def mkTable: TableData = TableData("t", IndexedSeq(
    ColumnData("state",   IndexedSeq("new york", "california", "florida", "texas")),
    ColumnData("capital", IndexedSeq("albany", "sacramento", "tallahassee", "austin")),
    ColumnData("since",   IndexedSeq("1797", "1854", "1824", "1845")),
    ColumnData("blankish", IndexedSeq("", "nan", "x", "")),
  ))

  private def rnd = new Random(12)

  test("every operator preserves the alignment contract") {
    Augment.byName.foreach { case (name, op) =>
      val v = op(mkTable, rnd)
      assert(v.alignment.size == v.table.numCols, s"$name alignment size")
      v.alignment.foreach(i => assert(i >= 0 && i < mkTable.numCols, s"$name alignment range"))
      assert(v.alignment.distinct.size == v.alignment.size, s"$name alignment unique")
    }
  }

  test("drop_cell keeps column count and row count") {
    val v = Augment.dropCell(mkTable, rnd)
    assert(v.table.numCols == 4 && v.table.numRows == 4)
  }

  test("drop_cell blanks exactly one cell per column") {
    val v = Augment.dropCell(mkTable, rnd)
    val c0 = v.table.columns(2) // "since" column has no empty original cells
    assert(c0.values.count(_ == "") == 1)
  }

  test("drop_token removes one token from a multi-token cell") {
    val v = Augment.dropToken(mkTable, rnd)
    val orig  = mkTable.columns(0).tokens.size
    val after = v.table.columns(0).tokens.size
    assert(after == orig - 1)
  }

  test("swap_token preserves the token multiset") {
    val v = Augment.swapToken(mkTable, rnd)
    assert(v.table.columns(0).tokens.sorted == mkTable.columns(0).tokens.sorted)
  }

  test("repl_token keeps values within the column domain") {
    val v = Augment.replToken(mkTable, rnd)
    v.table.columns.zip(mkTable.columns).foreach { case (a, o) =>
      a.values.foreach(x => assert(o.values.contains(x)))
    }
  }

  test("sample_row halves the rows") {
    val v = Augment.sampleRow(0.5)(mkTable, rnd)
    assert(v.table.numRows == 2)
    assert(v.table.numCols == 4)
  }

  test("sample_row keeps row alignment across columns") {
    val v = Augment.sampleRow(0.5)(mkTable, rnd)
    val states   = v.table.columns(0).values
    val capitals = v.table.columns(1).values
    states.zip(capitals).foreach { case (s, c) =>
      val i = mkTable.columns(0).values.indexOf(s)
      assert(mkTable.columns(1).values(i) == c)
    }
  }

  test("sample_row_ordered preserves original row order") {
    val v   = Augment.sampleRowOrdered(0.75)(mkTable, rnd)
    val idx = v.table.columns(0).values.map(mkTable.columns(0).values.indexOf)
    assert(idx == idx.sorted)
  }

  test("shuffle_row is a permutation of the rows") {
    val v = Augment.shuffleRow(mkTable, rnd)
    assert(v.table.columns(0).values.sorted == mkTable.columns(0).values.sorted)
    assert(v.table.numRows == 4)
  }

  test("drop_col drops at least one and keeps at least one column") {
    (0 until 20).foreach { s =>
      val v = Augment.dropCol(mkTable, new Random(s))
      assert(v.table.numCols >= 1 && v.table.numCols < 4)
    }
  }

  test("drop_col alignment points at the surviving originals") {
    val v = Augment.dropCol(mkTable, rnd)
    v.table.columns.zip(v.alignment).foreach { case (c, origIdx) =>
      assert(mkTable.columns(origIdx).values == c.values)
    }
  }

  test("drop_col on a single-column table is identity") {
    val t = TableData("one", IndexedSeq(ColumnData("a", IndexedSeq("x"))))
    val v = Augment.dropCol(t, rnd)
    assert(v.table == t && v.alignment == IndexedSeq(0))
  }

  test("drop_num_col only drops numeric columns") {
    (0 until 20).foreach { s =>
      val v = Augment.dropNumCol(mkTable, new Random(s))
      // "since" (index 2) is the only numeric column
      val keptNames = v.table.columns.map(_.name)
      assert(keptNames.contains("state") && keptNames.contains("capital"))
    }
  }

  test("drop_nan_col removes the mostly-blank column") {
    val v = Augment.dropNanCol(mkTable, rnd)
    assert(!v.table.columns.exists(_.name == "blankish"))
    assert(v.table.numCols == 3)
  }

  test("shuffle_col permutes columns with a consistent alignment") {
    val v = Augment.shuffleCol(mkTable, rnd)
    assert(v.table.numCols == 4)
    v.table.columns.zip(v.alignment).foreach { case (c, origIdx) =>
      assert(mkTable.columns(origIdx) == c)
    }
  }

  test("registry exposes all eleven operators of Table 1") {
    assert(Augment.byName.size == 11)
    assert(Augment.byName.keySet.contains("drop_col"))
  }
}
