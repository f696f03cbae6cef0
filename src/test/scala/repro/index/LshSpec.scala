package repro.index

import org.scalatest.funsuite.AnyFunSuite
import repro.core.Linalg
import scala.util.Random

class LshSpec extends AnyFunSuite {

  private def randomUnit(d: Int, rnd: Random): Array[Float] =
    Linalg.normalize(Array.fill(d)(rnd.nextGaussian().toFloat))

  test("a vector finds itself") {
    val lsh = new SimHashLsh(8)
    val rnd = new Random(1)
    val v = randomUnit(8, rnd)
    lsh.add(0, v)
    val res = lsh.search(v, 1)
    assert(res.nonEmpty && res.head._1 == 0)
  }

  test("near-duplicates land in the same bucket with high probability") {
    val rnd = new Random(2)
    val d = 16
    val lsh = new SimHashLsh(d, nTables = 8, bitsPerTable = 10)
    val bases = IndexedSeq.fill(50)(randomUnit(d, rnd))
    bases.zipWithIndex.foreach { case (v, i) => lsh.add(i, v) }
    // perturb slightly: cosine ≈ 0.99
    val found = bases.zipWithIndex.count { case (v, i) =>
      val q = Linalg.normalized(v.zip(randomUnit(d, rnd)).map { case (a, b) => a + 0.05f * b })
      lsh.search(q, 5).exists(_._1 == i)
    }
    assert(found >= 45, s"only $found/50 near-duplicates found")
  }

  test("random unrelated vectors are mostly not returned") {
    val rnd = new Random(3)
    val d = 32
    val lsh = new SimHashLsh(d, nTables = 4, bitsPerTable = 14)
    (0 until 500).foreach(i => lsh.add(i, randomUnit(d, rnd)))
    val sizes = (0 until 20).map(_ => lsh.search(randomUnit(d, rnd), 500).size)
    // with 14-bit keys, random vectors share buckets rarely
    assert(sizes.sum.toDouble / sizes.size < 100)
  }

  test("results are ranked by exact cosine") {
    val rnd = new Random(4)
    val d = 8
    val lsh = new SimHashLsh(d, nTables = 16, bitsPerTable = 4)
    (0 until 100).foreach(i => lsh.add(i, randomUnit(d, rnd)))
    val res = lsh.search(randomUnit(d, rnd), 10)
    assert(res.map(_._2).toSeq == res.map(_._2).sortBy(-_).toSeq)
  }

  test("deterministic for a fixed seed") {
    val rnd1 = new Random(7); val rnd2 = new Random(7)
    def build(r: Random): SimHashLsh = {
      val l = new SimHashLsh(8, seed = 5)
      (0 until 200).foreach(i => l.add(i, randomUnit(8, r)))
      l
    }
    val q = randomUnit(8, new Random(9))
    assert(build(rnd1).search(q, 5) == build(rnd2).search(q, 5))
  }

  test("memoryBytes accounts vectors, buckets and planes") {
    val lsh = new SimHashLsh(8, nTables = 2, bitsPerTable = 4)
    val empty = lsh.memoryBytes
    lsh.add(0, Array(1f, 0f, 0f, 0f, 0f, 0f, 0f, 0f))
    assert(lsh.memoryBytes > empty)
  }
}
