package repro.jobs

import repro.core._
import repro.exp.Experiments
import repro.lake.Benchmarks
import repro.lake.LakeGen
import scala.util.Random

/** Embedding-geometry diagnostic: cosine of (a) aligned same-template pairs,
  * (b) homograph pairs (same surface, different template), (c) random pairs,
  * per encoder — plus per-query error anatomy for Starmie vs SingleCol.
  * Bring-up tool, not part of the reproduction tables.
  */
object DiagnoseGeometry {
  def main(args: Array[String]): Unit = {
    val profile = Benchmarks.santosSmall
    val lake    = LakeGen.generate(profile.cfg.copy(nQueries = 30))
    val models  = Experiments.trainModels(lake, profile)
    val rnd     = new Random(1)

    val colsBySurface = lake.colSurfaceType.toSeq.groupBy(_._2)
    val byId = lake.tables.map(t => t.id -> t).toMap

    def geometry(name: String, emb: Map[String, IndexedSeq[Array[Float]]]): Unit = {
      def cos(a: (String, Int), b: (String, Int)): Double =
        Linalg.dot(emb(a._1)(a._2), emb(b._1)(b._2)).toDouble
      val gt  = scala.collection.mutable.ArrayBuffer[Double]()
      val hom = scala.collection.mutable.ArrayBuffer[Double]()
      val rndP = scala.collection.mutable.ArrayBuffer[Double]()
      colsBySurface.values.foreach { cols =>
        val arr = cols.map(_._1).toIndexedSeq
        (0 until math.min(40, arr.size)).foreach { _ =>
          val a = arr(rnd.nextInt(arr.size)); val b = arr(rnd.nextInt(arr.size))
          if (a._1 != b._1) {
            val sameTpl = lake.templateOf(a._1) == lake.templateOf(b._1)
            if (sameTpl) gt += cos(a, b) else hom += cos(a, b)
          }
        }
      }
      val allCols = lake.colSurfaceType.keys.toIndexedSeq
      (0 until 500).foreach { _ =>
        val a = allCols(rnd.nextInt(allCols.size)); val b = allCols(rnd.nextInt(allCols.size))
        if (lake.colSurfaceType(a) != lake.colSurfaceType(b)) rndP += cos(a, b)
      }
      def avg(xs: Seq[Double]) = if (xs.isEmpty) Double.NaN else xs.sum / xs.size
      println(f"GEO $name%-18s gtPair=${avg(gt.toSeq)}%.3f (n=${gt.size}) " +
        f"homograph=${avg(hom.toSeq)}%.3f (n=${hom.size}) random=${avg(rndP.toSeq)}%.3f")
    }

    val feat = models.feat
    val encs: Seq[(String, ColumnEncoder)] = Seq(
      "starmie-trained" -> models.starmie,
      "starmie-untrained" -> new StarmieEncoder(feat,
        Linalg.randomMatrix(64, feat.cfg.contextDim, 5)),
      "singlecol" -> models.singleCol,
      "sato" -> models.sato,
    )
    val embs = encs.map { case (n, e) => n -> Encoder.embedAll(lake.tables, e) }
    embs.foreach { case (n, e) => geometry(n, e) }

    // error anatomy for starmie vs singlecol
    Seq("starmie-trained", "singlecol").foreach { name =>
      val emb = embs.find(_._1 == name).get._2
      val ordered = lake.tables.map(t => t.id -> emb(t.id))
      val searcher = new UnionSearcher(ordered, Experiments.DefaultTau)
      var missed = 0; var fpHomograph = 0; var fpOther = 0
      lake.queries.foreach { qid =>
        val res = searcher.queryPruning(emb(qid), 10)
        val gtSet = lake.groundTruth(qid)
        val qTpl  = lake.templateOf(qid)
        val qSurfaces = byId(qid).columns.indices
          .map(ci => lake.colSurfaceType((qid, ci))).toSet
        res.ranked.foreach { case (tid, _) =>
          if (!gtSet.contains(tid)) {
            val tSurfaces = byId(tid).columns.indices
              .map(ci => lake.colSurfaceType((tid, ci))).toSet
            if (qSurfaces.intersect(tSurfaces).nonEmpty) fpHomograph += 1 else fpOther += 1
          }
        }
        missed += gtSet.size.min(10) - res.ranked.count(r => gtSet.contains(r._1))
      }
      println(s"ANATOMY $name: missedGtSlots=$missed fpSharedSurface=$fpHomograph fpOther=$fpOther")
    }
  }
}
