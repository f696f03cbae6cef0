package repro.jobs

import repro.cluster.ColumnClustering
import repro.exp.Experiments
import repro.lake.Benchmarks
import repro.lake.LakeGen

/** θ-sweep of cluster count and purity per encoder on the clustering lake. */
object ProbeClustering {
  def main(args: Array[String]): Unit = {
    val profile = Benchmarks.clustering
    val lake    = LakeGen.generate(profile.cfg)
    val models  = Experiments.trainModels(lake, profile)
    println(s"cols=${lake.totalColumns} surfaces=${lake.colSurfaceType.values.toSet.size} " +
            s"contextual=${lake.colContextualType.values.toSet.size}")
    Seq(models.starmie, models.singleCol, models.sherlock, models.sato).foreach { enc =>
      val (graph, labels) = ColumnClustering.buildGraph(lake, enc)
      (50 to 95 by 5).map(_ / 100.0).foreach { theta =>
        val r = ColumnClustering.evaluate(graph, labels, theta)
        println(f"CLUST ${enc.name}%-10s theta=$theta%.2f n=${r.nClusters}%5d " +
                f"avg=${r.avgSize}%7.1f purity=${100 * r.purity}%.1f")
      }
    }
  }
}
