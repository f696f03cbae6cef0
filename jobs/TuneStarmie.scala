package repro.jobs

import repro.core._
import repro.exp.Experiments
import repro.lake.Benchmarks.Profile
import repro.lake.LakeGen
import repro.lake.LakeGen.LakeConfig

/** Hyper-parameter probe for the contrastive encoder: MAP@k on a small lake
  * across (lr, steps, embedDim, τ) plus an untrained random-projection
  * control. Not part of the reproduction tables — a bring-up tool.
  */
object TuneStarmie {
  def main(args: Array[String]): Unit = {
    val tiny = Profile(
      LakeConfig(name = "tune", nTemplates = 8, derivedPerTemplate = 8,
        arityMin = 3, arityMax = 5, sharedTypesPerTemplate = 2, nSharedSurfaces = 4,
        rowsPerDerived = 20, poolSize = 50, colKeepFraction = 0.8,
        nQueries = 8, noise = 0.03, seed = 77),
      k = 5, sherlockKnownFraction = 0.7, santosKbCoverage = 0.8, santosAvailable = true)
    val lake = LakeGen.generate(tiny.cfg)
    val feat = new Featurizer()

    def mapOf(enc: ColumnEncoder, tau: Double): Double = {
      val emb = Experiments.embedLake(lake, enc)
      Experiments.evalEmbedding(lake, emb, tiny.k, Experiments.Pruning, tau).map
    }

    for (dim <- Seq(64); tau <- Seq(0.5, 0.6)) {
      val w0 = Linalg.randomMatrix(dim, feat.cfg.contextDim, 5)
      println(f"UNTRAINED dim=$dim tau=$tau MAP=${mapOf(new StarmieEncoder(feat, w0), tau)}%.3f")
    }
    for (lr <- Seq(0.2, 0.5); steps <- Seq(80, 300);
         anchor <- Seq(0.01, 0.05, 0.2); drop <- Seq(0.1, 0.3); tau <- Seq(0.5, 0.6)) {
      val cfg = Contrastive.TrainConfig(embedDim = 64, lr = lr,
        maxSteps = steps, epochs = 100, batchTables = 6,
        anchorWeight = anchor, dropout = drop)
      val w = Contrastive.trainMultiColumn(lake.tables, feat, cfg)
      println(f"TRAINED lr=$lr steps=$steps anchor=$anchor drop=$drop tau=$tau " +
        f"MAP=${mapOf(new StarmieEncoder(feat, w), tau)}%.3f")
    }
  }
}
