package repro.jobs

import repro.exp.Experiments
import repro.lake.Benchmarks
import repro.lake.LakeGen

/** τ sensitivity probe for the embedding methods on santosSmall. */
object ProbeTau {
  def main(args: Array[String]): Unit = {
    val profile = Benchmarks.santosSmall
    val p = profile.copy(cfg = profile.cfg.copy(nQueries = 30))
    val lake = LakeGen.generate(p.cfg)
    val models = Experiments.trainModels(lake, p)
    val embs = Seq(
      Experiments.embedLake(lake, models.starmie),
      Experiments.embedLake(lake, models.singleCol),
      Experiments.embedLake(lake, models.sato))
    for (tau <- Seq(0.35, 0.40, 0.45, 0.50, 0.55, 0.60); emb <- embs) {
      val r = Experiments.evalEmbedding(lake, emb, p.k, Experiments.Pruning, tau)
      println(f"TAU $tau%.2f ${emb.method}%-10s MAP=${r.map}%.3f R=${r.r}%.3f")
    }
  }
}
