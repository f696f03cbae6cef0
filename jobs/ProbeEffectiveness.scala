package repro.jobs

import repro.exp.Experiments
import repro.lake.Benchmarks

/** Quick Table 3 probe with reduced query counts — a bring-up tool for
  * tuning benchmark profiles, not part of the reproduction tables.
  * Usage: runMain repro.jobs.ProbeEffectiveness [santosSmall|tusSmall|tusLarge ...]
  */
object ProbeEffectiveness {
  def main(args: Array[String]): Unit = {
    val names = if (args.nonEmpty) args.toSeq else Seq("santosSmall", "tusSmall", "tusLarge")
    names.foreach { name =>
      val base = name match {
        case "santosSmall" => Benchmarks.santosSmall
        case "tusSmall"    => Benchmarks.tusSmall
        case "tusLarge"    => Benchmarks.tusLarge
      }
      val full = sys.env.get("PROBE_FULL").exists(_ == "1")
      val profile = if (full) base else base.copy(cfg = base.cfg.copy(nQueries = 30))
      val (_, _, rows) = Experiments.effectiveness(profile, None)
      rows.foreach(r => println(f"PROBE ${r.benchmark}%-12s ${r.method}%-10s " +
        f"MAP=${r.map}%.3f R=${r.r}%.3f ideal=${r.ideal}%.3f"))
    }
  }
}
