package repro.jobs

import repro.data.Datasets
import repro.eval.{Experiments, Tables}

/** Reproduces the Fig. 14 / Sec. 8.4 shape: G-recall of the three
  * approximation functions for varying thresholds under spread and skewed
  * noise.
  */
object GrecallJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("grecall")
    try {
      val rows = Experiments.grecall(spark, Datasets.all)
      println(Tables.banner("Fig. 14 — G-recall by threshold, function, noise"))
      println(Tables.fmt(
        Seq("dataset", "noise", "fn", "eps", "G-recall", "nDCs"),
        rows.map(r => Seq(r.dataset, r.noise, r.fn, r.epsilon, r.grecall, r.nDcs))))

      // Sec. 8.4 headline: average G-recall at each function's best threshold.
      val best = Seq("f1" -> 1e-4, "f2" -> 1e-2, "f3" -> 1e-1)
      println(Tables.banner("Sec. 8.4 — average G-recall at the paper's best thresholds"))
      println(Tables.fmt(
        Seq("fn", "bestEps", "avgGRecall(spread)", "avgGRecall(skewed)"),
        best.map { case (fn, eps) =>
          def avg(noise: String) = {
            val sel = rows.filter(r => r.fn == fn && r.epsilon == eps && r.noise == noise)
            if (sel.isEmpty) 0.0 else sel.map(_.grecall).sum / sel.size
          }
          Seq(fn, eps, avg("spread"), avg("skewed"))
        }))
    } finally spark.stop()
  }
}
