package repro.experiments

import org.apache.spark.sql.SparkSession
import repro.core.{Asti, TrimSelector}
import repro.diffusion.{DiffusionModel, Realization, Spread}
import repro.graph.{GraphGen, GraphStats}

/** Calibration probe (development utility, also usable via runMain): prints
  * per-dataset structural stats, the top-degree node's Monte-Carlo spread,
  * and one ASTI run — the quantities the DESIGN.md §5 substitution is tuned
  * against.
  */
object Probe {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder
      .master("local[*]").appName("probe")
      .config("spark.ui.enabled", false)
      .getOrCreate()
    spark.sparkContext.setLogLevel("WARN")
    val names = if (args.nonEmpty) args.toSeq else Seq("nethept", "epinions")
    names.foreach { name =>
      val t0 = System.nanoTime()
      val g = GraphGen.dataset(spark, name)
      val genMs = (System.nanoTime() - t0) / 1000000
      val hub = (0 until g.n).maxBy(g.outDeg)
      val hubSpread = Spread.mcSpreadLocal(g, Array(hub), DiffusionModel.IC, 50, 7L)
      val lwcc = GraphStats.lwccSizeLocal(g)
      println(f"$name%-12s n=${g.n} m=${g.m} gen=${genMs}ms hubOutDeg=${g.outDeg(hub)} " +
              f"hubSpread=$hubSpread%.1f lwcc=$lwcc")
      val eta = g.n / 10
      val t1 = System.nanoTime()
      val res = Asti.run(spark, g, eta, 0.5, TrimSelector, DiffusionModel.IC, 99L)
      println(f"  ASTI η=$eta: seeds=${res.numSeeds} rounds=${res.rounds} " +
              f"spread=${res.finalSpread} samples=${res.samples} " +
              f"ms=${(System.nanoTime() - t1) / 1000000}")
    }
    spark.stop()
  }
}
