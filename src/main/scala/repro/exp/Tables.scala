package repro.exp

import org.apache.spark.sql.SparkSession
import repro.data.DatasetGen
import repro.ml.DecisionTree
import repro.stats.Wilcoxon

/** Reproduction of each evaluation table. Every method returns structured
  * rows (so benches can assert on them) and a formatted text block with
  * the paper's numbers alongside ours.
  */
object Tables {

  /** The class-noise ratios of the paper's noise study. */
  val noiseRatios: Vector[Double] = Vector(0.05, 0.10, 0.20, 0.30, 0.40)

  private def dt(cfg: BenchConfig) = Vector[repro.ml.Learner](DecisionTree(maxDepth = cfg.dtDepth))

  private def mean(xs: Iterable[Double]): Double = xs.sum / xs.size

  // ----------------------------------------------------------------- Table I

  /** Table I row: dataset alias, N, p, q, IR at bench scale. */
  final case class DatasetRow(id: String, name: String, n: Int, p: Int, q: Int, ir: Double,
                              paperN: Int, paperP: Int, paperIr: Double)

  /** Dataset details as actually generated under the bench caps. */
  def tableI(cfg: BenchConfig): Vector[DatasetRow] =
    DatasetGen.specs.map { spec =>
      val data = DatasetGen.generate(spec, cfg.maxN, cfg.maxP, cfg.seed)
      val counts = data.groupBy(_.label).values.map(_.size)
      DatasetRow(spec.id, spec.name, data.size, data.head.dim, counts.size,
        counts.max.toDouble / counts.min, spec.n, spec.p, spec.ir)
    }

  def formatTableI(rows: Vector[DatasetRow]): String = {
    val header = f"${"ID"}%-4s ${"Name"}%-16s ${"N"}%6s ${"p"}%4s ${"q"}%3s ${"IR"}%9s | paper: N, p, IR"
    val body = rows.map { r =>
      f"${r.id}%-4s ${r.name}%-16s ${r.n}%6d ${r.p}%4d ${r.q}%3d ${r.ir}%9.2f | ${r.paperN}%6d, ${r.paperP}%3d, ${r.paperIr}%8.2f"
    }
    (header +: body).mkString("\n")
  }

  // ---------------------------------------------------------------- Table II

  /** Table II: per dataset, DT accuracy under each sampling method. */
  def tableII(spark: SparkSession, cfg: BenchConfig): Vector[(String, Map[String, Double])] = {
    val keys = Experiment.gridKeys(cfg, Seq(0.0))
    val results = Experiment.runGrid(spark, keys, cfg, Experiment.coreMethods, dt(cfg))
    DatasetGen.specs.map { spec =>
      val byMethod = Experiment.coreMethods.map { m =>
        m -> mean(results.filter(r => r.specId == spec.id && r.method == m).map(_.acc))
      }.toMap
      spec.id -> byMethod
    }
  }

  def formatTableII(rows: Vector[(String, Map[String, Double])]): String = {
    val methods = Experiment.coreMethods
    val header = f"${"Dataset"}%-8s" + methods.map(m => f"$m%10s").mkString +
      "   | paper: " + methods.map(m => f"$m%10s").mkString
    val body = rows.map { case (id, acc) =>
      val paper = PaperNumbers.tableII.toMap.apply(id)
      f"$id%-8s" + methods.map(m => f"${acc(m)}%10.4f").mkString +
        "   |        " + methods.map(m => f"${paper(m)}%10.4f").mkString
    }
    val avg = methods.map(m => mean(rows.map(_._2(m))))
    val avgPaper = methods.map(m => mean(PaperNumbers.tableII.map(_._2(m))))
    val footer = f"${"Average"}%-8s" + avg.map(a => f"$a%10.4f").mkString +
      "   |        " + avgPaper.map(a => f"$a%10.4f").mkString
    (header +: body :+ footer).mkString("\n")
  }

  // --------------------------------------------------------------- Table III

  final case class WilcoxonRow(comparison: String, p: Double, significant: Boolean, paperP: Double)

  /** Table III: Wilcoxon signed-rank of GBABS-DT vs each baseline, over the
    * 13 per-dataset Table II accuracies.
    */
  def tableIII(tableIIRows: Vector[(String, Map[String, Double])]): Vector[WilcoxonRow] = {
    val gbabs = tableIIRows.map(_._2("GBABS"))
    Vector("GGBS", "SRS", "None").map { m =>
      val other = tableIIRows.map(_._2(m))
      val p =
        if (gbabs.zip(other).forall { case (a, b) => a == b }) 1.0
        else Wilcoxon.signedRank(gbabs, other).pTwoSided
      WilcoxonRow(s"GBABS-DT vs. $m-DT", p, p < 0.05, PaperNumbers.tableIII(m))
    }
  }

  def formatTableIII(rows: Vector[WilcoxonRow]): String = {
    val header = f"${"Comparison"}%-24s ${"p-value"}%10s ${"sig(0.05)"}%10s ${"paper p"}%10s"
    (header +: rows.map { r =>
      f"${r.comparison}%-24s ${r.p}%10.6f ${if (r.significant) "yes" else "no"}%10s ${r.paperP}%10.6f"
    }).mkString("\n")
  }

  // ---------------------------------------------------------------- Table IV

  /** Table IV: average accuracy over all datasets per (learner, method,
    * noise ratio), for the five classifiers under the four settings.
    */
  def tableIV(spark: SparkSession, cfg: BenchConfig): Map[(String, String, Double), Double] = {
    val keys = Experiment.gridKeys(cfg, noiseRatios)
    val learners = Experiment.learners(cfg)
    val results = Experiment.runGrid(spark, keys, cfg, Experiment.coreMethods, learners)
    (for {
      l <- learners.map(_.name)
      m <- Experiment.coreMethods
      nz <- noiseRatios
    } yield (l, m, nz) ->
      mean(results.filter(r => r.learner == l && r.method == m && r.noise == nz).map(_.acc))).toMap
  }

  def formatTableIV(cells: Map[(String, String, Double), Double], learnerNames: Seq[String]): String = {
    val header = f"${"Learner-Method"}%-20s" + noiseRatios.map(nz => f"${s"${(nz * 100).toInt}%"}%9s").mkString +
      "   | paper" + noiseRatios.map(nz => f"${s"${(nz * 100).toInt}%"}%8s").mkString
    val body = for {
      l <- learnerNames
      m <- Experiment.coreMethods
    } yield {
      val ours = noiseRatios.map(nz => f"${cells((l, m, nz))}%9.4f").mkString
      val paper = noiseRatios.map { nz =>
        PaperNumbers.tableIV.get((l, m, nz)).map(v => f"$v%8.4f").getOrElse(f"${"-"}%8s")
      }.mkString
      f"$l-$m%-14s".take(20).padTo(20, ' ') + ours + "   |      " + paper
    }
    (header +: body).mkString("\n")
  }

  // ------------------------------------------- Extras: Fig 6 & Fig 9(a) data

  /** Sampling ratios of GBABS vs GGBS per dataset per noise ratio (the data
    * behind Fig 6). Returns (datasetId, noise) -> (gbabsRatio, ggbsRatio).
    */
  def samplingRatios(spark: SparkSession, cfg: BenchConfig,
                     noises: Seq[Double]): Map[(String, Double), (Double, Double)] = {
    val keys = Experiment.gridKeys(cfg, noises)
    val results = Experiment.runGrid(spark, keys, cfg, Vector("GBABS", "GGBS"), dt(cfg))
    (for {
      spec <- DatasetGen.specs
      nz <- noises
    } yield {
      def ratioOf(m: String) =
        mean(results.filter(r => r.specId == spec.id && r.noise == nz && r.method == m).map(_.ratio))
      (spec.id, nz) -> (ratioOf("GBABS"), ratioOf("GGBS"))
    }).toMap
  }

  /** Mean rank (1 = best) of each method's DT G-mean over the datasets —
    * the data behind Fig 9(a).
    */
  def gmeanRanking(spark: SparkSession, cfg: BenchConfig, noise: Double = 0.0): Map[String, Double] = {
    val keys = Experiment.gridKeys(cfg, Seq(noise))
    val results = Experiment.runGrid(spark, keys, cfg, Experiment.imbalancedMethods, dt(cfg))
    val perDataset = DatasetGen.specs.map { spec =>
      Experiment.imbalancedMethods.map { m =>
        m -> mean(results.filter(r => r.specId == spec.id && r.method == m).map(_.gmean))
      }
    }
    val ranks = perDataset.map { ms =>
      // rank by descending G-mean; ties share the mean rank
      val sorted = ms.sortBy { case (m, g) => (-g, m) }
      sorted.zipWithIndex.groupBy(_._1._2).flatMap { case (_, grp) =>
        val meanRank = grp.map(_._2 + 1.0).sum / grp.size
        grp.map { case ((m, _), _) => m -> meanRank }
      }
    }
    Experiment.imbalancedMethods.map(m => m -> mean(ranks.map(_(m)))).toMap
  }
}
