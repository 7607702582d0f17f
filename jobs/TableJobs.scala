package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.exp.{BenchConfig, Tables}

/** Shared session/config plumbing for the per-table spark-submit jobs.
  *
  * Optional args: `--maxN <int> --maxP <int> --folds <int> --rho <int>`.
  */
object JobContext {
  def session(name: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(name)
      .config("spark.sql.shuffle.partitions", "64")
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()

  def config(args: Array[String]): BenchConfig = {
    val kv = args.sliding(2, 2).collect { case Array(k, v) => (k, v) }.toMap
    BenchConfig(
      maxN = kv.getOrElse("--maxN", "3000").toInt,
      maxP = kv.getOrElse("--maxP", "48").toInt,
      folds = kv.getOrElse("--folds", "5").toInt,
      rho = kv.getOrElse("--rho", "5").toInt,
    )
  }
}

/** Table I — dataset details at bench scale vs the paper's originals. */
object TableI {
  def main(args: Array[String]): Unit = {
    val cfg = JobContext.config(args)
    println("== Table I: Details of Datasets (ours | paper) ==")
    println(Tables.formatTableI(Tables.tableI(cfg)))
  }
}

/** Table II — DT accuracy under GBABS / GGBS / SRS / none. */
object TableII {
  def main(args: Array[String]): Unit = {
    val spark = JobContext.session("gbabs-table2")
    val cfg = JobContext.config(args)
    println("== Table II: testing Accuracy of DT (ours | paper) ==")
    println(Tables.formatTableII(Tables.tableII(spark, cfg)))
    spark.stop()
  }
}

/** Table III — Wilcoxon signed-rank tests over the Table II accuracies. */
object TableIII {
  def main(args: Array[String]): Unit = {
    val spark = JobContext.session("gbabs-table3")
    val cfg = JobContext.config(args)
    println("== Table III: Wilcoxon signed-rank (ours | paper) ==")
    println(Tables.formatTableIII(Tables.tableIII(Tables.tableII(spark, cfg))))
    spark.stop()
  }
}

/** Table IV — average accuracy on class-noise datasets, 5 classifiers. */
object TableIV {
  def main(args: Array[String]): Unit = {
    val spark = JobContext.session("gbabs-table4")
    val cfg = JobContext.config(args)
    println("== Table IV: average testing Accuracy on class-noise datasets (ours | paper) ==")
    val cells = Tables.tableIV(spark, cfg)
    println(Tables.formatTableIV(cells, repro.exp.Experiment.learners(cfg).map(_.name)))
    spark.stop()
  }
}

/** Sampling-ratio study (the data behind Fig 6). */
object SamplingRatio {
  def main(args: Array[String]): Unit = {
    val spark = JobContext.session("gbabs-ratio")
    val cfg = JobContext.config(args)
    val noises = 0.0 +: Tables.noiseRatios
    val ratios = Tables.samplingRatios(spark, cfg, noises)
    println("== Sampling ratio GBABS vs GGBS per dataset/noise (Fig 6 data) ==")
    println(f"${"Dataset"}%-8s" + noises.map(nz => f"${s"${(nz * 100).toInt}% GBABS/GGBS"}%16s").mkString)
    repro.data.DatasetGen.specs.foreach { spec =>
      println(f"${spec.id}%-8s" + noises.map { nz =>
        val (g, b) = ratios((spec.id, nz)); f"${f"$g%.2f/$b%.2f"}%16s"
      }.mkString)
    }
    spark.stop()
  }
}

/** Imbalanced G-mean ranking (the data behind Fig 9(a)). */
object GmeanRanking {
  def main(args: Array[String]): Unit = {
    val spark = JobContext.session("gbabs-gmean")
    val cfg = JobContext.config(args)
    val ranks = Tables.gmeanRanking(spark, cfg)
    println("== Mean rank of DT G-mean across datasets (Fig 9(a) data; 1 = best) ==")
    ranks.toVector.sortBy(_._2).foreach { case (m, r) => println(f"$m%-8s $r%6.2f") }
    spark.stop()
  }
}
