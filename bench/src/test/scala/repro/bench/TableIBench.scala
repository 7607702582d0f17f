package repro.bench

import repro.SparkSpec
import repro.exp.{BenchConfig, Tables}

/** Regenerates Table I (dataset details) at bench scale and prints it next
  * to the paper's originals. See EXPERIMENTS.md for the recorded output.
  */
class TableIBench extends SparkSpec {

  private val cfg = BenchConfig()

  test("Table I: dataset details at bench scale") {
    val rows = Tables.tableI(cfg)
    println("\n== Table I: Details of Datasets (ours @ bench caps | paper) ==")
    println(Tables.formatTableI(rows))

    assert(rows.size == 13)
    rows.foreach { r =>
      assert(r.n <= cfg.maxN && r.p <= cfg.maxP)
      assert(r.n == math.min(r.paperN, cfg.maxN))
      assert(r.p == math.min(r.paperP, cfg.maxP))
    }
    // imbalance orientation survives scaling: high-IR sets stay high-IR
    val byId = rows.map(r => r.id -> r).toMap
    assert(byId("S11").ir > byId("S4").ir)
    assert(byId("S6").ir > byId("S2").ir)
  }
}
