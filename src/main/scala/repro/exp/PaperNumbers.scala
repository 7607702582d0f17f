package repro.exp

/** Numbers reported by the paper, kept next to our measurements so every
  * bench prints paper-vs-measured rows (EXPERIMENTS.md records both).
  */
object PaperNumbers {

  /** Table II: testing Accuracy of DT per dataset per sampling method. */
  val tableII: Vector[(String, Map[String, Double])] = Vector(
    "S1"  -> Map("GBABS" -> 0.8577, "GGBS" -> 0.8145, "SRS" -> 0.7968, "None" -> 0.8145),
    "S2"  -> Map("GBABS" -> 0.7351, "GGBS" -> 0.6936, "SRS" -> 0.6825, "None" -> 0.6902),
    "S3"  -> Map("GBABS" -> 0.8851, "GGBS" -> 0.8737, "SRS" -> 0.8763, "None" -> 0.8744),
    "S4"  -> Map("GBABS" -> 0.8721, "GGBS" -> 0.8338, "SRS" -> 0.8345, "None" -> 0.8344),
    "S5"  -> Map("GBABS" -> 0.8709, "GGBS" -> 0.8528, "SRS" -> 0.8638, "None" -> 0.8728),
    "S6"  -> Map("GBABS" -> 0.9667, "GGBS" -> 0.9606, "SRS" -> 0.9592, "None" -> 0.9646),
    "S7"  -> Map("GBABS" -> 0.9348, "GGBS" -> 0.8969, "SRS" -> 0.8913, "None" -> 0.8965),
    "S8"  -> Map("GBABS" -> 0.9009, "GGBS" -> 0.8892, "SRS" -> 0.8925, "None" -> 0.8950),
    "S9"  -> Map("GBABS" -> 0.9761, "GGBS" -> 0.9576, "SRS" -> 0.9662, "None" -> 0.9680),
    "S10" -> Map("GBABS" -> 0.8396, "GGBS" -> 0.8152, "SRS" -> 0.8152, "None" -> 0.8129),
    "S11" -> Map("GBABS" -> 0.9994, "GGBS" -> 0.9983, "SRS" -> 0.9995, "None" -> 0.9998),
    "S12" -> Map("GBABS" -> 0.9693, "GGBS" -> 0.9684, "SRS" -> 0.9675, "None" -> 0.9750),
    "S13" -> Map("GBABS" -> 0.8846, "GGBS" -> 0.8843, "SRS" -> 0.8826, "None" -> 0.8843),
  )

  /** Table III: Wilcoxon two-sided p-values for GBABS-DT vs the others. */
  val tableIII: Map[String, Double] =
    Map("GGBS" -> 0.000244, "SRS" -> 0.000488, "None" -> 0.010498)

  /** Table IV: average testing Accuracy over the 13 datasets per
    * (learner, method, noise ratio).
    */
  val tableIV: Map[(String, String, Double), Double] = {
    val rows: Vector[(String, String, Vector[Double])] = Vector(
      ("DT", "GBABS", Vector(0.8598, 0.8004, 0.6955, 0.5991, 0.5133)),
      ("DT", "GGBS", Vector(0.8063, 0.7206, 0.6036, 0.5126, 0.4433)),
      ("DT", "SRS", Vector(0.8079, 0.7239, 0.5998, 0.5109, 0.4409)),
      ("DT", "None", Vector(0.8097, 0.7239, 0.6037, 0.5126, 0.4431)),
      ("XGBoost", "GBABS", Vector(0.8719, 0.8243, 0.7325, 0.6384, 0.5449)),
      ("XGBoost", "GGBS", Vector(0.8658, 0.8165, 0.7155, 0.6200, 0.5295)),
      ("XGBoost", "SRS", Vector(0.8643, 0.8126, 0.7106, 0.6100, 0.5206)),
      ("XGBoost", "None", Vector(0.8673, 0.8170, 0.7155, 0.6200, 0.5293)),
      ("LightGBM", "GBABS", Vector(0.8660, 0.8166, 0.7338, 0.6422, 0.5515)),
      ("LightGBM", "GGBS", Vector(0.8690, 0.8219, 0.7285, 0.6359, 0.5414)),
      ("LightGBM", "SRS", Vector(0.8669, 0.8184, 0.7203, 0.6257, 0.5303)),
      ("LightGBM", "None", Vector(0.8685, 0.8222, 0.7281, 0.6361, 0.5416)),
      ("kNN", "GBABS", Vector(0.8642, 0.8213, 0.7262, 0.6315, 0.5432)),
      ("kNN", "GGBS", Vector(0.8633, 0.8155, 0.7138, 0.6096, 0.5173)),
      ("kNN", "SRS", Vector(0.8622, 0.8141, 0.7089, 0.6061, 0.5158)),
      ("kNN", "None", Vector(0.8636, 0.8159, 0.7143, 0.6097, 0.5177)),
      ("RF", "GBABS", Vector(0.8732, 0.8277, 0.7340, 0.6430, 0.5501)),
      ("RF", "GGBS", Vector(0.8693, 0.8194, 0.7211, 0.6199, 0.5253)),
      ("RF", "SRS", Vector(0.8693, 0.8200, 0.7183, 0.6193, 0.5250)),
      ("RF", "None", Vector(0.8698, 0.8203, 0.7206, 0.6196, 0.5246)),
    )
    (for {
      (learner, method, accs) <- rows
      (acc, i) <- accs.zipWithIndex
    } yield (learner, method, Tables.noiseRatios(i)) -> acc).toMap
  }
}
