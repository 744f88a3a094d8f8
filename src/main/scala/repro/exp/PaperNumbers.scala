package repro.exp

/** The numbers the paper reports, kept next to our measurements so benches
  * print "paper vs measured" rows and EXPERIMENTS.md can diff shapes.
  * Dataset keys: W-A, A-G, D-A, D-S, A-B (paper column order).
  */
object PaperNumbers {

  val dsKeys: IndexedSeq[String] = IndexedSeq("W-A", "A-G", "D-A", "D-S", "A-B")

  /** Table 1: |R|, |S|, |DUPS|, |Dtest|. */
  val table1: Map[String, (Int, Int, Int, Int)] = Map(
    "W-A" -> (2554, 22074, 1154, 2049),
    "A-G" -> (1363, 3226, 1300, 2293),
    "D-A" -> (2616, 2294, 2224, 2473),
    "D-S" -> (2616, 64263, 5347, 5742),
    "A-B" -> (1081, 1092, 1097, 1916),
    "ML"  -> (100000, 100000, 100000, 2000),
  )

  /** Table 2: method -> ds -> (P, R, F1, RT seconds). */
  val table2: Map[String, Map[String, (Double, Double, Double, Double)]] = Map(
    "Random Forest" -> Map(
      "W-A" -> (96.5, 63.0, 76.2, 1.1), "A-G" -> (84.7, 54.6, 66.3, 1.1),
      "D-A" -> (99.0, 99.1, 99.0, 1.3), "D-S" -> (97.2, 96.3, 96.7, 2.7),
      "A-B" -> (83.9, 52.4, 64.4, 0.9)),
    "JedAI:Schema-based" -> Map(
      "W-A" -> (82.9, 55.2, 66.3, 0.5), "A-G" -> (66.3, 42.3, 51.7, 0.5),
      "D-A" -> (97.8, 93.2, 95.4, 0.6), "D-S" -> (95.3, 77.5, 85.5, 14.0),
      "A-B" -> (88.4, 43.8, 58.5, 0.4)),
    "JedAI:Schema-agnostic" -> Map(
      "W-A" -> (59.0, 75.3, 66.2, 5.3), "A-G" -> (57.6, 64.1, 60.7, 4.5),
      "D-A" -> (99.3, 99.2, 99.3, 1.3), "D-S" -> (94.6, 94.9, 94.7, 30.0),
      "A-B" -> (94.9, 85.6, 90.0, 1.1)),
    "SentenceBERT" -> Map(
      "W-A" -> (87.1, 43.9, 58.0, 87.6), "A-G" -> (73.2, 38.5, 50.4, 7.9),
      "D-A" -> (99.3, 94.3, 96.7, 15.5), "D-S" -> (97.0, 74.4, 84.2, 255.0),
      "A-B" -> (87.6, 20.3, 32.6, 42.0)),
    "PairedFixed" -> Map(
      "W-A" -> (96.6, 71.2, 82.0, 87.6), "A-G" -> (94.9, 52.1, 67.2, 7.9),
      "D-A" -> (99.6, 93.6, 96.5, 15.5), "D-S" -> (98.5, 74.2, 84.6, 255.0),
      "A-B" -> (97.9, 33.0, 49.3, 42.0)),
    "PairedAdapt" -> Map(
      "W-A" -> (96.3, 61.2, 74.4, 87.6), "A-G" -> (91.6, 58.3, 71.1, 7.9),
      "D-A" -> (99.7, 98.0, 98.8, 15.5), "D-S" -> (98.2, 85.8, 91.6, 255.0),
      "A-B" -> (97.6, 23.4, 37.7, 42.0)),
    "Rules" -> Map(
      "W-A" -> (93.7, 77.3, 84.7, 9.2), "A-G" -> (85.4, 75.2, 79.9, 5.6),
      "D-A" -> (99.4, 99.2, 99.3, 15.1), "D-S" -> (96.3, 98.0, 97.1, 26.0),
      "A-B" -> (96.3, 87.2, 91.6, 15.0)),
    "DIAL" -> Map(
      "W-A" -> (94.9, 85.2, 89.8, 88.3), "A-G" -> (87.4, 77.4, 82.1, 8.0),
      "D-A" -> (99.6, 98.6, 99.1, 15.6), "D-S" -> (97.5, 96.1, 96.8, 257.0),
      "A-B" -> (97.8, 87.4, 92.3, 42.0)),
  )

  /** Table 3 (multilingual, all-pairs): method -> (P, R, F1). */
  val table3: Map[String, (Double, Double, Double)] = Map(
    "PairedFixed" -> (81.2, 56.8, 66.9),
    "PairedAdapt" -> (94.8, 31.6, 47.4),
    "DIAL"        -> (92.2, 62.3, 74.3),
  )

  /** Table 4: (negatives, metric) -> ds -> value. Metrics: recall/test/all. */
  val table4: Map[(String, String), Map[String, Double]] = Map(
    ("Labeled", "recall") -> Map("W-A" -> 80.94, "A-G" -> 76.54, "D-A" -> 99.02, "D-S" -> 93.47, "A-B" -> 66.45),
    ("Random", "recall")  -> Map("W-A" -> 92.20, "A-G" -> 88.36, "D-A" -> 98.98, "D-S" -> 97.30, "A-B" -> 92.50),
    ("Labeled", "test")   -> Map("W-A" -> 75.47, "A-G" -> 67.93, "D-A" -> 98.75, "D-S" -> 93.32, "A-B" -> 69.74),
    ("Random", "test")    -> Map("W-A" -> 82.97, "A-G" -> 69.21, "D-A" -> 98.79, "D-S" -> 94.83, "A-B" -> 88.81),
    ("Labeled", "all")    -> Map("W-A" -> 85.36, "A-G" -> 78.78, "D-A" -> 99.14, "D-S" -> 95.49, "A-B" -> 78.12),
    ("Random", "all")     -> Map("W-A" -> 89.80, "A-G" -> 82.07, "D-A" -> 99.13, "D-S" -> 96.81, "A-B" -> 92.31),
  )

  /** Table 5: (objective, metric test/all) -> ds -> F1. */
  val table5: Map[(String, String), Map[String, Double]] = Map(
    ("Classification", "test") -> Map("W-A" -> 79.63, "A-G" -> 67.40, "D-A" -> 98.75, "D-S" -> 93.28, "A-B" -> 70.90),
    ("Triplet", "test")        -> Map("W-A" -> 80.94, "A-G" -> 68.71, "D-A" -> 98.79, "D-S" -> 94.38, "A-B" -> 87.21),
    ("Contrastive", "test")    -> Map("W-A" -> 82.97, "A-G" -> 69.21, "D-A" -> 98.79, "D-S" -> 94.83, "A-B" -> 88.81),
    ("Classification", "all")  -> Map("W-A" -> 84.88, "A-G" -> 79.17, "D-A" -> 99.05, "D-S" -> 95.15, "A-B" -> 76.03),
    ("Triplet", "all")         -> Map("W-A" -> 87.72, "A-G" -> 81.04, "D-A" -> 99.06, "D-S" -> 96.48, "A-B" -> 91.95),
    ("Contrastive", "all")     -> Map("W-A" -> 89.80, "A-G" -> 82.07, "D-A" -> 99.13, "D-S" -> 96.81, "A-B" -> 92.31),
  )

  /** Table 6: (size, metric recall/all) -> ds -> value. */
  val table6: Map[(String, String), Map[String, Double]] = Map(
    ("Small", "recall")  -> Map("W-A" -> 55.78, "A-G" -> 79.31, "D-A" -> 98.98, "D-S" -> 92.55, "A-B" -> 71.92),
    ("Medium", "recall") -> Map("W-A" -> 92.20, "A-G" -> 88.36, "D-A" -> 98.98, "D-S" -> 97.30, "A-B" -> 86.54),
    ("Large", "recall")  -> Map("W-A" -> 94.60, "A-G" -> 89.90, "D-A" -> 99.09, "D-S" -> 97.85, "A-B" -> 92.50),
    ("Small", "all")     -> Map("W-A" -> 70.19, "A-G" -> 80.09, "D-A" -> 99.08, "D-S" -> 95.01, "A-B" -> 82.68),
    ("Medium", "all")    -> Map("W-A" -> 89.80, "A-G" -> 82.07, "D-A" -> 99.13, "D-S" -> 96.81, "A-B" -> 90.49),
    ("Large", "all")     -> Map("W-A" -> 90.80, "A-G" -> 81.41, "D-A" -> 99.19, "D-S" -> 97.00, "A-B" -> 92.31),
  )

  /** Table 7: (N, metric test/all) -> ds -> F1. */
  val table7: Map[(Int, String), Map[String, Double]] = Map(
    (1, "test") -> Map("W-A" -> 83.16, "A-G" -> 68.62, "D-A" -> 98.52, "D-S" -> 94.38, "A-B" -> 88.56),
    (3, "test") -> Map("W-A" -> 82.97, "A-G" -> 69.21, "D-A" -> 98.79, "D-S" -> 94.83, "A-B" -> 88.81),
    (5, "test") -> Map("W-A" -> 83.51, "A-G" -> 70.85, "D-A" -> 98.71, "D-S" -> 94.76, "A-B" -> 88.31),
    (1, "all")  -> Map("W-A" -> 89.85, "A-G" -> 80.82, "D-A" -> 99.20, "D-S" -> 96.21, "A-B" -> 92.22),
    (3, "all")  -> Map("W-A" -> 89.80, "A-G" -> 82.07, "D-A" -> 99.13, "D-S" -> 96.81, "A-B" -> 92.31),
    (5, "all")  -> Map("W-A" -> 90.19, "A-G" -> 82.14, "D-A" -> 99.10, "D-S" -> 96.66, "A-B" -> 92.79),
  )

  /** Table 8: strategy -> ds -> all-pairs F1. */
  val table8: Map[String, Map[String, Double]] = Map(
    "Random"      -> Map("W-A" -> 58.8, "A-G" -> 63.0, "D-A" -> 97.8, "D-S" -> 89.5, "A-B" -> 78.2),
    "Greedy"      -> Map("W-A" -> 78.2, "A-G" -> 74.9, "D-A" -> 90.0, "D-S" -> 77.9, "A-B" -> 79.9),
    "Partition-2" -> Map("W-A" -> 90.7, "A-G" -> 82.2, "D-A" -> 99.1, "D-S" -> 96.8, "A-B" -> 93.2),
    "Partition-4" -> Map("W-A" -> 85.4, "A-G" -> 74.5, "D-A" -> 99.0, "D-S" -> 95.0, "A-B" -> 90.6),
    "QBC"         -> Map("W-A" -> 79.1, "A-G" -> 75.2, "D-A" -> 98.8, "D-S" -> 94.6, "A-B" -> 83.9),
    "BADGE"       -> Map("W-A" -> 90.5, "A-G" -> 82.8, "D-A" -> 99.1, "D-S" -> 96.8, "A-B" -> 92.5),
    "Uncertainty" -> Map("W-A" -> 89.8, "A-G" -> 82.1, "D-A" -> 99.1, "D-S" -> 96.8, "A-B" -> 92.3),
  )

  /** Table 9: operation -> ds -> seconds (10th AL round). */
  val table9: Map[String, Map[String, Double]] = Map(
    "Train Matcher"        -> Map("W-A" -> 109.8, "A-G" -> 71.5, "D-A" -> 147.0, "D-S" -> 110.1, "A-B" -> 161.9),
    "Train Committee"      -> Map("W-A" -> 102.0, "A-G" -> 132.2, "D-A" -> 141.2, "D-S" -> 145.7, "A-B" -> 35.3),
    "Indexing & Retrieval" -> Map("W-A" -> 1.8, "A-G" -> 0.4, "D-A" -> 0.5, "D-S" -> 4.8, "A-B" -> 0.2),
    "Selection"            -> Map("W-A" -> 73.0, "A-G" -> 6.0, "D-A" -> 8.9, "D-S" -> 221.9, "A-B" -> 34.7),
  )

  /** Table 10: committee size -> ds -> testing time (seconds). */
  val table10: Map[Int, Map[String, Double]] = Map(
    1  -> Map("W-A" -> 87.6, "A-G" -> 7.9, "D-A" -> 15.5, "D-S" -> 254.8, "A-B" -> 41.8),
    3  -> Map("W-A" -> 88.3, "A-G" -> 8.0, "D-A" -> 15.6, "D-S" -> 256.7, "A-B" -> 42.0),
    10 -> Map("W-A" -> 90.8, "A-G" -> 8.2, "D-A" -> 15.8, "D-S" -> 263.1, "A-B" -> 42.0),
  )

  /** Short key for a generated dataset name. */
  def key(dsName: String): String = dsName match {
    case "Walmart-Amazon" => "W-A"
    case "Amazon-Google"  => "A-G"
    case "DBLP-ACM"       => "D-A"
    case "DBLP-Scholar"   => "D-S"
    case "Abt-Buy"        => "A-B"
    case "MultiLingual"   => "ML"
    case other            => other
  }
}
