package repro.bench

/** The paper's published numbers (ICDE'21, Tables II, IV–VIII), embedded so
  * every bench prints paper-vs-measured side by side. Values transcribed
  * from the paper text; the CRM/EmbDI F1 cell is garbled in the source
  * ("…1 .8 / 1 .88 / .1 .84") and is kept as printed.
  */
object PaperNumbers {

  val domains: Seq[String] =
    Seq("Rest.", "Cit. 1", "Cit. 2", "Cosm.", "Soft.", "Music", "Beer", "Stocks", "CRM")

  /** Table II: cardA, cardB, arity, train, test. */
  val table2: Map[String, (Int, Int, Int, Int, Int)] = Map(
    "Rest."  -> (533, 331, 6, 567, 189),
    "Cit. 1" -> (2616, 2294, 4, 7417, 2473),
    "Cit. 2" -> (2612, 64263, 4, 17223, 5742),
    "Cosm."  -> (11026, 6443, 3, 327, 81),
    "Soft."  -> (1363, 3226, 3, 6874, 2293),
    "Music"  -> (6907, 55923, 8, 321, 109),
    "Beer"   -> (4345, 3000, 4, 268, 91),
    "Stocks" -> (2768, 21863, 8, 4472, 1117),
    "CRM"    -> (5742, 9683, 12, 440, 220),
  )

  /** Table IV: (domain, provider) -> (IR F1, VAER F1). */
  val table4F1: Map[(String, String), (Double, Double)] = Map(
    ("Rest.", "LSA") -> (0.29, 0.29), ("Rest.", "W2V") -> (0.47, 0.37),
    ("Rest.", "BERT") -> (0.40, 0.41), ("Rest.", "EmbDI") -> (0.37, 0.37),
    ("Cit. 1", "LSA") -> (0.64, 0.68), ("Cit. 1", "W2V") -> (0.46, 0.72),
    ("Cit. 1", "BERT") -> (0.65, 0.69), ("Cit. 1", "EmbDI") -> (0.65, 0.64),
    ("Cit. 2", "LSA") -> (0.70, 0.77), ("Cit. 2", "W2V") -> (0.60, 0.80),
    ("Cit. 2", "BERT") -> (0.63, 0.79), ("Cit. 2", "EmbDI") -> (0.72, 0.80),
    ("Cosm.", "LSA") -> (0.74, 0.76), ("Cosm.", "W2V") -> (0.78, 0.76),
    ("Cosm.", "BERT") -> (0.67, 0.78), ("Cosm.", "EmbDI") -> (0.24, 0.35),
    ("Soft.", "LSA") -> (0.33, 0.39), ("Soft.", "W2V") -> (0.35, 0.36),
    ("Soft.", "BERT") -> (0.37, 0.41), ("Soft.", "EmbDI") -> (0.43, 0.43),
    ("Music", "LSA") -> (0.66, 0.73), ("Music", "W2V") -> (0.69, 0.71),
    ("Music", "BERT") -> (0.77, 0.79), ("Music", "EmbDI") -> (0.42, 0.75),
    ("Beer", "LSA") -> (0.58, 0.62), ("Beer", "W2V") -> (0.58, 0.62),
    ("Beer", "BERT") -> (0.59, 0.67), ("Beer", "EmbDI") -> (0.78, 0.79),
    ("Stocks", "LSA") -> (0.88, 0.90), ("Stocks", "W2V") -> (0.54, 0.62),
    ("Stocks", "BERT") -> (0.78, 0.82), ("Stocks", "EmbDI") -> (0.54, 0.86),
    ("CRM", "LSA") -> (0.79, 0.89), ("CRM", "W2V") -> (0.94, 0.92),
    ("CRM", "BERT") -> (0.71, 0.88), ("CRM", "EmbDI") -> (0.10, 0.84),
  )

  /** Table V: domain -> (VAER F1, DeepER F1, DM F1, DITTO F1). */
  val table5F1: Map[String, (Double, Double, Double, Double)] = Map(
    "Rest."  -> (0.99, 0.97, 0.97, 0.97),
    "Cit. 1" -> (0.99, 0.97, 0.97, 0.99),
    "Cit. 2" -> (0.90, 0.91, 0.94, 0.91),
    "Cosm."  -> (0.91, 0.89, 0.90, 0.86),
    "Soft."  -> (0.63, 0.62, 0.62, 0.71),
    "Music"  -> (0.86, 0.83, 0.88, 0.87),
    "Beer"   -> (0.80, 0.72, 0.72, 0.81),
    "Stocks" -> (0.99, 1.00, 0.99, 0.98),
    "CRM"    -> (0.99, 0.95, 0.97, 0.96),
  )

  /** Table VI: domain -> (repr s, match s, DeepER s, DM s, DITTO s). */
  val table6: Map[String, (Double, Double, Double, Double, Double)] = Map(
    "Rest."  -> (4.37, 2.50, 84.50, 258.79, 93.51),
    "Cit. 1" -> (23.50, 10.14, 549.65, 1022.31, 100.94),
    "Cit. 2" -> (127.84, 23.60, 1145.57, 2318.89, 1523.93),
    "Cosm."  -> (83.10, 1.73, 33.88, 103.12, 84.17),
    "Soft."  -> (21.95, 19.43, 552.26, 986.07, 679.47),
    "Music"  -> (335.32, 1.40, 62.28, 160.15, 64.18),
    "Beer"   -> (57.29, 4.61, 33.61, 58.76, 59.96),
    "Stocks" -> (182.29, 17.29, 836.94, 1509.49, 436.85),
    "CRM"    -> (81.31, 1.88, 40.23, 121.76, 85.83),
  )

  /** Table VII: domain -> (local recall, transf recall, local F1, transf F1). */
  val table7: Map[String, (Double, Double, Double, Double)] = Map(
    "Rest."  -> (1.00, 1.00, 0.97, 0.96),
    "Cit. 1" -> (0.99, 1.00, 0.99, 0.97),
    "Cit. 2" -> (0.91, 0.91, 0.90, 0.90),
    "Cosm."  -> (0.83, 0.83, 0.86, 0.85),
    "Soft."  -> (0.80, 0.79, 0.59, 0.57),
    "Music"  -> (0.79, 0.75, 0.80, 0.78),
    "Beer"   -> (0.86, 0.86, 0.79, 0.77),
    "Stocks" -> (0.79, 0.79, 0.95, 0.97),
    "CRM"    -> (0.81, 0.84, 0.97, 0.98),
  )

  /** Table VIII: domain -> (boot F1, A250 F1, full F1, F1 %, training %). */
  val table8: Map[String, (Double, Double, Double, Double, Double)] = Map(
    "Rest."  -> (0.65, 1.00, 0.97, 1.03, 0.44),
    "Cit. 1" -> (0.89, 0.95, 0.99, 0.96, 0.033),
    "Cit. 2" -> (0.48, 0.74, 0.90, 0.82, 0.014),
    "Cosm."  -> (0.77, 0.82, 0.91, 0.90, 0.76),
    "Soft."  -> (0.31, 0.45, 0.63, 0.71, 0.036),
    "Music"  -> (0.53, 0.81, 0.86, 0.94, 0.76),
    "Beer"   -> (0.52, 0.71, 0.80, 0.89, 0.92),
    "Stocks" -> (0.90, 0.89, 0.99, 0.90, 0.055),
    "CRM"    -> (0.71, 0.82, 0.98, 0.84, 0.56),
  )
}
