package repro.bench

/** Reference numbers transcribed from the paper's tables, printed next to
  * our measured numbers so the shape can be diffed (see EXPERIMENTS.md).
  */
object PaperNumbers {

  /** Table III: (dataset, system) -> (localP, localR, localF1, globalP, globalR, globalF1, gainPct). */
  val table3: Map[(String, String), (Double, Double, Double, Double, Double, Double, Double)] = Map(
    ("D1", "NP Chunker")     -> (0.30, 0.58, 0.40, 0.81, 0.63, 0.71, 77.5),
    ("D1", "TwitterNLP")     -> (0.65, 0.47, 0.55, 0.80, 0.66, 0.72, 36.4),
    ("D1", "Aguilar et al.") -> (0.76, 0.55, 0.64, 0.87, 0.66, 0.75, 17.3),
    ("D1", "BERTweet")       -> (0.66, 0.49, 0.56, 0.84, 0.66, 0.74, 32.1),
    ("D2", "NP Chunker")     -> (0.40, 0.47, 0.43, 0.59, 0.62, 0.60, 39.5),
    ("D2", "TwitterNLP")     -> (0.33, 0.52, 0.41, 0.71, 0.55, 0.62, 51.2),
    ("D2", "Aguilar et al.") -> (0.63, 0.57, 0.60, 0.69, 0.67, 0.68, 13.3),
    ("D2", "BERTweet")       -> (0.56, 0.51, 0.53, 0.65, 0.64, 0.64, 20.8),
    ("D3", "NP Chunker")     -> (0.59, 0.54, 0.56, 0.71, 0.66, 0.68, 21.4),
    ("D3", "TwitterNLP")     -> (0.75, 0.64, 0.69, 0.88, 0.71, 0.78, 13.04),
    ("D3", "Aguilar et al.") -> (0.77, 0.64, 0.70, 0.82, 0.77, 0.794, 13.6),
    ("D3", "BERTweet")       -> (0.77, 0.63, 0.69, 0.83, 0.82, 0.83, 20.3),
    ("D4", "NP Chunker")     -> (0.47, 0.59, 0.52, 0.83, 0.73, 0.77, 48.1),
    ("D4", "TwitterNLP")     -> (0.67, 0.41, 0.52, 0.89, 0.64, 0.74, 42.3),
    ("D4", "Aguilar et al.") -> (0.82, 0.61, 0.69, 0.88, 0.75, 0.81, 17.4),
    ("D4", "BERTweet")       -> (0.69, 0.58, 0.62, 0.81, 0.76, 0.78, 26.1),
    ("WNUT17", "NP Chunker")     -> (0.42, 0.35, 0.39, 0.63, 0.35, 0.44, 12.8),
    ("WNUT17", "TwitterNLP")     -> (0.35, 0.42, 0.39, 0.65, 0.52, 0.58, 48.7),
    ("WNUT17", "Aguilar et al.") -> (0.68, 0.47, 0.56, 0.72, 0.50, 0.59, 5.4),
    ("WNUT17", "BERTweet")       -> (0.61, 0.43, 0.51, 0.73, 0.48, 0.58, 13.7),
    ("BTC", "NP Chunker")     -> (0.46, 0.51, 0.48, 0.66, 0.52, 0.58, 20.8),
    ("BTC", "TwitterNLP")     -> (0.69, 0.43, 0.53, 0.74, 0.45, 0.56, 5.7),
    ("BTC", "Aguilar et al.") -> (0.75, 0.56, 0.64, 0.77, 0.59, 0.67, 4.7),
    ("BTC", "BERTweet")       -> (0.63, 0.50, 0.56, 0.69, 0.58, 0.63, 12.5),
  )

  /** Table IV: dataset -> ((Globalizer P,R,F1), (HIRE-NER P,R,F1)). */
  val table4: Map[String, ((Double, Double, Double), (Double, Double, Double))] = Map(
    "D1"     -> ((0.87, 0.66, 0.75), (0.65, 0.62, 0.63)),
    "D2"     -> ((0.69, 0.67, 0.68), (0.46, 0.56, 0.51)),
    "D3"     -> ((0.82, 0.77, 0.79), (0.75, 0.73, 0.74)),
    "D4"     -> ((0.88, 0.75, 0.81), (0.58, 0.68, 0.61)),
    "WNUT17" -> ((0.72, 0.50, 0.59), (0.50, 0.49, 0.50)),
    "BTC"    -> ((0.77, 0.59, 0.67), (0.60, 0.49, 0.54)),
  )

  /** Table II: system -> (embedding size label, validation F1). */
  val table2: Map[String, (String, Double)] = Map(
    "NP Chunker"     -> ("6+1", 0.936),
    "TwitterNLP"     -> ("6+1", 0.936),
    "Aguilar et al." -> ("100+1", 0.908),
    "BERTweet"       -> ("300+1", 0.941),
  )

  /** Table I sizes (the paper's table is partially garbled in our source;
    * tweet counts are the legible column, entity counts for D1/D4/D5 are
    * legible, the streaming total 2306 entities comes from the error
    * analysis).
    */
  val table1Tweets: Map[String, Int] = Map(
    "D1" -> 1000, "D2" -> 2000, "D3" -> 3000, "D4" -> 6000,
    "D5" -> 38000, "WNUT17" -> 1287, "BTC" -> 9553)

  /** Paper summary gains (Sec. VI-A). */
  val avgGainAll = 25.61
  val avgGainStreaming = 30.29
  val avgGainNonStreaming = 15.53
  val avgGainPerSystem: Map[String, Double] = Map(
    "NP Chunker" -> 36.69, "TwitterNLP" -> 31.06,
    "Aguilar et al." -> 11.91, "BERTweet" -> 20.66)
}
