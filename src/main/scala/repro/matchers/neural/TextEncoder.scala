package repro.matchers.neural

import repro.core.Tokenize

/** Deterministic stand-in for pre-trained word embeddings (fastText /
  * DistilBERT in the paper, §4.2.2).
  *
  * Tokens are embedded as the L2-normalized sum of hashed character-3-gram
  * vectors — robust to small misspellings/perturbations, like subword
  * embeddings. "External semantic knowledge" is modeled by a normalization
  * dictionary applied before hashing: English synonyms, slang respellings,
  * and German→English translations. The dictionary deliberately has **no
  * Dutch coverage** — reproducing the pretrained-model bias behind the
  * paper's Cameras FN example ("Prijzen" not recognized as "Prices") — and
  * deliberately conflates near-synonym verbs (loves≈likes), reproducing the
  * iTunes-Amazon FP example ("Tequila Loves Me" vs "Likes Me").
  */
object TextEncoder {
  val dim = 48

  /** The "pretrained knowledge" of the simulated language model. */
  val synonyms: Map[String, String] = Map(
    // near-synonym conflations (the embedding-space failure mode of §5.3.3)
    "loves" -> "like", "likes" -> "like", "love" -> "like", "lovin" -> "like",
    "effective" -> "efficient", "efficiently" -> "efficient",
    "extensible" -> "scalable", "adaptable" -> "adaptive",
    "resilient" -> "robust", "decentralized" -> "distributed",
    "approximative" -> "approximate",
    // slang / alternative orthography (rap titles)
    "luv" -> "like", "4" -> "for", "tha" -> "the", "gurl" -> "girl",
    "thru" -> "through", "cheddar" -> "money", "skreet" -> "street",
    // German -> English translations (covered language)
    "schwarz" -> "black", "weiss" -> "white", "silber" -> "silver", "rot" -> "red",
    "kamera" -> "camera", "digitalkamera" -> "camera", "kompaktkamera" -> "camera",
    "schuhe" -> "shoes", "turnschuhe" -> "sneakers", "laufschuhe" -> "shoes",
    "preise" -> "prices", "preis" -> "price", "angebot" -> "deals",
    "kaufen" -> "buy", "testbericht" -> "review", "guenstig" -> "cheap",
    // Dutch: intentionally ABSENT (zwart, prijzen, kopen, schoenen, ...)
  )

  def normalize(token: String): String = synonyms.getOrElse(token, token)

  // SplitMix64: deterministic pseudo-random stream from a gram's hash.
  private def splitmix(seed0: Long): () => Long = {
    var seed = seed0
    () => {
      seed += 0x9E3779B97F4A7C15L
      var z = seed
      z = (z ^ (z >>> 30)) * 0xBF58476D1CE4E5B9L
      z = (z ^ (z >>> 27)) * 0x94D049BB133111EBL
      z ^ (z >>> 31)
    }
  }

  private val cache = new java.util.concurrent.ConcurrentHashMap[String, Array[Double]]()

  /** Embedding of one token: normalized sum of its char-3-gram hash vectors. */
  def tokenVec(tokenRaw: String): Array[Double] = {
    val token = normalize(tokenRaw)
    val hit = cache.get(token)
    if (hit != null) return hit
    val v = new Array[Double](dim)
    for (g <- Tokenize.charNGrams(token)) {
      val next = splitmix(g.hashCode.toLong * 0x5DEECE66DL + 11L)
      var i = 0
      while (i < dim) { v(i) += (next() >>> 11).toDouble / (1L << 53) * 2 - 1; i += 1 }
    }
    val n = math.sqrt(v.map(x => x * x).sum)
    val out = if (n == 0) v else v.map(_ / n)
    cache.put(token, out)
    out
  }

  /** Mean-pooled, L2-normalized embedding of a text. Zero vector for empty. */
  def embed(text: String): Array[Double] = {
    val toks = Tokenize.words(text)
    val v = new Array[Double](dim)
    if (toks.isEmpty) return v
    for (t <- toks; tv = tokenVec(t)) {
      var i = 0
      while (i < dim) { v(i) += tv(i); i += 1 }
    }
    val n = math.sqrt(v.map(x => x * x).sum)
    if (n == 0) v else v.map(_ / n)
  }

  def cos(a: Array[Double], b: Array[Double]): Double = {
    var s = 0.0; var i = 0
    while (i < a.length) { s += a(i) * b(i); i += 1 }
    s
  }

  /** Whole-text embedding cosine. */
  def textCos(a: String, b: String): Double = {
    val c = cos(embed(a), embed(b))
    if (c.isNaN) 0.0 else c
  }

  /** Symmetric token-alignment score: mean over each side's tokens of the
    * best cosine against the other side's tokens (the attention/alignment
    * mechanism of HierMatcher/MCAN, reduced to its similarity core).
    * 0 when either side has no tokens.
    */
  def align(a: String, b: String): Double = {
    val ta = Tokenize.words(a).map(tokenVec)
    val tb = Tokenize.words(b).map(tokenVec)
    if (ta.isEmpty || tb.isEmpty) return 0.0
    def side(xs: Array[Array[Double]], ys: Array[Array[Double]]): Double =
      xs.map(x => ys.map(y => cos(x, y)).max).sum / xs.length
    (side(ta, tb) + side(tb, ta)) / 2
  }

  /** Jaccard over dictionary-normalized token sets — what token-level
    * "semantic" overlap looks like to the simulated language model.
    */
  def normJaccard(a: String, b: String): Double = {
    val sa = Tokenize.words(a).map(normalize).toSet
    val sb = Tokenize.words(b).map(normalize).toSet
    if (sa.isEmpty && sb.isEmpty) 1.0
    else if (sa.isEmpty || sb.isEmpty) 0.0
    else sa.intersect(sb).size.toDouble / sa.union(sb).size
  }
}
