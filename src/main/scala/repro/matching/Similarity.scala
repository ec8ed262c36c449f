package repro.matching

import org.apache.spark.sql.Column
import org.apache.spark.sql.functions._

/** Similarity measures used by the matching solutions (pure Scala versions
  * for driver-side use plus Column expressions for DataFrame pipelines).
  */
object Similarity {

  /** Whitespace tokenization, lower-cased, empty tokens dropped. */
  def tokens(s: String): Set[String] =
    if (s == null) Set.empty
    else s.toLowerCase.split("\\s+").iterator.filter(_.nonEmpty).toSet

  /** Jaccard similarity of whitespace token sets; null-safe (null → 0). */
  def tokenJaccard(a: String, b: String): Double = {
    val ta = tokens(a); val tb = tokens(b)
    if (ta.isEmpty || tb.isEmpty) 0.0
    else {
      val inter = ta.intersect(tb).size
      inter.toDouble / (ta.size + tb.size - inter)
    }
  }

  /** Levenshtein similarity 1 − dist/maxLen; null-safe (null → 0). */
  def levenshteinSim(a: String, b: String): Double = {
    if (a == null || b == null || (a.isEmpty && b.isEmpty)) return if (a != null && b != null) 1.0 else 0.0
    val d = levenshteinDistance(a.toLowerCase, b.toLowerCase)
    1.0 - d.toDouble / math.max(a.length, b.length)
  }

  private[matching] def levenshteinDistance(a: String, b: String): Int = {
    if (a.isEmpty) return b.length
    if (b.isEmpty) return a.length
    var prev = Array.tabulate(b.length + 1)(identity)
    var cur  = new Array[Int](b.length + 1)
    var i = 1
    while (i <= a.length) {
      cur(0) = i
      var j = 1
      while (j <= b.length) {
        val cost = if (a.charAt(i - 1) == b.charAt(j - 1)) 0 else 1
        cur(j) = math.min(math.min(cur(j - 1) + 1, prev(j) + 1), prev(j - 1) + cost)
        j += 1
      }
      val t = prev; prev = cur; cur = t
      i += 1
    }
    prev(b.length)
  }

  /** Column expression: Jaccard of whitespace token sets of two string
    * columns (null- and empty-safe, returns 0.0 then).
    */
  def tokenJaccardCol(a: Column, b: Column): Column = {
    def toks(c: Column): Column =
      array_distinct(filter(split(lower(coalesce(c.cast("string"), lit(""))), "\\s+"), t => t =!= ""))
    val ta = toks(a); val tb = toks(b)
    val inter = size(array_intersect(ta, tb))
    val union = size(ta) + size(tb) - inter
    when(union > 0, inter.cast("double") / union.cast("double")).otherwise(lit(0.0))
  }

  /** Column expression: Levenshtein similarity of two string columns. */
  def levenshteinSimCol(a: Column, b: Column): Column = {
    val la = lower(a.cast("string")); val lb = lower(b.cast("string"))
    val maxLen = greatest(length(la), length(lb))
    when(a.isNull || b.isNull, lit(0.0))
      .when(maxLen === 0, lit(1.0))
      .otherwise(lit(1.0) - levenshtein(la, lb).cast("double") / maxLen.cast("double"))
  }

  /** Column expression: null-aware exact-equality similarity (1/0). */
  def equalityCol(a: Column, b: Column): Column =
    when(a.isNotNull && b.isNotNull && a === b, lit(1.0)).otherwise(lit(0.0))

  /** Vocabulary-discounted token Jaccard: models a solution whose learned
    * token weights cover only its training vocabulary. Shared tokens the
    * solution knows count fully, shared tokens it does not know count half
    * (it sees the string equality but has no learned weight for it):
    *
    *   (|A∩B| + |A∩B∩V|) / (2·|A∪B|)
    *
    * Equal to the plain token Jaccard when every shared token is known, and
    * degrading gracefully with the out-of-vocabulary fraction — the
    * mechanism behind train/test gaps on low-vocabulary-similarity splits
    * (Frost, Appendix C.2).
    */
  def tokenJaccardKnown(a: String, b: String, vocab: Set[String]): Double = {
    val ta = tokens(a); val tb = tokens(b)
    if (ta.isEmpty || tb.isEmpty) 0.0
    else {
      val inter = ta.intersect(tb)
      val knownInter = inter.count(vocab.contains)
      val union = ta.size + tb.size - inter.size
      (inter.size + knownInter) / (2.0 * union)
    }
  }

  /** UDF form of [[tokenJaccardKnown]] for DataFrame pipelines. */
  def tokenJaccardKnownUdf(vocab: Set[String]): org.apache.spark.sql.expressions.UserDefinedFunction =
    udf((a: String, b: String) => tokenJaccardKnown(a, b, vocab))
}
