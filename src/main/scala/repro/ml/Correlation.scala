package repro.ml

/** Attribute-correlation clustering (paper Section 3.1, "Clustering
  * Attributes based on Correlations").
  *
  * The paper uses VARCLUS; any method that groups strongly associated
  * attributes works (their words). We compute a pairwise association
  * matrix on the driver-local sample — |Pearson| for numeric/numeric,
  * Cramér's V for categorical/categorical, the correlation ratio η for
  * mixed pairs — and single-link cluster attributes whose association
  * exceeds a threshold. One representative per cluster survives.
  */
object Correlation {

  /** Association in [0, 1] between attributes `i` and `j` of the sample. */
  def association(sample: LocalSample, i: Int, j: Int): Double = {
    val ai = sample.attrs(i); val aj = sample.attrs(j)
    (ai.numeric, aj.numeric) match {
      case (true, true)   => math.abs(pearson(sample.numericValues(i), sample.numericValues(j)))
      case (false, false) => cramersV(sample.categoricalValues(i), sample.categoricalValues(j))
      case (true, false)  => correlationRatio(sample.categoricalValues(j), sample.numericValues(i))
      case (false, true)  => correlationRatio(sample.categoricalValues(i), sample.numericValues(j))
    }
  }

  def pearson(xs: Vector[Double], ys: Vector[Double]): Double = {
    val pairs = xs.zip(ys).filterNot { case (a, b) => a.isNaN || b.isNaN }
    val n = pairs.size
    if (n < 3) return 0.0
    val mx = pairs.map(_._1).sum / n; val my = pairs.map(_._2).sum / n
    var sxy = 0.0; var sxx = 0.0; var syy = 0.0
    pairs.foreach { case (x, y) =>
      sxy += (x - mx) * (y - my); sxx += (x - mx) * (x - mx); syy += (y - my) * (y - my)
    }
    if (sxx <= 0 || syy <= 0) 0.0 else sxy / math.sqrt(sxx * syy)
  }

  /** Cramér's V from the contingency table of two categorical columns. */
  def cramersV(xs: Vector[String], ys: Vector[String]): Double = {
    val pairs = xs.zip(ys).filter { case (a, b) => a != null && b != null }
    val n = pairs.size
    if (n < 3) return 0.0
    val xCats = pairs.map(_._1).distinct
    val yCats = pairs.map(_._2).distinct
    if (xCats.size < 2 || yCats.size < 2) return 0.0
    val obs = pairs.groupBy(identity).map { case (k, v) => k -> v.size.toDouble }
    val xTot = pairs.groupBy(_._1).map { case (k, v) => k -> v.size.toDouble }
    val yTot = pairs.groupBy(_._2).map { case (k, v) => k -> v.size.toDouble }
    var chi2 = 0.0
    for (x <- xCats; y <- yCats) {
      val e = xTot(x) * yTot(y) / n
      val o = obs.getOrElse((x, y), 0.0)
      if (e > 0) chi2 += (o - e) * (o - e) / e
    }
    val k = math.min(xCats.size, yCats.size) - 1
    if (k <= 0) 0.0 else math.min(1.0, math.sqrt(chi2 / (n * k)))
  }

  /** Correlation ratio η: how much of the numeric variance the categories
    * explain — the standard mixed-pair association.
    */
  def correlationRatio(cats: Vector[String], nums: Vector[Double]): Double = {
    val pairs = cats.zip(nums).filter { case (c, v) => c != null && !v.isNaN }
    val n = pairs.size
    if (n < 3) return 0.0
    val mean = pairs.map(_._2).sum / n
    val ssTot = pairs.map(p => (p._2 - mean) * (p._2 - mean)).sum
    if (ssTot <= 0) return 0.0
    val ssBetween = pairs.groupBy(_._1).values.map { g =>
      val m = g.map(_._2).sum / g.size
      g.size * (m - mean) * (m - mean)
    }.sum
    math.sqrt(math.min(1.0, ssBetween / ssTot))
  }

  /** Single-link clusters of attribute indices whose pairwise association
    * exceeds `threshold` (union–find), in input order.
    */
  def cluster(sample: LocalSample, attrIdx: Seq[Int], threshold: Double): Seq[Seq[Int]] = {
    val parent = scala.collection.mutable.Map(attrIdx.map(i => i -> i): _*)
    def find(x: Int): Int = if (parent(x) == x) x else { val r = find(parent(x)); parent(x) = r; r }
    def union(a: Int, b: Int): Unit = { val (ra, rb) = (find(a), find(b)); if (ra != rb) parent(ra) = rb }
    for {
      (i, ii) <- attrIdx.zipWithIndex
      j <- attrIdx.drop(ii + 1)
      if association(sample, i, j) >= threshold
    } union(i, j)
    attrIdx.groupBy(find).values.toSeq.sortBy(_.head)
  }
}
