package repro.eval

/** Clustering quality metrics used in the paper's §4.3 / appendix C.2.
  *
  * Average precision/recall follows the TECTONIC methodology the paper
  * adopts: each ground-truth community c is matched to the output cluster c'
  * with the largest intersection; precision = |c∩c'|/|c'|, recall = |c∩c'|/|c|,
  * averaged over the top-K ground-truth communities. A cluster may match
  * multiple or no communities.
  */
object Metrics {

  final case class PrecisionRecall(precision: Double, recall: Double) {
    def f1: Double =
      if (precision + recall == 0) 0.0 else 2 * precision * recall / (precision + recall)
  }

  /** @param communities ground-truth communities (vertex id arrays), already
    *                    ordered by decreasing size (take the top `topK`)
    * @param clusters    output cluster id per vertex
    */
  def averagePrecisionRecall(communities: Seq[Array[Int]], clusters: Array[Int],
                             topK: Int = 5000): PrecisionRecall = {
    val clusterSize = new java.util.HashMap[Int, Int]()
    clusters.foreach(c => clusterSize.merge(c, 1, Integer.sum))
    val top = communities.take(topK)
    var pSum = 0.0; var rSum = 0.0
    top.foreach { comm =>
      // Cluster with the largest intersection with this community.
      val freq = new java.util.HashMap[Int, Int]()
      comm.foreach(v => freq.merge(clusters(v), 1, Integer.sum))
      var bestC = -1; var bestI = -1
      freq.forEach { (c, cnt) => if (cnt > bestI) { bestI = cnt; bestC = c } }
      pSum += bestI.toDouble / clusterSize.get(bestC)
      rSum += bestI.toDouble / comm.length
    }
    PrecisionRecall(pSum / top.length, rSum / top.length)
  }

  /** Contingency table of two partitions over the same vertex set. */
  private def contingency(a: Array[Int], b: Array[Int]): (Array[Long], Array[Long], Map[(Int, Int), Long]) = {
    require(a.length == b.length)
    val aN = repro.core.Objective.normalize(a)
    val bN = repro.core.Objective.normalize(b)
    val aSize = new Array[Long](aN.max + 1)
    val bSize = new Array[Long](bN.max + 1)
    val joint = scala.collection.mutable.HashMap.empty[(Int, Int), Long]
    var i = 0
    while (i < aN.length) {
      aSize(aN(i)) += 1; bSize(bN(i)) += 1
      val k = (aN(i), bN(i))
      joint(k) = joint.getOrElse(k, 0L) + 1
      i += 1
    }
    (aSize, bSize, joint.toMap)
  }

  private def choose2(x: Long): Double = x.toDouble * (x - 1) / 2

  /** Adjusted Rand Index of two partitions. */
  def ari(a: Array[Int], b: Array[Int]): Double = {
    val (aSize, bSize, joint) = contingency(a, b)
    val n       = a.length.toLong
    val sumIJ   = joint.values.map(choose2).sum
    val sumA    = aSize.map(choose2).sum
    val sumB    = bSize.map(choose2).sum
    val expected = sumA * sumB / choose2(n)
    val maxIdx   = (sumA + sumB) / 2
    if (maxIdx == expected) 1.0 else (sumIJ - expected) / (maxIdx - expected)
  }

  /** Normalized Mutual Information (arithmetic-mean normalization). */
  def nmi(a: Array[Int], b: Array[Int]): Double = {
    val (aSize, bSize, joint) = contingency(a, b)
    val n = a.length.toDouble
    def entropy(sizes: Array[Long]): Double =
      -sizes.filter(_ > 0).map { s => val p = s / n; p * math.log(p) }.sum
    val hA = entropy(aSize); val hB = entropy(bSize)
    var mi = 0.0
    joint.foreach { case ((i, j), nij) =>
      val p = nij / n
      mi += p * math.log(p * n * n / (aSize(i).toDouble * bSize(j)))
    }
    if (hA == 0 && hB == 0) 1.0
    else if (mi <= 0) 0.0
    else mi / ((hA + hB) / 2)
  }
}
