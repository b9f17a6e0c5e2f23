package repro.cluster

import scala.collection.mutable

/** Average-linkage hierarchical agglomerative clustering over a sparse
  * similarity graph (the clustering engine behind the Galárraga-style
  * baselines and CESI/SIST stand-ins).
  *
  * Pairs absent from `sims` have similarity 0, so the average linkage
  * between clusters C1, C2 is (sum of provided cross similarities) /
  * (|C1| * |C2|). Merging stops when no cluster pair reaches `threshold`.
  * Similarity pairs are produced by Spark (blocked pair generation); the
  * merge loop itself is a driver-side algorithm, which is fine because the
  * blocked pair list is orders of magnitude smaller than the input data.
  */
object Hac {

  /** @return element -> cluster id (cluster ids are arbitrary but stable). */
  def cluster(elements: Seq[String],
              sims: Seq[(String, String, Double)],
              threshold: Double): Map[String, Long] = {
    val idOf = elements.distinct.zipWithIndex.map { case (e, i) => e -> i }.toMap
    val n = idOf.size
    val parent = Array.tabulate(n)(identity)
    def find(x: Int): Int = {
      var r = x
      while (parent(r) != r) r = parent(r)
      var c = x
      while (parent(c) != c) { val next = parent(c); parent(c) = r; c = next }
      r
    }

    val size = Array.fill(n)(1)
    // adjacency: cluster -> (cluster -> sum of cross-pair sims)
    val adj = Array.fill(n)(mutable.Map.empty[Int, Double])
    sims.foreach { case (a, b, s) =>
      for (ia <- idOf.get(a); ib <- idOf.get(b) if ia != ib && s > 0) {
        val (lo, hi) = if (ia < ib) (ia, ib) else (ib, ia)
        adj(lo)(hi) = adj(lo).getOrElse(hi, 0.0) + s
        adj(hi)(lo) = adj(hi).getOrElse(lo, 0.0) + s
      }
    }

    def avg(a: Int, b: Int): Double =
      adj(a).getOrElse(b, 0.0) / (size(a).toDouble * size(b))

    var merging = true
    while (merging) {
      // find best cluster pair ≥ threshold
      var bestA = -1; var bestB = -1; var bestSim = threshold - 1e-12
      var a = 0
      while (a < n) {
        if (parent(a) == a) {
          adj(a).foreach { case (b, _) =>
            if (b > a && parent(b) == b) {
              val s = avg(a, b)
              val smallerPair = bestA == -1 || a < bestA || (a == bestA && b < bestB)
              if (s >= threshold &&
                  (s > bestSim + 1e-15 || (s >= bestSim - 1e-15 && smallerPair))) {
                bestA = a; bestB = b; bestSim = s
              }
            }
          }
        }
        a += 1
      }
      if (bestA < 0) merging = false
      else {
        // merge bestB into bestA
        val keep = bestA; val gone = bestB
        parent(gone) = keep
        size(keep) += size(gone)
        adj(gone).foreach { case (c, s) =>
          if (c != keep) {
            adj(keep)(c) = adj(keep).getOrElse(c, 0.0) + s
            adj(c)(keep) = adj(c).getOrElse(keep, 0.0) + s
          }
          adj(c).remove(gone)
        }
        adj(keep).remove(gone)
        adj(gone).clear()
      }
    }

    idOf.map { case (e, i) => e -> find(i).toLong }
  }
}
