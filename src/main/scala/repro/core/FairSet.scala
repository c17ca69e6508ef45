package repro.core

/** Fair set machinery (Defs 11-12) and the combinatorial enumeration of
  * maximal fair subsets (Alg 4 `MFSCheck`, Alg 7 `Combination`, and
  * `CombinationPro` for the proportional models).
  *
  * A set with per-attribute counts `c` is *fair* w.r.t. `(k, δ)` when every
  * `c(a) ≥ k` and every pairwise difference `|c(a) - c(b)| ≤ δ`. Elements of
  * the same attribute class are interchangeable for fairness, so all checks
  * reduce to count profiles.
  */
object FairSet {

  /** Per-attribute count profile of `set` under `attr`. */
  def counts(set: IterableOnce[Int], attr: Int => Int, nAttr: Int): Array[Int] = {
    val c = new Array[Int](nAttr)
    set.iterator.foreach(v => c(attr(v)) += 1)
    c
  }

  /** Fair-set predicate (Def 11) on a count profile. */
  def isFairCounts(c: Array[Int], k: Int, delta: Int): Boolean = {
    var mn = Int.MaxValue; var mx = Int.MinValue; var i = 0
    while (i < c.length) { if (c(i) < mn) mn = c(i); if (c(i) > mx) mx = c(i); i += 1 }
    mn >= k && (mx - mn) <= delta
  }

  def isFair(set: IterableOnce[Int], attr: Int => Int, nAttr: Int, k: Int, delta: Int): Boolean =
    isFairCounts(counts(set, attr, nAttr), k, delta)

  /** Proportion-fair predicate (Defs 5-6 condition 3 on top of fairness). */
  def isProportionFairCounts(c: Array[Int], k: Int, delta: Int, theta: Double): Boolean = {
    val tot = c.sum
    isFairCounts(c, k, delta) && tot > 0 && c.forall(_.toDouble / tot >= theta - 1e-12)
  }

  def isProportionFair(set: IterableOnce[Int], attr: Int => Int, nAttr: Int, k: Int,
                       delta: Int, theta: Double): Boolean =
    isProportionFairCounts(counts(set, attr, nAttr), k, delta, theta)

  /** Alg 4 `MFSCheck`: is `shat ⊆ s` a *maximal* fair subset of `s`?
    *
    * Count-level: `shatCounts` must be fair, and no element of `s \ shat`
    * may be addable. A superset can only add elements of classes with
    * leftover capacity; the paper's two tests (all classes have leftovers →
    * one per class is addable; otherwise some single-element addition is
    * fair) are complete — see DESIGN.md §3 / the property tests.
    */
  def isMaximalFairSubsetCounts(sCounts: Array[Int], shatCounts: Array[Int],
                                k: Int, delta: Int): Boolean = {
    require(sCounts.length == shatCounts.length)
    if (!isFairCounts(shatCounts, k, delta)) return false
    val leftover = Array.tabulate(sCounts.length)(a => sCounts(a) - shatCounts(a))
    require(leftover.forall(_ >= 0), "shat is not a subset of s")
    if (leftover.forall(_ > 0)) return false // add one element of each class
    var a = 0
    while (a < leftover.length) {
      if (leftover(a) > 0) {
        val c = shatCounts.clone(); c(a) += 1
        if (isFairCounts(c, k, delta)) return false
      }
      a += 1
    }
    true
  }

  def isMaximalFairSubset(s: Iterable[Int], shat: Iterable[Int], attr: Int => Int,
                          nAttr: Int, k: Int, delta: Int): Boolean =
    isMaximalFairSubsetCounts(counts(s, attr, nAttr), counts(shat, attr, nAttr), k, delta)

  /** Proportional analogue of `MFSCheck` (used by BFairBCEMPro++): maximal
    * among proportion-fair subsets. Requires two attribute classes (the
    * paper's setting) — single-element-addition completeness is only proved
    * for that case.
    */
  def isMaximalProportionFairSubsetCounts(sCounts: Array[Int], shatCounts: Array[Int],
                                          k: Int, delta: Int, theta: Double): Boolean = {
    require(sCounts.length == 2, "proportional models are implemented for 2 attribute values")
    if (!isProportionFairCounts(shatCounts, k, delta, theta)) return false
    val leftover = Array.tabulate(sCounts.length)(a => sCounts(a) - shatCounts(a))
    if (leftover.forall(_ > 0)) return false
    var a = 0
    while (a < leftover.length) {
      if (leftover(a) > 0) {
        val c = shatCounts.clone(); c(a) += 1
        if (isProportionFairCounts(c, k, delta, theta)) return false
      }
      a += 1
    }
    true
  }

  /** The unique maximal fair count profile of classes with sizes `n`
    * (Alg 7 lines 3-5): `csize(a) = min(n(a), msize + δ)`.
    */
  def maximalProfile(n: Array[Int], delta: Int): Array[Int] = {
    val msize = n.min
    n.map(na => math.min(na, msize + delta))
  }

  /** `CombinationPro` profile: additionally capped by `⌊msize·(1-θ)/θ⌋`. */
  def maximalProfilePro(n: Array[Int], delta: Int, theta: Double): Array[Int] = {
    val msize = n.min
    val cap   = math.floor(msize * (1.0 - theta) / theta + 1e-9).toInt
    n.map(na => math.min(na, math.min(msize + delta, cap)))
  }

  /** Number of subsets Alg 7 would emit (Π C(n_a, csize_a)) — used as an
    * explosion guard before materialising.
    */
  def combinationCount(n: Array[Int], profile: Array[Int]): BigInt =
    n.indices.map(a => binomial(n(a), profile(a))).product

  def binomial(n: Int, k: Int): BigInt = {
    if (k < 0 || k > n) return BigInt(0)
    var acc = BigInt(1)
    for (i <- 0 until math.min(k, n - k)) acc = acc * (n - i) / (i + 1)
    acc
  }

  /** Alg 7 `Combination`: all maximal fair subsets of the elements grouped
    * by attribute in `elemsByAttr`. Emits sorted element arrays. Empty when
    * some class is smaller than `k`.
    */
  def combination(elemsByAttr: Array[Array[Int]], k: Int, delta: Int): Iterator[Array[Int]] = {
    val n = elemsByAttr.map(_.length)
    if (n.exists(_ < k) || n.exists(_ == 0)) return Iterator.empty
    cartesian(elemsByAttr, maximalProfile(n, delta))
  }

  /** `CombinationPro`: maximal *proportion*-fair subsets. Two-attribute
    * setting only; the emitted profile always satisfies the ratio bound
    * there (see DESIGN.md §3).
    */
  def combinationPro(elemsByAttr: Array[Array[Int]], k: Int, delta: Int,
                     theta: Double): Iterator[Array[Int]] = {
    require(elemsByAttr.length == 2, "proportional models are implemented for 2 attribute values")
    val n = elemsByAttr.map(_.length)
    if (n.exists(_ < k) || n.exists(_ == 0)) return Iterator.empty
    val prof = maximalProfilePro(n, delta, theta)
    if (prof.exists(_ < k) || !isProportionFairCounts(prof, k, delta, theta)) Iterator.empty
    else cartesian(elemsByAttr, prof)
  }

  /** Cartesian product of per-class size-`profile(a)` combinations. */
  private def cartesian(elemsByAttr: Array[Array[Int]], profile: Array[Int]): Iterator[Array[Int]] = {
    // Fold classes left to right, lazily.
    var acc: Iterator[List[Array[Int]]] = Iterator(Nil)
    for (a <- elemsByAttr.indices) {
      val before = acc
      acc = before.flatMap(prefix => subsetsOfSize(elemsByAttr(a), profile(a)).map(s => s :: prefix))
    }
    acc.map(parts => { val out = parts.toArray.flatten; java.util.Arrays.sort(out); out })
  }

  /** All size-`k` subsets of `elems`, in lexicographic index order. */
  def subsetsOfSize(elems: Array[Int], k: Int): Iterator[Array[Int]] = {
    val n = elems.length
    if (k < 0 || k > n) Iterator.empty
    else if (k == 0) Iterator(Array.empty[Int])
    else new Iterator[Array[Int]] {
      private val idx  = Array.range(0, k)
      private var done = false
      def hasNext: Boolean = !done
      def next(): Array[Int] = {
        val out = idx.map(elems)
        // advance: rightmost index that can move
        var i = k - 1
        while (i >= 0 && idx(i) == n - k + i) i -= 1
        if (i < 0) done = true
        else {
          idx(i) += 1
          var j = i + 1
          while (j < k) { idx(j) = idx(j - 1) + 1; j += 1 }
        }
        out
      }
    }
  }
}
