package repro.core

import scala.collection.mutable

/** Union-find with path compression and union by size, over Long ids.
  *
  * Nadeef merges equivalence classes of cells that rules force to be
  * equal; cells are encoded as `tid * nAttrs + attrIdx` by the caller.
  */
final class UnionFind {
  private val parent = mutable.LongMap.empty[Long]
  private val size   = mutable.LongMap.empty[Long]

  /** Representative of `x`, registering it on first sight. */
  def find(x: Long): Long = {
    val p = parent.getOrElse(x, x)
    if (p == x) { parent(x) = x; x }
    else {
      val root = find(p)
      parent(x) = root
      root
    }
  }

  /** Merge the classes of `a` and `b`. */
  def union(a: Long, b: Long): Unit = {
    val ra = find(a); val rb = find(b)
    if (ra != rb) {
      val sa = size.getOrElse(ra, 1L); val sb = size.getOrElse(rb, 1L)
      if (sa >= sb) { parent(rb) = ra; size(ra) = sa + sb }
      else { parent(ra) = rb; size(rb) = sa + sb }
    }
  }

  /** All registered members grouped by representative. */
  def classes(): Map[Long, Seq[Long]] =
    parent.keys.toSeq.groupBy(find)
}
