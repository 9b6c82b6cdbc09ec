package repro.graph

/** Union–find over dense integer ids `[0, n)` with path compression and
  * union by rank. Used by the Kruskal MST step of Algorithm 1 and by the
  * component merging of the PCST growth (Algorithm 2).
  */
final class DisjointSet(n: Int) {
  private val parent = Array.tabulate(n)(identity)
  private val rank   = new Array[Byte](n)
  private var nComp  = n

  /** Representative of `x`'s component (with path compression). */
  def find(x: Int): Int = {
    var root = x
    while (parent(root) != root) root = parent(root)
    var cur = x
    while (parent(cur) != root) { val next = parent(cur); parent(cur) = root; cur = next }
    root
  }

  /** Merge the components of `a` and `b`; returns false if already merged. */
  def union(a: Int, b: Int): Boolean = {
    val ra = find(a); val rb = find(b)
    if (ra == rb) false
    else {
      if (rank(ra) < rank(rb)) parent(ra) = rb
      else if (rank(ra) > rank(rb)) parent(rb) = ra
      else { parent(rb) = ra; rank(ra) = (rank(ra) + 1).toByte }
      nComp -= 1
      true
    }
  }

  /** True iff `a` and `b` are in the same component. */
  def connected(a: Int, b: Int): Boolean = find(a) == find(b)

  /** Number of components remaining. */
  def components: Int = nComp
}
