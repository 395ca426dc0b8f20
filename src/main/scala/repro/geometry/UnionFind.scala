package repro.geometry

/** Array-based union-find with union by rank and path halving.
  *
  * The paper uses a lock-free concurrent union-find shared by all threads;
  * here the structure lives on the driver and only the O(#cells) metadata
  * passes through it — the expensive connectivity *queries* run distributed
  * (see [[repro.core.ClusterCore]]), so a sequential driver-side structure
  * preserves the algorithm's cost profile.
  */
final class UnionFind(n: Int) extends Serializable {
  private val parent = Array.tabulate(n)(identity)
  private val rank   = new Array[Byte](n)

  /** Representative of `i`'s component, with path halving. */
  def find(i: Int): Int = {
    var x = i
    while (parent(x) != x) {
      parent(x) = parent(parent(x))
      x = parent(x)
    }
    x
  }

  /** Union the components of `a` and `b`; returns true if they were distinct. */
  def union(a: Int, b: Int): Boolean = {
    val ra = find(a); val rb = find(b)
    if (ra == rb) false
    else {
      if (rank(ra) < rank(rb)) parent(ra) = rb
      else if (rank(ra) > rank(rb)) parent(rb) = ra
      else { parent(rb) = ra; rank(ra) = (rank(ra) + 1).toByte }
      true
    }
  }

  def connected(a: Int, b: Int): Boolean = find(a) == find(b)

  /** Number of distinct components over all n elements. */
  def numComponents: Int = (0 until n).count(i => find(i) == i)
}
