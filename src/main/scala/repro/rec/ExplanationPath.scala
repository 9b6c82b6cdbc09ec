package repro.rec

/** One path-based explanation E(u, i) = (u, v1, …, vk, i): why item `item`
  * was recommended to user `user` (paper §III). `rank` is the 1-based
  * position of the item in the user's top-k list; top-k explanation sets
  * are prefixes of the top-10 list, as in the paper's preprocessing.
  *
  * `nodes` always starts at the user node id and ends at the item node id;
  * the paper's experimental paths have at most 3 edges (4 nodes).
  */
final case class ExplanationPath(user: Long, item: Long, rank: Int, nodes: Vector[Long]) {
  require(nodes.nonEmpty && nodes.head == user && nodes.last == item,
    s"path must run from user $user to item $item: $nodes")

  /** Directed hop pairs (v_i, v_{i+1}) along the path. */
  def hops: Seq[(Long, Long)] = nodes.iterator.zip(nodes.iterator.drop(1)).toSeq

  /** Number of edges. */
  def length: Int = nodes.length - 1
}
