package repro.core

/** Greedy traversal partitioners (§3.3, Algorithm 4).
  *
  * Traverse the version tree from the root (depth- or breadth-first); at
  * each version append the records that originate there (the delta's
  * additions) to the open chunk, allocating a new chunk whenever the open
  * one is full. DFS keeps a branch's records contiguous, which — since most
  * versions differ little from their parents — usually beats BFS (which
  * interleaves records from sibling branches that no common descendant will
  * ever read together).
  */
final class TraversalPartitioner(depthFirst: Boolean) extends Partitioner {
  override val name: String = if (depthFirst) "DepthFirst" else "BreadthFirst"

  override def partition(in: PartitionInput, capacity: Long): Assignment = {
    val cb = new ChunkBuilder(capacity, in.numItems)
    val order = if (depthFirst) in.tree.dfsOrder else in.tree.bfsOrder
    order.foreach { v =>
      in.adds(v).foreach(item => cb.add(item, in.itemSizes(item)))
    }
    cb.result()
  }
}

object TraversalPartitioner {
  val dfs: Partitioner = new TraversalPartitioner(depthFirst = true)
  val bfs: Partitioner = new TraversalPartitioner(depthFirst = false)
}
