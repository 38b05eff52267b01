package repro.core

/** Top-k selection utilities shared by the verification step of every index
  * and by LIDER's final merge stage (§6.2). Ordering is by descending
  * score, ties broken by ascending id so every caller is deterministic.
  */
object TopK {

  val ordering: Ordering[Scored] =
    Ordering.by[Scored, (Double, Long)](s => (-s.score, s.id))

  /** Top-k of an unsorted batch, returned sorted descending by score. */
  def topBy(scored: Array[Scored], k: Int): Array[Scored] = {
    if (scored.length <= k) scored.sorted(ordering)
    else {
      // Bounded max-keeping heap: O(n log k) — the candidate sets here are
      // small (R·H), but verification is on the per-query hot path.
      val heap = new java.util.PriorityQueue[Scored](k + 1, ordering.reverse)
      var i = 0
      while (i < scored.length) {
        heap.offer(scored(i))
        if (heap.size > k) heap.poll()
        i += 1
      }
      val out = new Array[Scored](heap.size)
      var j = out.length - 1
      while (j >= 0) { out(j) = heap.poll(); j -= 1 }
      out
    }
  }

  /** k-way merge of per-cluster result lists, each already sorted
    * descending — the paper's stage-3 heap over the c0 list heads
    * (§6.2, O(c0 + k·log c0)).
    */
  def mergeSorted(lists: Array[Array[Scored]], k: Int): Array[Scored] = {
    final case class Head(listIdx: Int, pos: Int, value: Scored)
    val heap = new java.util.PriorityQueue[Head](
      math.max(1, lists.length),
      (a: Head, b: Head) => ordering.compare(a.value, b.value))
    var li = 0
    while (li < lists.length) {
      if (lists(li).nonEmpty) heap.offer(Head(li, 0, lists(li)(0)))
      li += 1
    }
    val out = new scala.collection.mutable.ArrayBuffer[Scored](k)
    val seen = new java.util.HashSet[Long]()
    while (out.length < k && !heap.isEmpty) {
      val h = heap.poll()
      // A passage can only live in one cluster, but the guard keeps the
      // merge safe for callers that feed overlapping lists.
      if (seen.add(h.value.id)) out += h.value
      val next = h.pos + 1
      if (next < lists(h.listIdx).length) heap.offer(Head(h.listIdx, next, lists(h.listIdx)(next)))
    }
    out.toArray
  }
}
