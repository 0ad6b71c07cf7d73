package repro.baselines

import scala.collection.mutable
import repro.core._

/** H-DFS baseline (Papapetrou et al., KAIS 2009): hybrid BFS/DFS mining of
  * frequent arrangements using ID-Lists.
  *
  * Characteristics reproduced (vs HTPGM):
  *  - per-pattern *ID-Lists* — `(sequence, occurrence)` vertical lists —
  *    merged pairwise during depth-first extension; no bitmaps;
  *  - no Apriori event-combination filtering (every frequent single event
  *    is tried as an extension of every frequent pattern);
  *  - no confidence-based pruning: patterns are mined by support only and
  *    the confidence threshold is applied as a post-filter;
  *  - extension candidates are found by scanning each sequence's full
  *    instance list (no per-event index).
  *
  * The output pattern set is identical to E-HTPGM's (asserted in tests);
  * only the work and retained state differ.
  */
object HDFS {

  def mine(db: SequenceDB, cfg: MiningConfig): MiningResult = {
    val t0 = System.nanoTime()
    val n = db.size
    val minSupp = cfg.minSupp(n)
    var structureBytes = 0L
    var candidatePatterns = 0L
    var maxLevel = 1

    // Single events and their ID-lists (one scan of D_SEQ).
    val eventSupp: Map[Int, Int] =
      (0 until db.numEvents).map(e => e ->
        db.sequences.count(_.instances.exists(_.event == e))).toMap
    val freq1 = (0 until db.numEvents).filter(eventSupp(_) >= minSupp).toVector

    // ID-list: seq -> occurrences (instance tuples).
    type IdList = mutable.LinkedHashMap[Int, mutable.ArrayBuffer[Array[Instance]]]

    val results = mutable.HashMap.empty[Pattern, Int]

    def extend(p: Pattern, ids: IdList): Unit = {
      for (eK <- freq1) {
        val newLists = mutable.HashMap.empty[Pattern, IdList]
        for ((seq, occs) <- ids) {
          val insts = db.sequences(seq).instances // linear scan, no index
          for (occ <- occs; inst <- insts if inst.event == eK) {
            if (Instance.chrono.compare(inst, occ.last) > 0 &&
                inst.end - occ.head.start <= cfg.tMax) {
              val rels = new Array[Byte](occ.length)
              var ok = true; var i = 0
              while (ok && i < occ.length) {
                val r = Relation.classify(occ(i).start, occ(i).end, inst.start, inst.end,
                                          cfg.eps, cfg.dO)
                if (r == Relation.None) ok = false else rels(i) = r
                i += 1
              }
              if (ok) {
                candidatePatterns += 1
                structureBytes += 56L + 8L * (occ.length + 1) // materialized ID-list entry
                val np = p.extended(eK, rels.toIndexedSeq)
                newLists.getOrElseUpdate(np, mutable.LinkedHashMap.empty)
                  .getOrElseUpdate(seq, mutable.ArrayBuffer.empty) += (occ :+ inst)
              }
            }
          }
        }
        for ((np, nids) <- newLists if nids.size >= minSupp) {
          results(np) = nids.size
          maxLevel = math.max(maxLevel, np.size)
          extend(np, nids) // depth-first
        }
      }
    }

    for (e <- freq1) {
      val ids: IdList = mutable.LinkedHashMap.empty
      for (s <- db.sequences; inst <- s.instances if inst.event == e)
        ids.getOrElseUpdate(s.id, mutable.ArrayBuffer.empty) += Array(inst)
      structureBytes += ids.valuesIterator.map(_.length.toLong).sum * 64L
      extend(Pattern(Vector(e), Vector.empty), ids)
    }

    // Post-filter by confidence (H-DFS has no confidence pruning).
    val confident = results.filter { case (p, s) =>
      s.toDouble / p.events.iterator.map(eventSupp).max >= cfg.delta
    }
    val stats = MiningStats((System.nanoTime() - t0) / 1000000L, structureBytes,
      candidateNodes = 0, prunedNodes = 0, candidatePatterns = candidatePatterns,
      maxLevelReached = maxLevel)
    MiningResult(confident.toMap, eventSupp.filter(_._2 >= minSupp), n, stats)
  }
}
