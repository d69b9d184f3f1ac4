package repro.scopesim

/** The four model keys of Section 3–4, computed as 64-bit recursive hashes
  * the way SCOPE annotates operators with signatures (Section 5.1).
  */
object Signatures {

  /** Operator-subgraph: root physical operator + its logical properties
    * (the content hash carries predicates/keys, like SCOPE's signature mixes
    * "hash of operator's logical properties") + entire descendant physical
    * plan + leaf input templates. Strictest key, highest accuracy, lowest
    * coverage.
    */
  def subgraph(n: Phys): Long = {
    val base = Determ.mix2(
      Determ.mix2(Determ.hashStr(n.op.name), n.contentHash),
      Determ.hashStr(n.inputs.sorted.mkString(",")))
    n.children.foldLeft(base)((h, c) => Determ.mix2(h, subgraph(c)))
  }

  /** Operator-subgraphApprox: root physical operator + inputs + frequency of
    * each *logical* operator underneath, ignoring order (Section 4.2).
    */
  def approx(n: Phys): Long = {
    // Sort/Exchange are property enforcers chosen by the optimizer, not part
    // of the job's logical shape — excluding them lets the approx key merge
    // different physical realizations of the same logical subexpression.
    def isEnforcer(op: PhysOp): Boolean = op == PhysOp.Sort || op == PhysOp.Exchange
    def logicalCounts(m: Phys): Map[String, Int] = {
      val self: Map[String, Int] = if (isEnforcer(m.op)) Map.empty else Map(m.op.logical -> 1)
      m.children.foldLeft(self) { (acc, c) =>
        logicalCounts(c).foldLeft(acc) { case (a, (k, v)) => a.updated(k, a.getOrElse(k, 0) + v) }
      }
    }
    val freq = n.children.foldLeft(Map.empty[String, Int]) { (acc, c) =>
      logicalCounts(c).foldLeft(acc) { case (a, (k, v)) => a.updated(k, a.getOrElse(k, 0) + v) }
    }
    val freqHash = freq.toSeq.sorted.foldLeft(0L) { case (h, (k, v)) =>
      Determ.mix2(h, Determ.mix2(Determ.hashStr(k), v.toLong))
    }
    Determ.mix2(Determ.mix2(Determ.hashStr(n.op.name),
      Determ.hashStr(n.inputs.sorted.mkString(","))), freqHash)
  }

  /** Operator-input: root physical operator + normalized input templates. */
  def inputSig(n: Phys): Long =
    Determ.mix2(Determ.hashStr("opin:" + n.op.name), Determ.hashStr(n.inputs.sorted.mkString(",")))

  /** Operator: one model per physical operator — full coverage, least context. */
  def operator(n: Phys): Long = Determ.hashStr("op:" + n.op.name)
}
