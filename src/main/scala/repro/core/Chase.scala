package repro.core

import scala.collection.mutable

/** Canonical database over VREM class IDs, with EGD merging via union-find.
  *
  * IDs identify *equivalence classes of expressions* (paper §6.2.1): two
  * classes merge exactly when the constraints prove the expressions they
  * stand for are value-equal. Constants (matrix names, dimension literals,
  * type tags) are interned into the same ID space but are never merged with
  * a different constant.
  */
final class Instance(val est: Estimator) {

  private val parent = mutable.ArrayBuffer[Int]()
  private val consts = mutable.HashMap[String, Int]()
  private val idToConst = mutable.HashMap[Int, String]()
  private val metas  = mutable.HashMap[Int, Meta]()

  private val factsByRel = mutable.HashMap[String, mutable.ArrayBuffer[Vector[Int]]]()
  private val factSet    = mutable.HashSet[(String, Vector[Int])]()
  // Positional index (rel, argPos, classId) → facts, for fast premise joins.
  // Keys use the ids current at insert time; compact() rebuilds after merges.
  private val idx = mutable.HashMap[(String, Int, Int), mutable.ArrayBuffer[Vector[Int]]]()

  private def indexFact(rel: String, canon: Vector[Int]): Unit = {
    var p = 0
    while (p < canon.length) {
      idx.getOrElseUpdate((rel, p, canon(p)), mutable.ArrayBuffer()) += canon
      p += 1
    }
  }

  /** Facts of `rel` whose argument at `pos` is (currently) `value`.
    * May under-report between a merge and the next compact(); the chase's
    * saturation loop re-runs with a fresh index until nothing changes.
    */
  def lookup(rel: String, pos: Int, value: Int): collection.IndexedSeq[Vector[Int]] =
    idx.getOrElse((rel, pos, find(value)), Vector.empty)

  def fresh(): Int = { parent += parent.length; parent.length - 1 }

  /** Intern a constant (quoted token without the quotes). */
  def const(s: String): Int = consts.getOrElseUpdate(s, { val id = fresh(); idToConst(id) = s; id })

  def constOf(id: Int): Option[String] = idToConst.get(find(id))

  def find(x: Int): Int = {
    var r = x
    while (parent(r) != r) r = parent(r)
    var c = x
    while (parent(c) != c) { val n = parent(c); parent(c) = r; c = n }
    r
  }

  /** Merge two classes; metadata keeps agreeing dims and the minimum nnz
    * estimate (value-equal expressions have the same true nnz — the min is
    * the tightest derivation seen). Distinct constants never merge.
    */
  def union(a: Int, b: Int): Boolean = {
    val ra = find(a); val rb = find(b)
    if (ra == rb) return false
    (idToConst.get(ra), idToConst.get(rb)) match {
      case (Some(x), Some(y)) if x != y => return false // inconsistent EGD; refuse
      case _                            =>
    }
    // Keep a constant id as the root so constOf survives merges.
    val (root, child) = if (idToConst.contains(rb) && !idToConst.contains(ra)) (rb, ra) else (ra, rb)
    parent(child) = root
    (metas.remove(child), metas.get(root)) match {
      case (Some(mc), Some(mr)) => metas(root) = if (mc.nnz < mr.nnz) mc else mr
      case (Some(mc), None)     => metas(root) = mc
      case _                    =>
    }
    true
  }

  def setMeta(id: Int, m: Meta): Unit = {
    val r = find(id)
    metas.get(r) match {
      case Some(old) if old.nnz <= m.nnz =>
      case _                             => metas(r) = m
    }
  }

  def meta(id: Int): Option[Meta] = metas.get(find(id))

  def addFact(rel: String, args: Vector[Int]): Boolean = {
    val canon = args.map(find)
    if (factSet.add((rel, canon))) {
      factsByRel.getOrElseUpdate(rel, mutable.ArrayBuffer()) += canon
      indexFact(rel, canon)
      true
    } else false
  }

  def facts(rel: String): collection.IndexedSeq[Vector[Int]] =
    factsByRel.getOrElse(rel, Vector.empty)

  def factCountOf(rel: String): Int = factsByRel.get(rel).map(_.length).getOrElse(0)

  def factCount: Int = factSet.size

  def allFacts: Iterator[(String, Vector[Int])] =
    factsByRel.iterator.flatMap { case (rel, fs) => fs.iterator.map(rel -> _) }

  /** Re-canonicalize all facts after unions, drop duplicates, rebuild index. */
  def compact(): Unit = {
    factSet.clear()
    idx.clear()
    for ((rel, fs) <- factsByRel) {
      val fresh = fs.map(_.map(find)).distinct.filter(f => factSet.add((rel, f)))
      fs.clear(); fs ++= fresh
      fresh.foreach(indexFact(rel, _))
    }
  }

  /** Merge results of functional relations: constructors keyed by their
    * input positions, `name`/`sname`/`slit` keyed by the stored name (the
    * paper's I_name and I_{op} EGDs). Returns true if anything merged.
    */
  def functionalClosure(): Boolean = {
    var changed = false
    def mergeBy(rel: String, keyPos: Vector[Int], resPos: Int): Unit = {
      val groups = mutable.HashMap[Vector[Int], Int]()
      for (f <- facts(rel)) {
        val key = keyPos.map(i => find(f(i)))
        val res = find(f(resPos))
        groups.get(key) match {
          case Some(prev) if prev != res => if (union(prev, res)) changed = true
          case None                      => groups(key) = res
          case _                         =>
        }
      }
    }
    for (c <- VREM.ctors.values) mergeBy(c.rel, c.childPos, c.resultPos)
    mergeBy("name", Vector(1), 0)  // same stored name => same class (I_name)
    mergeBy("sname", Vector(1), 0)
    mergeBy("slit", Vector(1), 0)
    // Multi-output decompositions are functional in every output (paper §6.2.5).
    mergeBy("QR", Vector(0), 1); mergeBy("QR", Vector(0), 2)
    mergeBy("LU", Vector(0), 1); mergeBy("LU", Vector(0), 2)
    changed
  }

  /** Class for a stored name, if any `name` fact binds it. */
  def classOfName(n: String): Option[Int] = {
    val cid = consts.get(n).map(find)
    cid.flatMap(c => facts("name").collectFirst { case f if find(f(1)) == c => find(f(0)) })
  }
}

/** Homomorphism search + restricted chase with Prune_prov-style cost pruning
  * (paper §4.2, §7.3).
  */
object Chase {

  final case class Stats(rounds: Int, facts: Int, merges: Int, prunedSteps: Int,
                         hitFactBudget: Boolean, hitDeadline: Boolean)

  /** All homomorphisms from `atoms` into the instance, extending `bound`.
    * Atoms are joined in a greedy most-bound-first order (cheap selectivity
    * heuristic) — premises are tiny, fact lists are not.
    */
  def matches(inst: Instance, atoms: Vector[PatAtom], bound: Map[String, Int],
              snapshot: Boolean = true): Iterator[Map[String, Int]] = {
    def argMatch(pat: String, id: Int, b: Map[String, Int]): Option[Map[String, Int]] = {
      val v = inst.find(id)
      if (pat.startsWith("\"")) {
        val c = inst.const(pat.substring(1, pat.length - 1))
        if (inst.find(c) == v) Some(b) else None
      } else b.get(pat) match {
        case Some(x) => if (inst.find(x) == v) Some(b) else None
        case None    => Some(b + (pat -> v))
      }
    }
    def boundArity(a: PatAtom, b: Map[String, Int]): Int =
      a.args.count(x => x.startsWith("\"") || b.contains(x))
    // Snapshot fact lists once: the caller may add facts while consuming the
    // iterator (proper chase staging, and no concurrent-modification risk).
    // Read-only callers (satisfiability checks) skip the copies.
    val snap: Map[String, collection.IndexedSeq[Vector[Int]]] =
      atoms.map(_.rel).distinct.map { r =>
        val fs = inst.facts(r)
        r -> (if (snapshot) fs.toIndexedSeq else fs)
      }.toMap
    // Candidate facts for one atom: smallest index bucket over bound args,
    // falling back to the relation's full (possibly snapshotted) list.
    def candidates(a: PatAtom, b: Map[String, Int]): collection.IndexedSeq[Vector[Int]] = {
      var best: collection.IndexedSeq[Vector[Int]] = null
      var k = 0
      while (k < a.args.length) {
        val arg = a.args(k)
        val v =
          if (arg.startsWith("\"")) Some(inst.const(arg.substring(1, arg.length - 1)))
          else b.get(arg)
        v.foreach { id =>
          val bucket = inst.lookup(a.rel, k, id)
          if (best == null || bucket.length < best.length) best = bucket
        }
        k += 1
      }
      if (best == null) snap(a.rel)
      else if (snapshot) best.toIndexedSeq
      else best
    }
    def rec(remaining: List[PatAtom], b: Map[String, Int]): Iterator[Map[String, Int]] =
      remaining match {
        case Nil => Iterator.single(b)
        case _ =>
          val a    = remaining.maxBy(x => boundArity(x, b) * 1000 - inst.factCountOf(x.rel))
          val rest = {
            val i = remaining.indexOf(a)
            remaining.take(i) ++ remaining.drop(i + 1)
          }
          candidates(a, b).iterator.flatMap { f =>
            var cur: Option[Map[String, Int]] = Some(b)
            var k = 0
            while (k < a.args.length && cur.isDefined) {
              cur = argMatch(a.args(k), f(k), cur.get); k += 1
            }
            cur match {
              case Some(nb) => rec(rest, nb)
              case None     => Iterator.empty
            }
          }
      }
    rec(atoms.toList, bound)
  }

  /** True iff the conclusion is satisfiable by extending `h` (restricted
    * chase applicability check; existentials may bind to anything).
    */
  private def conclusionSatisfied(inst: Instance, concl: Vector[PatAtom],
                                  h: Map[String, Int]): Boolean =
    matches(inst, concl, h, snapshot = false).hasNext

  /** Apply one TGD for one premise match. Returns #facts added; -1 if the
    * step was cost-pruned.
    */
  private def applyTgd(inst: Instance, t: TGD, h: Map[String, Int],
                       threshold: Double): Int = {
    // Bind existentials to fresh classes.
    var b = h
    for (v <- t.existentials) b += (v -> inst.fresh())

    def idOf(arg: String): Int =
      if (arg.startsWith("\"")) inst.const(arg.substring(1, arg.length - 1)) else b(arg)

    // Derive metadata for existential results, atoms in dependency order.
    var progressed = true
    while (progressed) {
      progressed = false
      for (a <- t.conclusion; c <- VREM.ctors.get(a.rel)) {
        val res = idOf(a.args(c.resultPos))
        if (inst.meta(res).isEmpty) {
          val childMetas = c.childPos.map(p => inst.meta(idOf(a.args(p))))
          VREM.derive(a.rel, childMetas.toVector, inst.est).foreach { m =>
            inst.setMeta(res, m); progressed = true
          }
        }
      }
    }
    // Second pass: a new derivation of an *existing* class may be tighter —
    // setMeta keeps the minimum nnz (value-equal classes share true nnz).
    for (a <- t.conclusion; c <- VREM.ctors.get(a.rel)) {
      val childMetas = c.childPos.map(p => inst.meta(idOf(a.args(p))))
      VREM.derive(a.rel, childMetas.toVector, inst.est)
        .foreach(m => inst.setMeta(idOf(a.args(c.resultPos)), m))
    }

    // Prune_prov: skip the whole step if some intermediate it introduces is
    // already more expensive than the best-known complete rewriting.
    val tooExpensive = t.pruneable && t.conclusion.exists { a =>
      VREM.ctors.get(a.rel).exists { c =>
        inst.meta(idOf(a.args(c.resultPos))).exists(_.nnz > threshold)
      }
    }
    if (tooExpensive) return -1

    var added = 0
    for (a <- t.conclusion)
      if (inst.addFact(a.rel, a.args.map(idOf))) added += 1
    // Record size facts for newly derived classes so size-guarded rules
    // (vector special cases, dimension-checked reverse rules) can fire.
    for (a <- t.conclusion; c <- VREM.ctors.get(a.rel)) {
      val res = idOf(a.args(c.resultPos))
      inst.meta(res).foreach { m =>
        inst.addFact("size",
          Vector(res, inst.const(m.rows.toString), inst.const(m.cols.toString)))
      }
    }
    added
  }

  /** Saturate the instance. `threshold` is γ of the original expression —
    * the initial Prune_prov bound (γ is monotonic, so any rewriting using a
    * larger intermediate can never beat the original, §8).
    */
  def run(inst: Instance, constraints: Seq[Constraint], maxRounds: Int = 4,
          maxFacts: Int = 30000, threshold: Double = Double.PositiveInfinity,
          deadlineMillis: Long = 15000): Stats = {
    val tgds = constraints.collect { case t: TGD => t }
    val egds = constraints.collect { case e: EGD => e }
    val deadline = System.nanoTime() + deadlineMillis * 1000000L
    def late: Boolean = System.nanoTime() > deadline
    var merges = 0
    var pruned = 0
    var hitBudget = false
    var hitDeadline = false

    def equalitySaturate(): Unit = {
      var changed = true
      while (changed) {
        changed = false
        if (inst.functionalClosure()) changed = true
        for (e <- egds) {
          val ms = matches(inst, e.premise, Map.empty).toList
          for (h <- ms) if (inst.union(h(e.left), h(e.right))) { changed = true; merges += 1 }
        }
        if (changed) inst.compact()
      }
    }

    var round = 0
    var more  = true
    while (more && round < maxRounds && !hitBudget && !hitDeadline) {
      round += 1
      equalitySaturate()
      var added = 0
      for (t <- tgds
           if !hitBudget && !hitDeadline &&
              t.premise.forall(a => inst.factCountOf(a.rel) > 0)) {
        // Snapshot matches before mutation so each round is a proper stage.
        val it = matches(inst, t.premise, Map.empty)
        while (it.hasNext && !hitBudget && !hitDeadline) {
          val h = it.next()
          if (!conclusionSatisfied(inst, t.conclusion, h)) {
            applyTgd(inst, t, h, threshold) match {
              case -1 => pruned += 1
              case n  => added += n
            }
          }
          if (inst.factCount > maxFacts) hitBudget = true
          if (late) hitDeadline = true
        }
      }
      equalitySaturate()
      more = added > 0
    }
    Stats(round, inst.factCount, merges, pruned, hitBudget, hitDeadline)
  }
}
