package repro.core

import repro.util.Hashing
import java.util.SplittableRandom
import scala.collection.mutable

/** CPSJoin — faithful single-node implementation of Algorithm 1 (CPSJOIN)
  * and Algorithm 2 (BRUTEFORCE), including the implementation heuristics of
  * §V-A:
  *
  *  - the splitting step samples an expected 1/λ coordinates from [t] (each
  *    coordinate with probability 1/(λt)) and buckets records on their
  *    precomputed MinHash value at those coordinates, so placing a record in
  *    child buckets costs O(1) per child instead of O(|x|);
  *  - the BRUTEFORCE step estimates each record's average similarity to its
  *    bucket in O(ℓ) words using a sampled bucket sketch ŝ (instead of the
  *    O(t) exact token-count rule), and runs a single pass per node, calling
  *    BRUTEFORCEPOINT on every record that passes the check;
  *  - candidate pairs are filtered through the 1-bit minwise sketch check at
  *    threshold λ̂ (false-negative probability δ) before exact verification;
  *  - duplicates across buckets/repetitions are removed at the end.
  *
  * The same bucket-local routines back the Spark implementation
  * (`CPSJoinSpark`), which runs them inside `flatMapGroups` per tree node.
  */
object CPSJoinLocal {

  /** Node-level processing shared with the distributed implementation.
    * Runs the BRUTEFORCE step on `bucket`; emits verified pairs through
    * `emit` and returns the surviving records (empty if the bucket was fully
    * brute-forced).
    *
    * @param useExactAvg use Algorithm 2's exact token-count average-similarity
    *                    rule over the embedded coordinates instead of the
    *                    sketch heuristic (slower; used in tests)
    */
  def bruteForceStep(bucket: scala.collection.IndexedSeq[EmbeddedRec], lambda: Double, p: CPSParams,
                     nodeSeed: Long, stats: StatsSink,
                     emit: (Long, Long, Double) => Unit,
                     useExactAvg: Boolean = false): scala.collection.IndexedSeq[EmbeddedRec] = {
    val lh = Sketch.lambdaHat(lambda, p.sketchBits, p.delta)
    if (bucket.length <= p.limit) {
      Verification.bruteForcePairs(bucket, lambda, lh, p.sketchBits, stats, emit)
      return Vector.empty
    }
    val removeFlag = new Array[Boolean](bucket.length)
    if (useExactAvg) {
      // Algorithm 2 verbatim on the embedded representation: count[(i, v)]
      // is the number of bucket members whose i-th minhash equals v.
      val count = mutable.HashMap.empty[Long, Int]
      for (x <- bucket; i <- 0 until p.t) {
        val key = (i.toLong << 32) | (x.mh(i).toLong & 0xffffffffL)
        count.update(key, count.getOrElse(key, 0) + 1)
      }
      var xi = 0
      while (xi < bucket.length) {
        val x = bucket(xi)
        var sum = 0L
        var i = 0
        while (i < p.t) {
          val key = (i.toLong << 32) | (x.mh(i).toLong & 0xffffffffL)
          sum += count(key) - 1
          i += 1
        }
        val avg = sum.toDouble / p.t / (bucket.length - 1)
        removeFlag(xi) = avg > (1.0 - p.eps) * lambda
        xi += 1
      }
    } else {
      val rng = new SplittableRandom(Hashing.mix64(nodeSeed ^ 0xb5caL))
      val sHat = Sketch.bucketSketch(bucket.map(_.sketch), p.ell, rng)
      var xi = 0
      while (xi < bucket.length) {
        val est = Sketch.estimate(bucket(xi).sketch, sHat, p.sketchBits)
        removeFlag(xi) = est > (1.0 - p.eps) * lambda
        xi += 1
      }
    }
    val survivors = Vector.newBuilder[EmbeddedRec]
    // Compare each removed point against survivors and *later* removed points
    // so no pair is reported twice within this node (equivalent to
    // Algorithm 2's sequential remove-and-recurse).
    var xi = 0
    while (xi < bucket.length) {
      if (!removeFlag(xi)) survivors += bucket(xi)
      xi += 1
    }
    val surv = survivors.result()
    xi = 0
    while (xi < bucket.length) {
      if (removeFlag(xi)) {
        val x = bucket(xi)
        Verification.bruteForcePoint(x, surv, lambda, lh, p.sketchBits, stats, emit)
        var yj = xi + 1
        while (yj < bucket.length) {
          if (removeFlag(yj)) {
            val s = Verification.verify(x, bucket(yj), lambda, lh, p.sketchBits, stats)
            if (!s.isNaN) emit(math.min(x.id, bucket(yj).id), math.max(x.id, bucket(yj).id), s)
          }
          yj += 1
        }
      }
      xi += 1
    }
    surv
  }

  /** Splitting coordinates for a node: each i ∈ [t] chosen independently with
    * probability 1/(λt) using a coin derived from (nodeSeed, i), so every
    * record in the node sees the same choice (Algorithm 1's shared r).
    */
  def splitCoordinates(nodeSeed: Long, t: Int, lambda: Double): Array[Int] = {
    val pSel = 1.0 / (lambda * t)
    val out = mutable.ArrayBuilder.make[Int]
    var i = 0
    while (i < t) {
      if (Hashing.toUnitDouble(Hashing.combine(nodeSeed, i.toLong)) < pSel) out += i
      i += 1
    }
    out.result()
  }

  /** Child node identity: hash of (parent node, coordinate, minhash value). */
  @inline def childSeed(nodeSeed: Long, coord: Int, mhValue: Int): Long =
    Hashing.combine(nodeSeed, (coord.toLong << 32) ^ (mhValue.toLong & 0xffffffffL))

  /** One repetition of CPSJoin (one Chosen Path tree). */
  def runRep(recs: scala.collection.IndexedSeq[EmbeddedRec], lambda: Double, p: CPSParams, rep: Int,
             stats: StatsSink, emit: (Long, Long, Double) => Unit,
             useExactAvg: Boolean = false): Unit = {
    val rootSeed = Hashing.mix64(p.seed + 0x9e3779b9L * (rep + 1))

    def recurse(bucket: scala.collection.IndexedSeq[EmbeddedRec], nodeSeed: Long, depth: Int): Unit = {
      if (bucket.length < 2) return
      val effective =
        if (depth >= p.maxDepth) p.copy(limit = Int.MaxValue) // force exact finish at the cap
        else p
      val survivors = bruteForceStep(bucket, lambda, effective, nodeSeed, stats, emit, useExactAvg)
      if (survivors.length < 2) return
      val coords = splitCoordinates(nodeSeed, p.t, lambda)
      var ci = 0
      while (ci < coords.length) {
        val c = coords(ci)
        val children = mutable.HashMap.empty[Int, mutable.ArrayBuffer[EmbeddedRec]]
        var xi = 0
        while (xi < survivors.length) {
          val x = survivors(xi)
          children.getOrElseUpdate(x.mh(c), mutable.ArrayBuffer.empty) += x
          xi += 1
        }
        for ((v, child) <- children if child.length >= 2)
          recurse(child.toIndexedSeq, childSeed(nodeSeed, c, v), depth + 1)
        ci += 1
      }
    }

    recurse(recs, rootSeed, 0)
  }

  /** Full self-join: `p.reps` repetitions, output deduplicated.
    * Returns pairs (id1 < id2) with their exact Jaccard similarity.
    */
  def selfJoin(recs: scala.collection.IndexedSeq[EmbeddedRec], lambda: Double,
               p: CPSParams = CPSParams(), stats: StatsSink = NullStats,
               useExactAvg: Boolean = false): Map[(Long, Long), Double] = {
    val out = mutable.HashMap.empty[(Long, Long), Double]
    val emit = (a: Long, b: Long, s: Double) => { out.update((math.min(a, b), math.max(a, b)), s); () }
    var r = 0
    while (r < p.reps) {
      runRep(recs, lambda, p, r, stats, emit, useExactAvg)
      r += 1
    }
    out.toMap
  }

  /** Convenience: embed raw records then self-join. */
  def selfJoinRaw(recs: scala.collection.IndexedSeq[SetRec], lambda: Double,
                  p: CPSParams = CPSParams(), stats: StatsSink = NullStats): Map[(Long, Long), Double] = {
    val hasher = new MinHasher(p.t, p.ell, p.seed)
    selfJoin(EmbeddedRec.embedAll(recs, hasher).toIndexedSeq, lambda, p, stats)
  }
}
