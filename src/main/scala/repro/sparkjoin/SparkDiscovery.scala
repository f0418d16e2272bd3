package repro.sparkjoin

import org.apache.spark.sql.SparkSession
import repro.core._
import repro.core.Discovery.{DiscoveryConfig, DiscoveryResult, PruningStats}

/** Distributed transformation discovery.
  *
  * The same algorithm as [[repro.core.Discovery.discover]], parallelized for
  * inputs whose candidate space reaches into the millions (paper Table 3):
  *
  *   - *generation* fans out over row pairs (`mapPartitions`), with a
  *     per-partition hash set giving partial duplicate removal before the
  *     shuffle; global dedup is an RDD `distinct` on the structural key;
  *   - *coverage* fans out over transformations: each partition holds its own
  *     [[Coverage.RowState]] array (the non-covering-unit caches) over the
  *     broadcast input rows, preserving the paper's unit-level pruning within
  *     every partition;
  *   - the shortlist/cover tail is shared with the local path.
  *
  * Counters (generated, cache hits/misses) flow through Spark accumulators.
  */
object SparkDiscovery {

  def discover(
      spark: SparkSession,
      pairs: Seq[(String, String)],
      cfg: DiscoveryConfig = DiscoveryConfig(),
      numSlices: Int = 0,
  ): DiscoveryResult = {
    val t0 = System.nanoTime()
    if (pairs.isEmpty)
      return DiscoveryResult(0, None, Vector.empty, PruningStats(0, 0, 0, 0), 0)

    val sc     = spark.sparkContext
    val slices = if (numSlices > 0) numSlices else sc.defaultParallelism
    val bcRows = sc.broadcast(pairs.toVector)
    val genCfg = cfg.gen

    val generatedAcc = sc.longAccumulator("generatedTransformations")
    val hitsAcc      = sc.longAccumulator("cacheHits")
    val missesAcc    = sc.longAccumulator("cacheMisses")

    // Stage 1: per-row candidate generation with partition-local dedup.
    val distinctRdd = sc
      .parallelize(pairs.toVector, math.min(slices, math.max(1, pairs.size)))
      .mapPartitions { it =>
        val seen = scala.collection.mutable.HashSet.empty[Transformation]
        var gen  = 0L
        for ((s, t) <- it)
          gen += TransformationGen.forRow(s, t, genCfg)(tr => { seen.add(tr); () }).generated
        generatedAcc.add(gen)
        seen.iterator
      }
      .distinct()
      .cache()
    val toTry = distinctRdd.count()

    // Stage 2: coverage counts, partitioned over transformations; every
    // partition keeps its own per-row non-covering-unit caches.
    val ranked = distinctRdd
      .mapPartitions { ts =>
        val rows = Coverage.rowStates(bcRows.value)
        var hits = 0L
        var misses = 0L
        val out = ts.map { t =>
          var cov = 0
          var ri  = 0
          while (ri < rows.length) {
            val (skipped, covers) = Coverage.applyToRow(t, rows(ri))
            if (skipped) hits += 1L else misses += 1L
            if (covers) cov += 1
            ri += 1
          }
          (t, cov)
        }.toVector
        hitsAcc.add(hits); missesAcc.add(misses)
        out.iterator
      }
      .filter { case (t, c) => c >= 1 && !t.isConstant }
      // The driver only needs the shortlist: top transformations by coverage
      // (ties: shorter, then lexicographic — same order as the local path).
      .takeOrdered(cfg.shortlistSize)(
        Ordering.by { case (t, c) => (-c, t.placeholderCount, t.render) }
      )
      .toVector
    distinctRdd.unpersist(blocking = false)

    val rows       = Coverage.rowStates(pairs)
    val cacheStats = Coverage.CacheStats(hitsAcc.value, missesAcc.value)
    Discovery.finish(
      pairs.size,
      ranked,
      cacheStats,
      rows,
      PruningStats(generatedAcc.value, toTry, cacheStats.hits, cacheStats.misses),
      cfg,
      t0,
    )
  }
}
