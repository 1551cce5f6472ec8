package repro.core

/** Tunables of the LIRE protocol (defaults mirror the paper where stated).
  *
  * @param splitLimit     posting length above which a split job fires (§3.2)
  * @param mergeThreshold posting length below which a merge job fires (§3.2)
  * @param reassignRange  number of nearest postings scanned for condition-2
  *                       reassignment checks after a split; the paper's
  *                       parameter study (Fig 11) settles on 64
  * @param searchProbes   postings probed per query (§5.3 uses nearest 64)
  * @param replicaEpsilon closure-assignment slack at build time: a vector is
  *                       replicated into any posting whose centroid is within
  *                       (1+ε)·d_min (SPANN boundary replication, §3.1)
  * @param maxReplicas    cap on replicas per vector (SPANN caps at 8)
  */
final case class LireConfig(
    splitLimit: Int = 128,
    mergeThreshold: Int = 16,
    reassignRange: Int = 64,
    searchProbes: Int = 64,
    replicaEpsilon: Double = 0.10,
    maxReplicas: Int = 8,
) {
  require(splitLimit > 1, "splitLimit must allow a 2-way split")
  require(mergeThreshold < splitLimit, "mergeThreshold must be below splitLimit")
  require(reassignRange >= 0, "reassignRange is a count of postings")
  require(maxReplicas >= 1, "a vector lives in at least its nearest posting")
}
