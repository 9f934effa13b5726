package repro.data

import org.apache.spark.sql.Column
import org.apache.spark.sql.functions.{lit, pmod, xxhash64}

/** Deterministic column generators for the synthetic datasets.
  *
  * Unlike `rand(seed)` (whose output depends on the partitioning), xxhash64
  * over the row id is bit-stable across partition counts, machines and runs,
  * so (sf, seed) fully determines every dataset.
  */
object Gen {
  /** Uniform value in [0, n) as a Long column, derived from `id` and `salt`. */
  def h(id: Column, salt: Long, n: Long): Column =
    pmod(xxhash64(id, lit(salt)), lit(n))

  /** Uniform value in [lo, lo+n) as a Long column. */
  def hIn(id: Column, salt: Long, lo: Long, n: Long): Column =
    h(id, salt, n) + lit(lo)
}
