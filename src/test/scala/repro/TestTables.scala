package repro

import repro.meta.Scalar
import repro.sim.MemTable

/** Shared builders for small in-memory tables used across suites. */
object TestTables {
  import Scalar._

  /** Schema: id (long), v (long), d (double), s (string), g (long).
    * `v = f(id)` so tests can predict results; `g` is a low-cardinality
    * group key; `s` cycles a small vocabulary.
    */
  val schema: IndexedSeq[String] = IndexedSeq("id", "v", "d", "s", "g")
  val vocab: Vector[String] = Vector("alpha", "bravo", "charlie", "delta", "echo")

  def rows(n: Int, seed: Long = 1, nullEvery: Int = 0): IndexedSeq[Array[Scalar]] = {
    val rnd = new scala.util.Random(seed)
    (0 until n).map { i =>
      val v: Scalar =
        if (nullEvery > 0 && i % nullEvery == 0) null
        else LongV(rnd.nextInt(1000000).toLong)
      Array[Scalar](LongV(i.toLong), v, DoubleV(rnd.nextDouble() * 100),
                    StringV(vocab(rnd.nextInt(vocab.size))), LongV(rnd.nextInt(50).toLong))
    }
  }

  def table(name: String, n: Int, parts: Int, layout: MemTable.Layout,
            seed: Long = 1, nullEvery: Int = 0): MemTable =
    MemTable.build(name, schema, rows(n, seed, nullEvery), parts, layout)
}
