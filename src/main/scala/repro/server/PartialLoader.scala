package repro.server

import repro.core._
import repro.json.JsonParser

/** Server-side loading (paper §VI-A, Step 2 of Fig. 1).
  *
  * Partial loading parses and converts to Parquet only the JSON objects
  * whose OR over all pushed-predicate bits is 1; the rest are appended,
  * unparsed, to a per-chunk `.raw` file for just-in-time loading. The
  * sidecar bit-vectors are compacted to loaded-row positions so that at
  * query time bit i refers to row i of the chunk's Parquet file.
  *
  * `loadFull` is the zero-budget baseline: every object is parsed and
  * loaded (and, when bit-vectors are supplied anyway, they are kept so the
  * effect of data skipping alone can be isolated in the micro-benchmarks).
  */
object PartialLoader {

  /** Loading outcome + wall time (the paper's "Data loading" series). */
  final case class LoadStats(totalRows: Long, loadedRows: Long, nChunks: Int, elapsedNanos: Long) {
    def loadedRatio: Double  = if (totalRows == 0) 0.0 else loadedRows.toDouble / totalRows
    def elapsedMillis: Double = elapsedNanos / 1e6
  }

  /** Partially load `chunks` into `dir` using per-chunk client bit-vectors.
    * `registry` must describe exactly the predicate ids present in
    * `bitsPerChunk`. With an empty registry this degrades to a full load.
    */
  def loadPartial(dir: String,
                  schema: TableSchema,
                  chunks: IndexedSeq[IndexedSeq[String]],
                  bitsPerChunk: IndexedSeq[Map[Int, BitVec]],
                  registry: ChunkStore.Registry): LoadStats = {
    require(chunks.size == bitsPerChunk.size,
      s"chunk/bits count mismatch: ${chunks.size} vs ${bitsPerChunk.size}")
    ChunkStore.init(dir)
    ChunkStore.writeSchema(dir, schema)
    ChunkStore.writeRegistry(dir, registry)

    val t0 = System.nanoTime()
    var total  = 0L
    var loaded = 0L
    chunks.indices.foreach { i =>
      val lines = chunks(i)
      val bits  = bitsPerChunk(i)
      total += lines.size
      val orBits =
        if (bits.isEmpty) BitVec.full(lines.size) // nothing pushed ⇒ load everything
        else BitVec.unionAll(lines.size, bits.values.toSeq)
      val loadedPos = orBits.setBits
      loaded += loadedPos.size

      if (loadedPos.nonEmpty) {
        val rows = loadedPos.iterator.map { p =>
          TableSchema.extractRow(schema, JsonParser.parseObject(lines(p)))
        }.toVector
        ParquetIO.writeChunk(ChunkStore.parquetPath(dir, i), schema, rows)
        if (bits.nonEmpty)
          ChunkStore.writeBits(ChunkStore.bitsPath(dir, i), bits.map { case (id, bv) => id -> bv.compact(loadedPos) })
      }
      if (loadedPos.size < lines.size) {
        val rawLines = lines.indices.filterNot(orBits.get).map(lines)
        ChunkStore.writeRawLines(ChunkStore.rawPath(dir, i), rawLines)
      }
    }
    LoadStats(total, loaded, chunks.size, System.nanoTime() - t0)
  }

  /** Full (baseline) load: parse every object into Parquet. When bit-vectors
    * are provided they are stored uncompacted (all rows are loaded), enabling
    * data skipping without partial loading.
    */
  def loadFull(dir: String,
               schema: TableSchema,
               chunks: IndexedSeq[IndexedSeq[String]],
               bitsPerChunk: IndexedSeq[Map[Int, BitVec]] = IndexedSeq.empty,
               registry: ChunkStore.Registry = ChunkStore.Registry(Vector.empty)): LoadStats = {
    ChunkStore.init(dir)
    ChunkStore.writeSchema(dir, schema)
    ChunkStore.writeRegistry(dir, registry)

    val t0 = System.nanoTime()
    var total = 0L
    chunks.indices.foreach { i =>
      val lines = chunks(i)
      total += lines.size
      val rows = lines.iterator.map { l =>
        TableSchema.extractRow(schema, JsonParser.parseObject(l))
      }.toVector
      ParquetIO.writeChunk(ChunkStore.parquetPath(dir, i), schema, rows)
      if (bitsPerChunk.nonEmpty && bitsPerChunk(i).nonEmpty)
        ChunkStore.writeBits(ChunkStore.bitsPath(dir, i), bitsPerChunk(i))
    }
    LoadStats(total, total, chunks.size, System.nanoTime() - t0)
  }
}
