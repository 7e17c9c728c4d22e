package repro.sparkext

import java.nio.file.{Files, Path}
import repro.ml.{ColPredicate, ModelPipeline}

/** In-DB model store (§2): deployed model pipelines live inside the engine
  * and are invoked by id from SQL. Also tracks pipelines derived by the
  * optimizer (pruned/projected variants), memoized so the fixed-point
  * optimizer converges and repeated queries reuse compiled variants.
  *
  * A process-wide object: in `local[*]` executors share the JVM with the
  * driver, which stands in for SQL Server's shared model cache.
  */
object ModelRegistry {

  private val models = new java.util.concurrent.ConcurrentHashMap[String, ModelPipeline]()
  /** (root id, derivation key) → derived id */
  private val derivations = new java.util.concurrent.ConcurrentHashMap[(String, String), String]()
  /** derived id → root id */
  private val roots = new java.util.concurrent.ConcurrentHashMap[String, String]()

  def deploy(mp: ModelPipeline): Unit = models.put(mp.id, mp)

  def get(id: String): ModelPipeline = {
    val mp = models.get(id)
    require(mp != null, s"model '$id' is not deployed")
    mp
  }

  def contains(id: String): Boolean = models.containsKey(id)

  def rootOf(id: String): String = roots.getOrDefault(id, id)

  /** Memoized derivation: specialize `baseId` for `predicates` (predicate-
    * based pruning + model-projection pushdown). Returns the derived model
    * id — stable for a given (root model, canonical predicate set), so a
    * second optimizer pass is a no-op.
    */
  def deriveFor(baseId: String, predicates: Seq[ColPredicate]): String = {
    val root = rootOf(baseId)
    val key = predicates.map(_.toString).sorted.mkString("&")
    derivations.computeIfAbsent((root, key), _ => {
      val (optimized, _) = get(baseId).optimizeFor(predicates)
      val id = s"$root#${Integer.toHexString(key.hashCode)}"
      models.put(id, optimized.copy(id = id))
      roots.put(id, root)
      id
    })
  }

  def clear(): Unit = { models.clear(); derivations.clear(); roots.clear() }

  // ---- persistence (model files stored "in the database") -----------------

  def save(mp: ModelPipeline, path: Path): Unit = {
    val out = new java.io.ObjectOutputStream(Files.newOutputStream(path))
    try out.writeObject(mp)
    finally out.close()
  }

  def load(path: Path): ModelPipeline = {
    val in = new java.io.ObjectInputStream(Files.newInputStream(path))
    try in.readObject().asInstanceOf[ModelPipeline]
    finally in.close()
  }
}
