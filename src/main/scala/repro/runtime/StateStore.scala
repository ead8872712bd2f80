package repro.runtime

import repro.core.Value

/** Where operator state lives — the only thing that differs between target
  * runtimes (§3): a local HashMap for the Local runtime, Spark's GroupState
  * for the streaming runtime, an external KV store for FaaS.
  */
trait StateStore {
  /** Entity field map for (class, key), if the entity is materialized. */
  def get(clazz: String, key: String): Option[Map[String, Value]]

  /** Persist the entity's (possibly new) field map. */
  def put(clazz: String, key: String, fields: Map[String, Value]): Unit

  /** All materialized entities of a class (diagnostics / result checking). */
  def entitiesOf(clazz: String): Map[String, Map[String, Value]]
}

/** In-memory store for the Local runtime (§3 "Local": "state is kept in a
  * local HashMap data structure instead of a state management backend"). */
final class HashMapStateStore extends StateStore {
  private val m = scala.collection.mutable.Map.empty[(String, String), Map[String, Value]]

  def get(clazz: String, key: String): Option[Map[String, Value]] = m.get((clazz, key))
  def put(clazz: String, key: String, fields: Map[String, Value]): Unit = m((clazz, key)) = fields
  def entitiesOf(clazz: String): Map[String, Map[String, Value]] =
    m.collect { case ((c, k), v) if c == clazz => k -> v }.toMap
}
