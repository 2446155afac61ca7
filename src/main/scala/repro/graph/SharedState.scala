package repro.graph

import java.util.concurrent.ConcurrentHashMap

/** Process-global registry standing in for the paper's shared memory.
  *
  * ConnectIt is a multicore shared-memory framework: its threads CAS on
  * shared parent arrays. We run on Spark in `local[*]` mode, where every
  * task executes in the driver JVM, so Spark task threads can play the
  * role of the paper's threads — provided the shared arrays are reachable
  * without being captured (and thus copied) by task closures. This
  * registry is that reach-around: kernels pass small string keys through
  * closures and look the arrays up here on the task side.
  *
  * This is a deliberate, documented substitution (see DESIGN.md): it is
  * only valid in local mode, which is exactly the paper's setting (a
  * single large multicore machine).
  */
object SharedState {
  private val m = new ConcurrentHashMap[String, AnyRef]()

  def put(key: String, v: AnyRef): Unit = m.put(key, v)

  def get[T <: AnyRef](key: String): T = {
    val v = m.get(key)
    require(v != null, s"SharedState: no entry for '$key' (not running in local mode?)")
    v.asInstanceOf[T]
  }

  def contains(key: String): Boolean = m.containsKey(key)

  def remove(key: String): Unit = m.remove(key)

  /** Number of live entries (used by tests to check cleanup). */
  def size: Int = m.size
}
