package repro.util

import org.json4s.{Formats, NoTypeHints}
import org.json4s.jackson.Serialization

/** Thin wrapper over json4s (shipped with Spark) for (de)serializing the
  * LST metadata case classes. Field order is stable and output contains no
  * timestamps other than those carried explicitly by the case classes, so
  * serialization is deterministic given identical inputs (NFR2).
  */
object Json {
  implicit val formats: Formats = Serialization.formats(NoTypeHints)

  /** Serialize a case class (or Seq/Map of them) to a JSON string. */
  def write[A <: AnyRef](a: A): String = Serialization.write(a)

  /** Parse a JSON string back into `A`. Throws on malformed/mistyped input. */
  def read[A](s: String)(implicit mf: Manifest[A]): A = Serialization.read[A](s)
}
