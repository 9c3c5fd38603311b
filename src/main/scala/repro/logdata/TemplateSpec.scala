package repro.logdata

import scala.util.Random

/** Ground-truth template vocabulary for the synthetic LogHub substitute.
  *
  * A template is a fixed token sequence of [[Tok.Const]] and [[Tok.Slot]]
  * positions. Slots render from a per-(template, slot) value pool — real
  * variables (hosts, users, block ids) are drawn from finite populations, so
  * pools both mirror reality and reproduce the heavy duplication after
  * variable replacement that the paper's Fig. 4 reports. A pool size of 0
  * means "fresh value every time" (truly unbounded variables such as UUIDs).
  */
object Tok {
  sealed trait T
  final case class Const(s: String) extends T
  final case class Slot(kind: SlotKind, pool: IndexedSeq[String]) extends T
}

sealed trait SlotKind
object SlotKind {
  case object Num    extends SlotKind
  case object Float  extends SlotKind
  case object Hex    extends SlotKind
  case object Ip     extends SlotKind
  case object Uuid   extends SlotKind
  case object Id     extends SlotKind
  case object Path   extends SlotKind

  val all: Vector[SlotKind] = Vector(Num, Float, Hex, Ip, Uuid, Id, Path)

  /** One rendered value of this kind. */
  def render(kind: SlotKind, rng: Random): String = kind match {
    case Num   => rng.nextInt(1_000_000).toString
    case Float => (math.round(rng.nextDouble() * 100000) / 100.0).toString // '.' regardless of locale
    case Hex   => f"${rng.nextInt(1 << 24)}%06x"
    case Ip    => s"${rng.nextInt(224)}.${rng.nextInt(256)}.${rng.nextInt(256)}.${rng.nextInt(256)}"
    case Uuid  => new java.util.UUID(rng.nextLong(), rng.nextLong()).toString
    case Id    => Iterator.fill(8)("abcdefghijklmnopqrstuvwxyz0123456789".charAt(rng.nextInt(36))).mkString
    case Path  => "/" + Iterator.fill(2 + rng.nextInt(3))(Words.generic(rng.nextInt(Words.generic.size)).toLowerCase).mkString("/")
  }
}

/** One ground-truth template: fixed-length token sequence plus an optional
  * trailing variable-length list slot (the §7 challenge — a printed list of
  * 1–3 elements makes otherwise-identical logs differ in token count).
  *
  * All pooled slots of a template share one value index per rendered record:
  * real log variables are typically correlated (host ↔ ip, user ↔ uid, a
  * request's fields travel together), and the correlation keeps the unique-
  * line count of a template at its pool size — reproducing the heavy
  * duplication after variable replacement reported in the paper's Fig. 4.
  */
final case class GroundTemplate(id: Int, tokens: Vector[Tok.T], listTail: Option[Tok.Slot] = None) {
  def render(rng: Random): String = {
    val j = rng.nextInt(1 << 30)
    val head = tokens.map {
      case Tok.Const(s) => s
      case Tok.Slot(kind, pool) =>
        if (pool.isEmpty) SlotKind.render(kind, rng) else pool(j % pool.size)
    }
    val tail = listTail.toSeq.flatMap { s =>
      Vector.fill(1 + rng.nextInt(3))(
        if (s.pool.isEmpty) SlotKind.render(s.kind, rng) else s.pool(rng.nextInt(s.pool.size)))
    }
    (head ++ tail).mkString(" ")
  }
}

/** Shared word lists; per-dataset flavor words live in [[Datasets]]. */
object Words {
  val generic: Vector[String] = Vector(
    "starting", "stopping", "received", "sending", "request", "response", "connection",
    "session", "block", "task", "job", "worker", "thread", "client", "server", "node",
    "status", "state", "error", "warning", "failed", "success", "completed", "timeout",
    "retry", "opened", "closed", "created", "deleted", "updated", "registered", "removed",
    "allocated", "released", "scheduled", "executing", "finished", "initialized",
    "loading", "saving", "reading", "writing", "from", "for", "with", "on", "at", "in",
    "to", "of", "by", "size", "count", "total", "bytes", "time", "duration", "user",
    "group", "service", "module", "handler", "queue", "buffer", "cache", "config",
    "version", "port", "host", "address", "file", "directory", "process", "memory",
  )

  val actions: Vector[String] = Vector(
    "create", "delete", "update", "query", "open", "close", "start", "stop", "connect",
    "disconnect", "register", "unregister", "acquire", "release", "enable", "disable",
  )

  val levels: Vector[String] = Vector("verbose", "debug", "info", "notice", "warn", "critical")
}
