package repro.imdg

import scala.collection.mutable

/** Computes replica placement when the member set changes (§4.3).
  *
  * The planner follows the paper's two rules:
  *   - *Minimal movement*: replicas already held by surviving members stay
  *     where they are; a dead primary's first surviving backup is promoted
  *     in place (Figure 6).
  *   - *Balance*: empty replica slots are filled greedily on the member
  *     with the fewest replicas, approximating consistent hashing's even,
  *     low-churn spread without a hash ring (the sim has small member sets).
  */
object MigrationPlanner {

  /** A single planned partition movement: `node` must fetch a copy of
    * partition `partition` (from `from`, an existing holder) to take over
    * replica slot `replicaIndex` (0 = primary).
    */
  final case class Migration(partition: Int, replicaIndex: Int, node: Int, from: Option[Int])

  /** Plan a new table for `members` given the `current` table.
    *
    * @param replicaCount desired replicas per partition (1 primary +
    *                     backups), capped at the member count.
    * @return the new table plus the list of migrations (slots that changed
    *         holder and need data copied).
    */
  def plan(
      current: PartitionTable,
      members: Seq[Int],
      replicaCount: Int
  ): (PartitionTable, Vector[Migration]) = {
    require(members.nonEmpty, "cannot plan a partition table with no members")
    val memberSet  = members.toSet
    val targetReps = math.min(replicaCount, members.size)
    val pc         = current.partitionCount

    // Load = number of replicas a member will hold in the *new* table.
    val load = mutable.Map.empty[Int, Int].withDefaultValue(0)

    // Phase 1: keep every surviving replica, preserving order (this is what
    // promotes the first surviving backup when the primary died).
    val kept: Vector[Vector[Int]] = current.replicas.map { reps =>
      val survivors = reps.filter(memberSet).distinct.take(targetReps)
      survivors.foreach(n => load(n) += 1)
      survivors
    }
    members.foreach(m => load(m) += 0) // make sure new members appear with load 0

    // Phase 2: fill missing slots on the least-loaded member not yet holding
    // the partition.
    val migrations = Vector.newBuilder[Migration]
    val filled = kept.zipWithIndex.map { case (reps, p) =>
      var cur = reps
      while (cur.size < targetReps) {
        val candidates = members.filterNot(cur.contains)
        // Deterministic tiebreak on node id keeps the planner reproducible.
        val pick = candidates.minBy(n => (load(n), n))
        val from = cur.headOption // any existing holder can seed the copy
        migrations += Migration(p, cur.size, pick, from)
        cur = cur :+ pick
        load(pick) += 1
      }
      cur
    }.to(scala.collection.mutable.ArrayBuffer)

    // Phase 3: balance. A joining member starts with zero replicas while no
    // slot is empty, so shift replicas from the most- to the least-loaded
    // member until the spread is ≤ 1 (the minimal-move analogue of
    // consistent-hashing's even spread, §4.3).
    var moved = true
    while (moved && load.values.max - load.values.min > 1) {
      moved = false
      val donor    = members.maxBy(n => (load(n), n))
      val receiver = members.minBy(n => (load(n), n))
      // Find a partition where the donor holds a slot the receiver doesn't.
      val candidate = filled.indices.find { p =>
        filled(p).contains(donor) && !filled(p).contains(receiver)
      }
      candidate.foreach { p =>
        val slot = filled(p).indexOf(donor)
        migrations += Migration(p, slot, receiver, Some(filled(p).head))
        filled(p) = filled(p).updated(slot, receiver)
        load(donor) -= 1
        load(receiver) += 1
        moved = true
      }
    }
    (PartitionTable(filled.toVector), migrations.result())
  }

  /** Initial balanced assignment for a fresh cluster. */
  def initial(members: Seq[Int], partitionCount: Int, replicaCount: Int): PartitionTable = {
    require(members.nonEmpty)
    val targetReps = math.min(replicaCount, members.size)
    val sorted     = members.sorted.toVector
    val reps = Vector.tabulate(partitionCount) { p =>
      Vector.tabulate(targetReps)(r => sorted((p + r) % sorted.size))
    }
    PartitionTable(reps)
  }
}
