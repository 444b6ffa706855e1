package repro.imdg

import org.scalatest.funsuite.AnyFunSuite

class MigrationPlannerSpec extends AnyFunSuite {
  private val PC = 271

  test("initial assignment is balanced across members") {
    val t    = MigrationPlanner.initial(Seq(0, 1, 2), PC, replicaCount = 2)
    val load = t.loadByNode
    assert(load.keySet == Set(0, 1, 2))
    assert(load.values.max - load.values.min <= 2)
  }

  test("initial assignment has distinct replicas per partition") {
    val t = MigrationPlanner.initial(Seq(0, 1, 2, 3), PC, replicaCount = 3)
    (0 until PC).foreach(p => assert(t.holders(p).distinct.size == 3))
  }

  test("replica count is capped at member count") {
    val t = MigrationPlanner.initial(Seq(0), PC, replicaCount = 2)
    (0 until PC).foreach(p => assert(t.holders(p) == Vector(0)))
  }

  test("failure promotes the first surviving backup in place") {
    val t0 = MigrationPlanner.initial(Seq(0, 1, 2), PC, replicaCount = 2)
    val (t1, _) = MigrationPlanner.plan(t0, Seq(1, 2), replicaCount = 2)
    (0 until PC).foreach { p =>
      if (t0.primary(p) == 0) {
        // The backup (which survived) must now be primary.
        assert(t1.primary(p) == t0.backups(p).head)
      } else {
        // Surviving primaries keep their partitions — minimal movement.
        assert(t1.primary(p) == t0.primary(p))
      }
      assert(t1.holders(p).size == 2)
      assert(!t1.holders(p).contains(0))
    }
  }

  test("member join moves only the partitions it takes over") {
    val t0 = MigrationPlanner.initial(Seq(0, 1, 2), PC, replicaCount = 2)
    val (t1, migrations) = MigrationPlanner.plan(t0, Seq(0, 1, 2, 3), replicaCount = 2)
    // Every migration targets the new member (nothing shuffles among the old).
    assert(migrations.forall(_.node == 3))
    // Surviving replicas stay: any slot not on node 3 is unchanged in membership.
    (0 until PC).foreach { p =>
      val kept = t0.holders(p).filter(t1.holders(p).contains)
      assert(kept.size >= t0.holders(p).size - 1)
    }
  }

  test("rebalance after join is still roughly even") {
    val t0 = MigrationPlanner.initial(Seq(0, 1, 2), PC, replicaCount = 2)
    val (t1, _) = MigrationPlanner.plan(t0, Seq(0, 1, 2, 3), replicaCount = 2)
    val load = t1.loadByNode
    val avg  = 2.0 * PC / 4
    assert(load(3) > avg * 0.5, s"new node under-loaded: ${load(3)} vs ~$avg")
  }

  test("migrations carry a source holder when data survives") {
    val t0 = MigrationPlanner.initial(Seq(0, 1), PC, replicaCount = 2)
    val (_, migrations) = MigrationPlanner.plan(t0, Seq(0, 1, 2), replicaCount = 2)
    assert(migrations.forall(_.from.isDefined))
  }

  test("planning with no members is rejected") {
    val t = MigrationPlanner.initial(Seq(0), PC, 1)
    intercept[IllegalArgumentException](MigrationPlanner.plan(t, Seq.empty, 1))
  }

  test("double failure with one backup loses primaries only of doubly-dead partitions") {
    val t0 = MigrationPlanner.initial(Seq(0, 1, 2, 3), PC, replicaCount = 2)
    val (t1, migs) = MigrationPlanner.plan(t0, Seq(2, 3), replicaCount = 2)
    // Partitions fully held by {0,1} lose all data: migrations without source.
    val lost = (0 until PC).count(p => t0.holders(p).toSet.subsetOf(Set(0, 1)))
    assert(migs.count(_.from.isEmpty) == lost)
    (0 until PC).foreach(p => assert(t1.holders(p).toSet.subsetOf(Set(2, 3))))
  }
}
