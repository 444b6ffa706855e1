package repro.imdg

import org.scalatest.funsuite.AnyFunSuite

class GridClusterSpec extends AnyFunSuite {

  test("put/get/remove round-trips") {
    val g = new GridCluster(3)
    val m = g.getMap[String, Int]("m")
    m.put("a", 1); m.put("b", 2)
    assert(m.get("a").contains(1))
    assert(m.get("b").contains(2))
    assert(m.get("c").isEmpty)
    assert(m.remove("a").contains(1))
    assert(m.get("a").isEmpty)
    assert(m.size == 1)
  }

  test("entries returns everything once (primary replicas only)") {
    val g = new GridCluster(3, backupCount = 1)
    val m = g.getMap[Long, Long]("m")
    (0L until 1000L).foreach(k => m.put(k, k * 2))
    assert(m.size == 1000)
    assert(m.entries.toMap == (0L until 1000L).map(k => k -> k * 2).toMap)
  }

  test("every partition is replicated backupCount+1 times") {
    val g = new GridCluster(3, backupCount = 1)
    (0 until g.partitionCount).foreach { p =>
      assert(g.table.holders(p).distinct.size == 2)
    }
  }

  test("writes land on primary and backup stores") {
    val g = new GridCluster(3, backupCount = 1)
    val m = g.getMap[Long, Long]("m")
    (0L until 500L).foreach(k => m.put(k, k))
    val physical = g.members.map(id => g.node(id).replicaEntryCount).sum
    assert(physical == 1000L, s"expected 500 entries x2 replicas, got $physical")
  }

  test("single node failure loses no data with one backup") {
    val g = new GridCluster(3, backupCount = 1)
    val m = g.getMap[Long, Long]("m")
    (0L until 2000L).foreach(k => m.put(k, k + 7))
    g.failNode(0)
    assert(g.members == Vector(1, 2))
    assert(m.size == 2000)
    (0L until 2000L).foreach(k => assert(m.get(k).contains(k + 7)))
  }

  test("failure triggers re-replication to the surviving members") {
    val g = new GridCluster(3, backupCount = 1)
    val m = g.getMap[Long, Long]("m")
    (0L until 1000L).foreach(k => m.put(k, k))
    g.failNode(1)
    // All partitions are again doubly held by {0, 2}.
    (0 until g.partitionCount).foreach { p =>
      assert(g.table.holders(p).toSet.subsetOf(Set(0, 2)))
      assert(g.table.holders(p).size == 2)
    }
    val physical = g.members.map(id => g.node(id).replicaEntryCount).sum
    assert(physical == 2000L)
  }

  test("two sequential failures still lose no data with one backup") {
    val g = new GridCluster(4, backupCount = 1)
    val m = g.getMap[Long, Long]("m")
    (0L until 1000L).foreach(k => m.put(k, k))
    g.failNode(0)
    g.failNode(1) // re-replication after the first failure protects this one
    assert(m.size == 1000)
    (0L until 1000L).foreach(k => assert(m.get(k).contains(k)))
  }

  test("node join rebalances and preserves all data") {
    val g = new GridCluster(2, backupCount = 1)
    val m = g.getMap[Long, Long]("m")
    (0L until 1000L).foreach(k => m.put(k, k))
    val newId = g.addNode()
    assert(g.members.contains(newId))
    assert(m.size == 1000)
    (0L until 1000L).foreach(k => assert(m.get(k).contains(k)))
    // The new member holds a fair share of replicas.
    val load = g.table.loadByNode
    assert(load(newId) > 0.5 * 2 * g.partitionCount / 3.0)
  }

  test("writes after a membership change replicate on the new table") {
    val g = new GridCluster(2, backupCount = 1)
    val m = g.getMap[Long, Long]("m")
    g.addNode()
    (0L until 300L).foreach(k => m.put(k, k))
    val physical = g.members.map(id => g.node(id).replicaEntryCount).sum
    assert(physical == 600L)
  }

  test("maps are independent") {
    val g = new GridCluster(2)
    val a = g.getMap[String, Int]("a")
    val b = g.getMap[String, Int]("b")
    a.put("k", 1); b.put("k", 2)
    assert(a.get("k").contains(1))
    assert(b.get("k").contains(2))
  }

  test("clear empties all replicas") {
    val g = new GridCluster(2, backupCount = 1)
    val m = g.getMap[Long, Long]("m")
    (0L until 100L).foreach(k => m.put(k, k))
    m.clear()
    assert(m.size == 0)
    assert(g.members.map(id => g.node(id).replicaEntryCount).sum == 0L)
  }

  test("failing the last member is rejected") {
    val g = new GridCluster(1)
    intercept[IllegalArgumentException](g.failNode(0))
  }

  test("concurrent puts from many threads are all stored") {
    val g       = new GridCluster(3, backupCount = 1)
    val m       = g.getMap[Long, Long]("m")
    val threads = (0 until 8).map { t =>
      new Thread(() => (0L until 1000L).foreach(i => m.put(t * 1000L + i, i)))
    }
    threads.foreach(_.start())
    threads.foreach(_.join(20000))
    assert(m.size == 8000)
  }

  test("entriesInPartition returns only that partition's keys") {
    val g = new GridCluster(2)
    val m = g.getMap[Long, Long]("m")
    (0L until 500L).foreach(k => m.put(k, k))
    val all = (0 until g.partitionCount).flatMap(p => m.entriesInPartition(p))
    assert(all.size == 500)
    (0 until g.partitionCount).foreach { p =>
      m.entriesInPartition(p).foreach { case (k, _) =>
        assert(Partitioning.partitionId(k, g.partitionCount) == p)
      }
    }
  }
}
