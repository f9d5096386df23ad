package repro.core

import repro.SparkSpec
import repro.s2.CellId

class AggregateTrieSpec extends SparkSpec {

  private val root = CellId.fromPoint(-73.9, 40.75, 8)

  private def agg(count: Long): AggState = {
    val st = new AggState(2)
    st.count = count
    st
  }

  test("empty trie: root node only, probe misses") {
    val t = new AggregateTrie(root, 2)
    assert(t.numNodes == 1 && t.numAggregates == 0)
    assert(t.probe(CellId.fromPoint(-73.9, 40.75, 12)) == t.Missing)
  }

  test("insert then probe returns the cached aggregate") {
    val t = new AggregateTrie(root, 2)
    val c = CellId.fromPoint(-73.9, 40.75, 12)
    assert(t.insert(c, agg(7)))
    t.probe(c) match {
      case t.Cached(a) => assert(a.count == 7)
      case other       => fail(s"expected Cached, got $other")
    }
  }

  test("children are allocated four at a time") {
    val t = new AggregateTrie(root, 2)
    val c = CellId.fromPoint(-73.9, 40.75, 10) // 2 levels below root
    t.insert(c, agg(1))
    // path: root -> level9 group -> level10 group = 1 + 4 + 4 nodes
    assert(t.numNodes == 9)
  }

  test("sizeBytes counts nodes and stored aggregates") {
    val t = new AggregateTrie(root, 2)
    val c = CellId.fromPoint(-73.9, 40.75, 10)
    t.insert(c, agg(1))
    assert(t.sizeBytes == 9L * 8 + AggState.storedBytes(2))
  }

  test("insertCostBytes predicts the actual growth") {
    val t  = new AggregateTrie(root, 2)
    val c1 = CellId.fromPoint(-73.9, 40.75, 10)
    val cost1 = t.insertCostBytes(c1)
    val before = t.sizeBytes
    t.insert(c1, agg(1))
    assert(t.sizeBytes - before == cost1)
    // second insert along the same path but one level deeper
    val c2 = CellId.fromPoint(-73.9, 40.75, 11)
    val cost2 = t.insertCostBytes(c2)
    val before2 = t.sizeBytes
    t.insert(c2, agg(2))
    assert(t.sizeBytes - before2 == cost2)
    // sibling of c1 costs only an aggregate (group already allocated)
    val sibling = c1.parent.children.find(_.id != c1.id).get
    assert(t.insertCostBytes(sibling) == AggState.storedBytes(2))
  }

  test("probe on an ancestor path node without aggregate yields NodeOnly") {
    val t = new AggregateTrie(root, 2)
    val c = CellId.fromPoint(-73.9, 40.75, 12)
    t.insert(c, agg(3))
    val mid = c.parent(10)
    t.probe(mid) match {
      case t.NodeOnly(_) => ()
      case other         => fail(s"expected NodeOnly, got $other")
    }
  }

  test("childAggregate finds cached direct children") {
    val t      = new AggregateTrie(root, 2)
    val parent = CellId.fromPoint(-73.9, 40.75, 12)
    val kid0   = parent.child(0)
    val kid2   = parent.child(2)
    t.insert(kid0, agg(10))
    t.insert(kid2, agg(20))
    t.probe(parent) match {
      case t.NodeOnly(node) =>
        assert(t.childAggregate(node, 0).map(_.count).contains(10L))
        assert(t.childAggregate(node, 1).isEmpty)
        assert(t.childAggregate(node, 2).map(_.count).contains(20L))
        assert(t.childAggregate(node, 3).isEmpty)
      case other => fail(s"expected NodeOnly, got $other")
    }
  }

  test("insert outside the root is rejected") {
    val t = new AggregateTrie(root, 2)
    assert(!t.insert(CellId.fromPoint(10, 10, 12), agg(1)))
    assert(!t.insert(root, agg(1)))
    assert(t.insertCostBytes(CellId.fromPoint(10, 10, 12)) == Long.MaxValue)
  }

  test("re-inserting a cell replaces its aggregate without node growth") {
    val t = new AggregateTrie(root, 2)
    val c = CellId.fromPoint(-73.9, 40.75, 11)
    t.insert(c, agg(1))
    val nodes = t.numNodes
    t.insert(c, agg(5))
    assert(t.numNodes == nodes && t.numAggregates == 1)
    t.probe(c) match {
      case t.Cached(a) => assert(a.count == 5)
      case other       => fail(s"$other")
    }
  }

  test("aggregatedCells lists exactly the inserted cells") {
    val t = new AggregateTrie(root, 2)
    // descendants of the root by construction, so every insert succeeds
    val cells = Seq(
      root.child(0).child(1).child(2),
      root.child(3).child(0),
      root.child(1).child(1).child(0).child(2))
    cells.foreach(c => assert(t.insert(c, agg(1))))
    assert(t.aggregatedCells.map(_.id).toSet == cells.map(_.id).toSet)
  }
}
