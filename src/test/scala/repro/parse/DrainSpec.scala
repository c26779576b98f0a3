package repro.parse

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class DrainSpec extends AnyFunSuite {

  test("identical messages share a group") {
    val d = new Drain()
    val a = d.parse("Connection opened src: host port: 42")
    val b = d.parse("Connection opened src: host port: 42")
    assert(a == b)
  }

  test("same template, different variables share a group and mine <*>") {
    val d = new Drain()
    val a = d.parse("Sending 138 bytes src: 10.250.11.53 dest: 10.250.11.54")
    val b = d.parse("Sending 999 bytes src: 10.250.11.11 dest: 10.250.11.12")
    assert(a == b)
    assert(d.templateOf(a) ==
      Vector("Sending", "<*>", "bytes", "src:", "<*>", "dest:", "<*>"))
  }

  test("different lengths never share a group") {
    val d = new Drain()
    val a = d.parse("a b c")
    val b = d.parse("a b c d")
    assert(a != b)
  }

  test("unrelated messages of equal length split into groups") {
    val d = new Drain(simThreshold = 0.5)
    val a = d.parse("Error while receiving data from node")
    val b = d.parse("Volume vol-1 attached correctly on node")
    assert(a != b)
  }

  test("static tokens stay static") {
    val d = new Drain()
    (1 to 10).foreach(i => d.parse(s"Received ack for $i packets"))
    assert(d.templateOf(0) == Vector("Received", "ack", "for", "<*>", "packets"))
  }

  test("templates map holds every mined group") {
    val d = new Drain()
    d.parse("x y z")
    d.parse("q r s t")
    assert(d.templates.keySet == Set(0, 1))
  }

  test("matchOnly finds an existing group without learning") {
    val d = new Drain()
    val id = d.parse("Spawning instance i-1 on host node-01")
    d.parse("Spawning instance i-2 on host node-02")
    val before = d.templates.size
    assert(d.matchOnly("Spawning instance i-9 on host node-07").contains(id))
    assert(d.templates.size == before)
  }

  test("matchOnly returns None for a novel message and does not mutate") {
    val d = new Drain()
    d.parse("alpha beta gamma")
    val before = d.templates
    assert(d.matchOnly("one two three four five").isEmpty)
    assert(d.templates == before)
  }

  test("matchOnly on an empty tree is None") {
    assert(new Drain().matchOnly("anything at all").isEmpty)
  }

  test("simThreshold=1.0 only merges exact (post-mask) duplicates") {
    val d = new Drain(simThreshold = 1.0)
    val a = d.parse("fixed one two")
    val b = d.parse("fixed one three")
    assert(a != b)
  }

  test("low simThreshold merges same-prefix messages") {
    val d = new Drain(simThreshold = 0.2)
    val a = d.parse("task started on node alpha")
    val b = d.parse("task started on node beta")
    assert(a == b)
  }

  test("digit-bearing first tokens descend the wildcard path together") {
    val d = new Drain()
    val a = d.parse("42 units remaining today")
    val b = d.parse("97 units remaining today")
    assert(a == b)
  }

  test("maxChildren caps branching via the wildcard child") {
    val d = new Drain(maxChildren = 2, simThreshold = 0.9)
    val ids = ('a' to 'j').map(c => d.parse(s"${c}head tail token word"))
    // groups still distinct because similarity is low, but no crash and
    // the tree stayed bounded
    assert(ids.distinct.size == ids.size)
  }

  test("group ids are dense from zero") {
    val d = new Drain()
    d.parse("m one")
    d.parse("n two three")
    d.parse("o four five six")
    assert(d.templates.keySet == Set(0, 1, 2))
  }

  test("serializes and deserializes with state intact") {
    val d = new Drain()
    val id = d.parse("Sending 1 bytes src: a dest: b")
    d.parse("Sending 2 bytes src: c dest: d")
    val bytes = new java.io.ByteArrayOutputStream()
    val oos = new java.io.ObjectOutputStream(bytes)
    oos.writeObject(d); oos.close()
    val d2 = new java.io.ObjectInputStream(
      new java.io.ByteArrayInputStream(bytes.toByteArray)).readObject().asInstanceOf[Drain]
    assert(d2.matchOnly("Sending 3 bytes src: e dest: f").contains(id))
  }

  test("parse order independence for disjoint templates (fuzz)") {
    val templates = Seq("aa bb cc", "dd ee ff gg", "hh ii", "jj kk ll mm nn")
    val rng = new Random(7)
    (1 to 20).foreach { _ =>
      val msgs = rng.shuffle(templates.flatMap(t => Seq.fill(3)(t)))
      val d = new Drain()
      msgs.foreach(d.parse)
      assert(d.templates.size == templates.size)
    }
  }

  test("mined template count matches ground truth on a generated source") {
    val d = new Drain(4, 0.5)
    val rng = new Random(3)
    val msgs = (1 to 500).map { _ =>
      repro.logs.Flows.networkTemplates(rng.nextInt(repro.logs.Flows.networkTemplates.size))
    }.map(td => repro.logs.LogSynth.instantiate(td, rng, quantAnomaly = false)._1)
    msgs.foreach(d.parse)
    assert(d.templates.size == repro.logs.Flows.networkTemplates.size)
  }
}
