package repro.core

import org.scalatest.funsuite.AnyFunSuite

/** The progressive Link Index LI_E (paper §3/§6.1). */
class LinkIndexSpec extends AnyFunSuite {

  test("starts empty") {
    val li = new LinkIndex
    assert(li.resolvedCount == 0 && li.linkCount == 0 && !li.isResolved(1L))
  }
  test("markResolved registers entities") {
    val li = new LinkIndex
    li.markResolved(Seq(1L, 2L))
    assert(li.isResolved(1L) && li.isResolved(2L) && !li.isResolved(3L))
  }
  test("addLink is symmetric") {
    val li = new LinkIndex
    li.addLink(1L, 2L)
    assert(li.partners(1L) == Set(2L) && li.partners(2L) == Set(1L))
  }
  test("self links are ignored") {
    val li = new LinkIndex
    li.addLink(3L, 3L)
    assert(li.partners(3L).isEmpty && li.linkCount == 0)
  }
  test("linkCount counts undirected links once") {
    val li = new LinkIndex
    li.addLinks(Seq((1L, 2L), (2L, 1L), (2L, 3L)))
    assert(li.linkCount == 2)
  }
  test("closure follows transitive links") {
    val li = new LinkIndex
    li.addLinks(Seq((1L, 2L), (2L, 3L), (7L, 8L)))
    assert(li.closure(Seq(1L)) == Set(1L, 2L, 3L))
  }
  test("closure of multiple seeds unions their components") {
    val li = new LinkIndex
    li.addLinks(Seq((1L, 2L), (7L, 8L)))
    assert(li.closure(Seq(1L, 7L)) == Set(1L, 2L, 7L, 8L))
  }
  test("closure of an unlinked id is itself") {
    val li = new LinkIndex
    assert(li.closure(Seq(42L)) == Set(42L))
  }
  test("linksAmong restricts both endpoints and canonicalises order") {
    val li = new LinkIndex
    li.addLinks(Seq((2L, 1L), (2L, 9L)))
    assert(li.linksAmong(Set(1L, 2L)).toSet == Set((1L, 2L)))
    assert(li.linksAmong(Set(1L, 2L, 9L)).toSet == Set((1L, 2L), (2L, 9L)))
  }
  test("clear resets all state") {
    val li = new LinkIndex
    li.addLink(1L, 2L); li.markResolved(Seq(1L))
    li.clear()
    assert(li.linkCount == 0 && li.resolvedCount == 0)
  }
  test("partners of unknown id is empty") {
    assert((new LinkIndex).partners(99L).isEmpty)
  }
}
