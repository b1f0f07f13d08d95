"""NodePool: the §6 deferred free-list protocol in isolation."""
from repro.core.node import Node
from repro.core.pool import NodePool


def test_alloc_fresh_when_empty():
    p = NodePool()
    nd = p.alloc()
    assert isinstance(nd, Node) and not nd.freed
    assert nd.times == [] and nd.children == []


def test_free_then_alloc_reuses():
    p = NodePool()
    nd = p.alloc()
    nd.times = [1, 2]
    p.free(nd)
    assert nd.freed and len(p) == 1
    nd2 = p.alloc()
    assert nd2 is nd
    assert nd2.times == [] and not nd2.freed


def test_alloc_pushes_children_of_popped_node():
    """The deferred-reclamation step: pop one, push its children."""
    p = NodePool()
    parent, c1, c2 = Node(), Node(), Node()
    parent.children = [c1, c2]
    p.free(parent)
    assert len(p) == 1
    nd = p.alloc()
    assert nd is parent
    assert len(p) == 2  # children now await reuse
    assert {p.alloc(), p.alloc()} == {c1, c2}
    assert len(p) == 0


def test_disabled_pool_drops_everything():
    p = NodePool(enabled=False)
    parent, child = Node(), Node()
    parent.children = [child]
    p.free(parent)
    assert len(p) == 0
    assert parent.children == []  # eager cascade cut


def test_freed_flags_cleared_on_spines():
    p = NodePool()
    nd = Node()
    nd.left_spine = True
    p.free(nd)
    assert not nd.left_spine and nd.parent is None
