"""Join graphs (Def. 3) and Algorithm 2 enumeration, without Spark."""
import pytest

from repro.substrate.query import AggQuery
from repro.core.join_graph import (
    PT_NODE,
    JGEdge,
    JoinGraph,
    empty_join_graph,
    enumerate_join_graphs,
    extend_jg,
)
from repro.core.schema_graph import SchemaGraph, fk_cond


@pytest.fixture()
def sg():
    g = SchemaGraph(relations=("game", "pgs", "player"))
    g.add_edge("game", "pgs", fk_cond(("gid", "gid")))
    g.add_edge("pgs", "player", fk_cond(("pid", "pid")))
    return g


@pytest.fixture()
def q():
    return AggQuery(
        tables=(("game", "g"),),
        group_by=(("g.season", "season"),),
        agg="count(*)",
        agg_alias="c",
    )


def test_empty_graph_is_pt_only():
    jg = empty_join_graph()
    assert jg.nodes == ((PT_NODE, None),)
    assert jg.n_edges == 0
    assert jg.structure() == "PT"


def test_extend_from_pt(sg, q):
    exts = extend_jg(empty_join_graph(), sg, q)
    # game only borders pgs → exactly one extension
    assert len(exts) == 1
    (jg,) = exts
    assert jg.structure() == "PT - pgs"
    assert jg.edges[0].rel1 == "game" and jg.edges[0].rel2 == "pgs"


def test_enumerate_sizes(sg, q):
    jgs = enumerate_join_graphs(sg, q, 2)
    by_size = {}
    for j in jgs:
        by_size.setdefault(j.n_edges, []).append(j)
    assert len(by_size[0]) == 1
    assert len(by_size[1]) == 1  # PT - pgs
    # size 2: PT-pgs-player, two pgs copies, and PT-pgs-game (a context
    # copy of an accessed relation is allowed by Def. 3)
    assert len(by_size[2]) == 3
    structures = {j.structure() for j in by_size[2]}
    assert "PT - pgs - player" in structures
    assert "PT - pgs - pgs2" in structures or "PT - pgs - pgs" in structures


def test_enumeration_growth_is_monotone(sg, q):
    assert len(enumerate_join_graphs(sg, q, 1)) < len(
        enumerate_join_graphs(sg, q, 3)
    )


def test_signature_dedupes_isomorphic(sg, q):
    # Building the same graph with different node ids must give equal sigs.
    e1 = JGEdge(PT_NODE, 1, fk_cond(("gid", "gid")), "game", "pgs")
    a = JoinGraph(nodes=((PT_NODE, None), (1, "pgs")), edges=(e1,))
    e2 = JGEdge(PT_NODE, 2, fk_cond(("gid", "gid")), "game", "pgs")
    b = JoinGraph(nodes=((PT_NODE, None), (2, "pgs")), edges=(e2,))
    # node ids are normalised relative to sorted order, so re-label b
    b2 = JoinGraph(nodes=((PT_NODE, None), (1, "pgs")), edges=(e1,))
    assert a.signature() == b2.signature()
    assert a.signature() != empty_join_graph().signature()


def test_edge_normalized_flips():
    e = JGEdge(3, 1, fk_cond(("a", "b")), "x", "y")
    n = e.normalized()
    assert (n.n1, n.n2) == (1, 3)
    assert n.cond.pairs == (("b", "a"),)
    assert (n.rel1, n.rel2) == ("y", "x")


def test_no_pt_pt_edges_enumerated(sg, q):
    for jg in enumerate_join_graphs(sg, q, 3):
        for e in jg.edges:
            assert not (e.n1 == PT_NODE and e.n2 == PT_NODE)


def test_describe_mentions_pt(sg, q):
    jgs = enumerate_join_graphs(sg, q, 1)
    assert any("PT" in j.describe() for j in jgs)


def test_nba_enumeration_counts():
    from repro.data.nba import nba_schema_graph
    from repro.workload import Q_NBA4

    sg = nba_schema_graph()
    jgs1 = enumerate_join_graphs(sg, Q_NBA4, 1)
    jgs2 = enumerate_join_graphs(sg, Q_NBA4, 2)
    # Q_NBA4 accesses game/team/season → several 1-edge graphs exist.
    assert len(jgs1) > 5
    assert len(jgs2) > len(jgs1) * 2


def test_parallel_edges_allowed():
    # game–team has 3 conditions: PT(team,game) query gets parallel edges
    from repro.data.nba import nba_schema_graph
    from repro.workload import Q_NBA4

    sg = nba_schema_graph()
    jgs = enumerate_join_graphs(sg, Q_NBA4, 2)
    two_edge_single_node = [
        j
        for j in jgs
        if j.n_edges == 2 and len(j.context_nodes()) == 1
    ]
    assert two_edge_single_node, "parallel edges between PT and one node"
