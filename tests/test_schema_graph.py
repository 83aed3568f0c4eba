"""Schema graph model (Def. 2)."""
import pytest

from repro.core.schema_graph import JoinCond, SchemaGraph, fk_cond


def test_fk_cond_pairs():
    c = fk_cond(("a", "b"), ("x", "y"))
    assert c.pairs == (("a", "b"), ("x", "y"))
    assert c.consts == ()


def test_flip_pairs():
    c = fk_cond(("a", "b")).flipped()
    assert c.pairs == (("b", "a"),)


def test_flip_consts():
    c = JoinCond(pairs=(("a", "b"),), consts=(("l", "home", "GSW"),))
    f = c.flipped()
    assert f.consts == (("r", "home", "GSW"),)
    assert f.flipped() == c


def test_left_right_attrs():
    c = JoinCond(pairs=(("a", "b"), ("x", "y")), consts=(("r", "w", 1),))
    assert c.left_attrs() == ("a", "x")
    assert c.right_attrs() == ("b", "y", "w")


def test_describe():
    c = fk_cond(("year", "year"))
    assert c.describe("G", "P") == "(G.year)=(P.year)"


def test_add_edge_unknown_relation():
    sg = SchemaGraph(relations=("a",))
    with pytest.raises(ValueError):
        sg.add_edge("a", "zzz", fk_cond(("x", "x")))


def test_add_edge_requires_condition():
    sg = SchemaGraph(relations=("a", "b"))
    with pytest.raises(ValueError):
        sg.add_edge("a", "b")


def test_adjacent_orientation():
    sg = SchemaGraph(relations=("a", "b"))
    sg.add_edge("a", "b", fk_cond(("x", "y")))
    (e1, left1), = sg.adjacent("a")
    (e2, left2), = sg.adjacent("b")
    assert left1 and not left2
    assert e1 is e2


def test_self_loop_reported_once():
    sg = SchemaGraph(relations=("a",))
    sg.add_edge("a", "a", fk_cond(("x", "x")))
    adj = sg.adjacent("a")
    assert len(adj) == 1 and adj[0][1] is True


def test_multiple_conditions_per_edge():
    sg = SchemaGraph(relations=("game", "team"))
    sg.add_edge(
        "game", "team",
        fk_cond(("home_id", "team_id")),
        fk_cond(("away_id", "team_id")),
        fk_cond(("winner_id", "team_id")),
    )
    (e, _), = sg.adjacent("game")
    assert len(e.conds) == 3


def test_nba_schema_graph_shape():
    from repro.data.nba import nba_schema_graph

    sg = nba_schema_graph()
    assert len(sg.relations) == 11
    assert len(sg.edges) == 15


def test_mimic_schema_graph_shape():
    from repro.data.mimic import mimic_schema_graph

    sg = mimic_schema_graph()
    assert len(sg.relations) == 6
    assert len(sg.edges) == 9
