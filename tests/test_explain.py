"""End-to-end CaJaDE (§4) on the toy schema graph + NBA sanity check."""
import pytest

from repro.core.config import CajadeParams
from repro.core.explain import dedupe_explanations, explain
from repro.core.join_graph import is_valid


@pytest.fixture(scope="module")
def toy_result(toy_db, toy_sg, toy_query):
    params = CajadeParams(
        n_edges=1, k=5, f1_samp=1.0, pat_samp=1.0, recall_threshold=0.2
    )
    return explain(
        toy_db,
        toy_sg,
        toy_query,
        {"season": "2015-16"},
        {"season": "2012-13"},
        params,
    )


def test_globally_ranked_by_fscore(toy_result):
    scores = [e.fscore for e in toy_result.explanations]
    assert scores == sorted(scores, reverse=True)


def test_enumerates_pt_and_context_graph(toy_result):
    structures = {j.structure() for j in toy_result.join_graphs}
    assert "PT" in structures
    assert "PT - player_game_scoring" in structures


def test_mined_subset_of_enumerated(toy_result):
    assert set(toy_result.mined) <= set(range(toy_result.n_join_graphs))


def test_timer_includes_jg_enum(toy_result):
    assert "JG Enum." in toy_result.timer.times


def test_top_explanation_is_meaningful(toy_result):
    top = toy_result.explanations[0]
    assert top.fscore > 0.5


def test_dedupe_keeps_best_per_description(toy_result):
    deduped = dedupe_explanations(toy_result.explanations)
    descs = [e.describe() for e in deduped]
    assert len(descs) == len(set(descs))


def test_dedupe_top_limit(toy_result):
    assert len(dedupe_explanations(toy_result.explanations, 2)) <= 2


def test_pk_connectivity_prunes(toy_db, toy_sg, toy_query, toy_pt):
    """PT–player_game_scoring joins only the game part of the PK
    (year,month,day,home) but not player → isValid must reject it only if
    the player attr is unjoined; our toy edge covers 4 of 5 PK attrs."""
    from repro.core.join_graph import enumerate_join_graphs

    jgs = enumerate_join_graphs(toy_sg, toy_query, 1)
    one_edge = [j for j in jgs if j.n_edges == 1]
    assert one_edge
    # player_game_scoring PK includes 'player' which no edge joins → invalid
    assert not any(
        is_valid(j, toy_db, toy_pt.n_rows, 1e9) for j in one_edge
    )


def test_cost_cap_prunes_everything(toy_db, toy_sg, toy_query, toy_pt):
    from repro.core.join_graph import enumerate_join_graphs

    jgs = enumerate_join_graphs(toy_sg, toy_query, 1)
    assert not any(
        is_valid(j, toy_db, toy_pt.n_rows, q_cost=0.0) for j in jgs if j.n_edges
    )


def test_nba_explain_small(nba_db):
    """One-edge CaJaDE run over the NBA schema graph finds something."""
    from repro.data.nba import nba_schema_graph
    from repro.workload import UQ_1

    params = CajadeParams(n_edges=1, k=3, f1_samp=1.0, q_cost=5e5)
    res = explain(
        nba_db, nba_schema_graph(), UQ_1.query, UQ_1.t1, UQ_1.t2, params
    )
    assert res.n_mined >= 1
    assert res.explanations
