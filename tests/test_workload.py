"""Workload queries (Tables 3/5) checked against the DuckDB oracle, and
user-question tuples present in the answers."""
import pytest

from repro.oracle import assert_equivalent
from repro import workload as W

NBA_CASES = [
    ("Q_nba1", W.Q_NBA1),
    ("Q_nba2", W.Q_NBA2),
    ("Q_nba3", W.Q_NBA3),
    ("Q_nba4", W.Q_NBA4),
    ("Q_nba5", W.Q_NBA5),
]
MIMIC_CASES = [
    ("Q_mimic1", W.Q_MIMIC1),
    ("Q_mimic2", W.Q_MIMIC2),
    ("Q_mimic3", W.Q_MIMIC3),
    ("Q_mimic5", W.Q_MIMIC5),
]


@pytest.mark.parametrize("name,q", NBA_CASES, ids=[n for n, _ in NBA_CASES])
def test_nba_query_matches_duckdb(nba_db, nba_pandas, name, q):
    tables = {rel: nba_pandas[rel] for rel in q.relations}
    assert_equivalent(q.result(nba_db), q.to_sql(), **tables)


@pytest.mark.parametrize("name,q", MIMIC_CASES, ids=[n for n, _ in MIMIC_CASES])
def test_mimic_query_matches_duckdb(mimic_db, mimic_pandas, name, q):
    tables = {rel: mimic_pandas[rel] for rel in q.relations}
    assert_equivalent(q.result(mimic_db), q.to_sql(), **tables)


@pytest.mark.parametrize(
    "uq", list(W.NBA_QUESTIONS.values()), ids=list(W.NBA_QUESTIONS)
)
def test_nba_user_question_groups_exist(nba_db, uq):
    groups = {
        tuple(r[k] for k in uq.t1) for r in uq.query.result(nba_db).collect()
    }
    assert tuple(uq.t1.values()) in groups
    assert tuple(uq.t2.values()) in groups


@pytest.mark.parametrize(
    "uq", list(W.MIMIC_QUESTIONS.values()), ids=list(W.MIMIC_QUESTIONS)
)
def test_mimic_user_question_groups_exist(mimic_db, uq):
    groups = {
        tuple(r[k] for k in uq.t1) for r in uq.query.result(mimic_db).collect()
    }
    assert tuple(uq.t1.values()) in groups
    assert tuple(uq.t2.values()) in groups


def test_uq1_is_running_example():
    assert W.UQ_1.query is W.Q_NBA4
    assert W.UQ_1.t1 == {"season_name": "2015-16"}


def test_death_rate_agg_returns_fraction(mimic_db):
    rows = W.Q_MIMIC2.result(mimic_db).collect()
    assert all(0.0 <= r["death_rate"] <= 1.0 for r in rows)
