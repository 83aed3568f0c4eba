"""AggQuery model + SQL rendering, checked against the DuckDB oracle."""
import pytest

from repro.oracle import assert_equivalent
from repro.substrate.query import AggQuery, split_ref


def test_split_ref():
    assert split_ref("g.season_id") == ("g", "season_id")


def test_split_ref_rejects_unqualified():
    with pytest.raises(ValueError):
        split_ref("season_id")


def test_duplicate_aliases_rejected():
    with pytest.raises(ValueError):
        AggQuery(tables=(("a", "x"), ("b", "x")))


def test_relations_deduped():
    q = AggQuery(tables=(("game", "g1"), ("game", "g2")))
    assert q.relations == ("game",)


def test_where_sql_no_conditions():
    q = AggQuery(tables=(("game", "g"),))
    assert q.where_sql() == "1 = 1"


def test_literal_escaping(toy_db):
    q = AggQuery(
        tables=(("game", "g"),),
        filters=(("g.winner", "O'Brien"),),
        agg="count(*)",
        agg_alias="c",
    )
    assert "O''Brien" in q.to_sql()
    assert q.result(toy_db).collect()[0]["c"] == 0


def test_group_filter_sql(toy_query):
    assert toy_query.group_filter_sql({"season": "2015-16"}) == (
        "g.season = '2015-16'"
    )


def test_toy_query_result(toy_db, toy_query, toy_frames):
    game, _ = toy_frames
    assert_equivalent(
        toy_query.result(toy_db),
        "SELECT season, count(*) AS win FROM game "
        "WHERE winner = 'GSW' GROUP BY season",
        game=game,
    )


def test_toy_query_values(toy_db, toy_query):
    rows = {r["season"]: r["win"] for r in toy_query.result(toy_db).collect()}
    assert rows == {"2012-13": 1, "2015-16": 3}


def test_join_query_against_oracle(toy_db, toy_frames):
    game, pgs = toy_frames
    q = AggQuery(
        tables=(("game", "g"), ("player_game_scoring", "p")),
        join_conds=(
            ("g.year", "p.year"),
            ("g.month", "p.month"),
            ("g.day", "p.day"),
            ("g.home", "p.home"),
        ),
        filters=(("p.player", "S. Curry"),),
        group_by=(("g.season", "season"),),
        agg="avg(p.pts)",
        agg_alias="avg_pts",
    )
    assert_equivalent(
        q.result(toy_db),
        "SELECT g.season AS season, avg(p.pts) AS avg_pts "
        "FROM game g, player_game_scoring p "
        "WHERE g.year = p.year AND g.month = p.month AND g.day = p.day "
        "AND g.home = p.home AND p.player = 'S. Curry' GROUP BY g.season",
        game=game,
        player_game_scoring=pgs,
    )
