"""Dataset scaling utilities (§5 'Datasets')."""
import pytest

from repro.data.scaling import scale_down, scale_up


@pytest.fixture(scope="module")
def scaled2(toy_db):
    return scale_up(toy_db, 2)


def test_scale_up_doubles_rows(toy_db, scaled2):
    for name in toy_db.names():
        assert scaled2.n_rows(name) == 2 * toy_db.n_rows(name)


def test_scale_up_keeps_pk_unique(toy_db, scaled2):
    for name in toy_db.names():
        pk = list(toy_db.pk(name))
        assert (
            scaled2.df(name).select(*pk).distinct().count()
            == scaled2.n_rows(name)
        )


def test_scale_up_scales_join_result(toy_db, scaled2):
    def join_count(db):
        g = db.df("game")
        p = db.df("player_game_scoring")
        return g.join(
            p, on=["year", "month", "day", "home"], how="inner"
        ).count()

    assert join_count(scaled2) == 2 * join_count(toy_db)


def test_scale_up_factor_1_identity(toy_db):
    s = scale_up(toy_db, 1)
    for name in toy_db.names():
        assert s.n_rows(name) == toy_db.n_rows(name)


def test_scale_up_rejects_zero(toy_db):
    with pytest.raises(ValueError):
        scale_up(toy_db, 0)


def test_scale_down_bounds(toy_db):
    with pytest.raises(ValueError):
        scale_down(toy_db, 0.0)
    with pytest.raises(ValueError):
        scale_down(toy_db, 1.5)


def test_scale_down_shrinks_nba(nba_db):
    small = scale_down(nba_db, 0.5, seed=0)
    big_rows = nba_db.n_rows("player_game_stats")
    small_rows = small.n_rows("player_game_stats")
    assert small_rows < big_rows


def test_scale_down_factor_1_identity(nba_db):
    same = scale_down(nba_db, 1.0)
    assert same.n_rows("game") == nba_db.n_rows("game")


def test_scale_down_preserves_fk_joinability(nba_db):
    """Sampled child rows still join to surviving parents (hash-coupled)."""
    small = scale_down(nba_db, 0.5, seed=0)
    sal = small.df("player_salary")
    players = small.df("player")
    joined = sal.join(players, on=sal.player_id == players.player_id).count()
    assert joined == small.n_rows("player_salary")
