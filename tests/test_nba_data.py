"""Synthetic NBA dataset: schema integrity + planted signals (DESIGN #1)."""
import pytest

TABLES = [
    "season", "team", "player", "game", "play_for", "player_salary",
    "player_game_stats", "team_game_stats", "lineup", "lineup_player",
    "lineup_game_stats",
]


@pytest.mark.parametrize("name", TABLES)
def test_tables_present_and_nonempty(nba_db, name):
    assert nba_db.n_rows(name) > 0


@pytest.mark.parametrize("name", TABLES)
def test_primary_keys_unique(nba_db, name):
    pk = list(nba_db.pk(name))
    total = nba_db.n_rows(name)
    assert nba_db.df(name).select(*pk).distinct().count() == total


def test_season_rows(nba_pandas):
    s = nba_pandas["season"]
    assert len(s) == 20  # 10 seasons × {regular, playoffs}
    assert set(s["season_type"]) == {"regular season", "playoffs"}


def test_games_reference_valid_teams(nba_pandas):
    teams = set(nba_pandas["team"]["team_id"])
    g = nba_pandas["game"]
    assert set(g["home_id"]).issubset(teams)
    assert set(g["away_id"]).issubset(teams)
    assert set(g["winner_id"]).issubset(teams)


def test_winner_is_participant(nba_pandas):
    g = nba_pandas["game"]
    assert ((g["winner_id"] == g["home_id"]) | (g["winner_id"] == g["away_id"])).all()


def test_pgs_fk_into_game(nba_pandas):
    g = nba_pandas["game"][["game_date", "home_id"]]
    pgs = nba_pandas["player_game_stats"][["game_date", "home_id"]]
    merged = pgs.merge(g.drop_duplicates(), on=["game_date", "home_id"])
    assert len(merged) == len(pgs)


def test_salary_fk_into_player_and_season(nba_pandas):
    sal = nba_pandas["player_salary"]
    assert set(sal["player_id"]).issubset(set(nba_pandas["player"]["player_id"]))
    assert set(sal["season_id"]).issubset(set(nba_pandas["season"]["season_id"]))


def test_lineups_have_five_players_or_roster(nba_pandas):
    per = nba_pandas["lineup_player"].groupby("lineup_id").size()
    assert (per <= 5).all() and (per >= 1).all()


def _avg_pts(nba_pandas, player, season):
    p = nba_pandas["player"]
    pid = p.loc[p.player_name == player, "player_id"].iloc[0]
    pgs = nba_pandas["player_game_stats"]
    g = nba_pandas["game"][["game_date", "home_id", "season_id"]]
    s = nba_pandas["season"][["season_id", "season_name"]]
    j = pgs.merge(g, on=["game_date", "home_id"]).merge(s, on="season_id")
    sel = j[(j.player_id == pid) & (j.season_name == season)]
    return sel["points"].mean()


def test_curry_scoring_jump(nba_pandas):
    assert _avg_pts(nba_pandas, "Stephen Curry", "2015-16") > _avg_pts(
        nba_pandas, "Stephen Curry", "2012-13"
    )


def test_green_points_arc(nba_pandas):
    assert _avg_pts(nba_pandas, "Draymond Green", "2015-16") > _avg_pts(
        nba_pandas, "Draymond Green", "2012-13"
    )


def test_lebron_dip_after_move(nba_pandas):
    assert _avg_pts(nba_pandas, "LeBron James", "2009-10") > _avg_pts(
        nba_pandas, "LeBron James", "2010-11"
    )


def test_butler_breakout(nba_pandas):
    assert _avg_pts(nba_pandas, "Jimmy Butler", "2014-15") > _avg_pts(
        nba_pandas, "Jimmy Butler", "2013-14"
    )


def _salary(nba_pandas, player, season_prefix):
    p = nba_pandas["player"]
    pid = p.loc[p.player_name == player, "player_id"].iloc[0]
    sal = nba_pandas["player_salary"]
    row = sal[(sal.player_id == pid) & (sal.season_id.str.startswith(season_prefix))]
    return int(row["salary"].iloc[0])


def test_green_salary_constants(nba_pandas):
    # the exact constants the paper's Q_nba1 explanations quote
    assert _salary(nba_pandas, "Draymond Green", "S06") == 14_260_870
    assert _salary(nba_pandas, "Draymond Green", "S07") == 15_330_435


def test_lebron_salary_drop(nba_pandas):
    assert _salary(nba_pandas, "LeBron James", "S00") > 14_500_000
    assert _salary(nba_pandas, "LeBron James", "S01") <= 14_500_000


def test_butler_salary_raise(nba_pandas):
    assert _salary(nba_pandas, "Jimmy Butler", "S04") <= 1_112_880
    assert _salary(nba_pandas, "Jimmy Butler", "S05") > 1_112_880


def test_iguodala_joins_gsw_2013(nba_pandas):
    p = nba_pandas["player"]
    pid = p.loc[p.player_name == "Andre Iguodala", "player_id"].iloc[0]
    pf = nba_pandas["play_for"]
    t = nba_pandas["team"]
    gsw = t.loc[t.team == "GSW", "team_id"].iloc[0]
    stint = pf[(pf.player_id == pid) & (pf.team_id == gsw)]
    assert len(stint) == 1
    assert stint["date_start"].iloc[0].startswith("2013")


def test_gsw_assists_surge(nba_pandas):
    tgs = nba_pandas["team_game_stats"]
    t = nba_pandas["team"]
    g = nba_pandas["game"][["game_date", "home_id", "season_id"]]
    s = nba_pandas["season"][["season_id", "season_name"]]
    gsw = t.loc[t.team == "GSW", "team_id"].iloc[0]
    j = tgs[tgs.team_id == gsw].merge(g, on=["game_date", "home_id"]).merge(
        s, on="season_id"
    )
    early = j[j.season_name == "2013-14"]["assists"].mean()
    late = j[j.season_name == "2014-15"]["assists"].mean()
    assert late > early + 2


def test_death_lineup_minutes(nba_pandas):
    lgs = nba_pandas["lineup_game_stats"]
    g = nba_pandas["game"][["game_date", "home_id", "season_id"]]
    s = nba_pandas["season"][["season_id", "season_name"]]
    j = lgs[lgs.lineup_id == "L_GSW_0"].merge(
        g, on=["game_date", "home_id"]
    ).merge(s, on="season_id")
    assert (
        j[j.season_name == "2015-16"]["mp"].mean()
        > j[j.season_name == "2012-13"]["mp"].mean() + 10
    )


def test_gsw_win_trajectory_shape(nba_db):
    from repro.workload import Q_NBA4

    rows = {
        r["season_name"]: r["win"] for r in Q_NBA4.result(nba_db).collect()
    }
    # 2015-16 must beat 2012-13 and 2011-12 (the planted famous seasons)
    assert rows.get("2015-16", 0) >= rows.get("2012-13", 0)


def test_sf_scales_game_count(spark):
    from repro.data.nba import generate_nba

    small = generate_nba(spark, sf=0.04)
    big = generate_nba(spark, sf=0.12)
    assert big.n_rows("game") > small.n_rows("game") * 2
