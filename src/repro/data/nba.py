"""Synthetic NBA database (schema of Fig. 5) with planted signals.

The real dataset was scraped from nba.com and is not available offline
(DESIGN.md substitution #1). This generator reproduces the schema and —
crucially — the correlations that the paper's case-study explanations hinge
on, so that CaJaDE's search should surface the same attributes/constants:

  * GSW's per-season win trajectory (26,36,23,47,51,67,73,67,58,57);
  * Stephen Curry's 2015-16 scoring/usage jump;
  * Draymond Green's points arc and his 2016-17 salary raise
    (14,260,870 → 15,330,435);
  * LeBron James's CLE→MIA move after 2009-10 with a salary drop past
    14,500,000 and a points dip;
  * Jimmy Butler's 2014-15 breakout (minutes/usage up, salary > 1,112,880);
  * Andre Iguodala joining GSW for 2013-14; Jarrett Jack GSW-only 2012-13;
  * GSW's team-assist surge from 2014-15 (assistpoints with it);
  * the Green+Thompson lineup logging big joint minutes only from 2014-15.

All tables are generated in pandas (vectorised per season) and returned as
a :class:`repro.substrate.catalog.Database`. ``sf=1.0`` ≈ 600 games/season
over 10 seasons (~130k player_game_stats rows, same order as the paper's
17 MB dataset); ``sf`` scales games per season.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.substrate.catalog import Database
from repro.core.schema_graph import SchemaGraph, fk_cond

SEASONS = [
    "2009-10", "2010-11", "2011-12", "2012-13", "2013-14",
    "2014-15", "2015-16", "2016-17", "2017-18", "2018-19",
]
TEAMS = [
    "GSW", "CLE", "MIA", "CHI", "LAL", "BOS", "SAS", "OKC", "HOU", "DET",
    "NOP", "IND", "PHI", "TOR", "MIL", "DEN", "POR", "UTA", "DAL", "MIN",
]
# GSW win fraction per season (wins / 82 from Fig. 14c).
_GSW_WINS = [26, 36, 23, 47, 51, 67, 73, 67, 58, 57]

_GAMES_PER_SEASON_SF1 = 600
_PLAYERS_PER_TEAM = 10
_STARS_PER_GAME = 8  # roster players logged per team per game

# (player, team by season index 0..9, pts mean by season, minutes, usage,
#  salary). ``None`` team → not in the league that season.
_STAR_PROFILES: dict[str, dict] = {
    "Stephen Curry": dict(
        team=["GSW"] * 10,
        pts=[17, 18, 15, 21, 24, 24, 29, 25, 26, 27],
        minutes=[36, 33, 32, 38, 36, 33, 34, 33, 33, 34],
        usage=[22, 23, 22, 25, 28, 28, 31, 30, 30, 30],
        salary=[2.7, 3.1, 3.9, 3.9, 9.9, 10.6, 11.4, 12.1, 34.7, 37.5],
    ),
    "Klay Thompson": dict(
        team=[None, None] + ["GSW"] * 8,
        pts=[0, 0, 12, 16, 18, 21, 22, 22, 20, 21],
        minutes=[0, 0, 24, 35, 35, 31, 33, 34, 34, 34],
        usage=[0, 0, 20, 22, 24, 26, 26, 26, 26, 26],
        salary=[0, 0, 2.2, 2.3, 3.1, 15.5, 15.5, 16.6, 17.8, 19.0],
    ),
    "Draymond Green": dict(
        team=[None, None, None] + ["GSW"] * 7,
        pts=[0, 0, 0, 2.9, 6.2, 11.7, 14.0, 10.2, 11.0, 7.4],
        minutes=[0, 0, 0, 13, 22, 32, 35, 33, 33, 28],
        usage=[0, 0, 0, 12, 14, 16, 19, 22, 19, 15],
        salary=[0, 0, 0, 0.85, 0.9, 0.92, 14.26087, 15.330435, 16.4, 17.5],
    ),
    "LeBron James": dict(
        team=["CLE", "MIA", "MIA", "MIA", "MIA", "CLE", "CLE", "CLE", "CLE", "LAL"],
        pts=[29.7, 26.7, 27.1, 26.8, 27.1, 25.3, 25.3, 26.4, 27.5, 27.4],
        minutes=[39, 38, 37, 38, 38, 36, 35, 37, 37, 35],
        usage=[33, 31, 32, 30, 31, 32, 31, 30, 31, 31],
        salary=[15.78, 14.5, 16.02, 17.55, 19.07, 20.64, 22.97, 30.96, 33.28, 35.65],
    ),
    "Jimmy Butler": dict(
        team=[None, None, "CHI", "CHI", "CHI", "CHI", "CHI", "CHI", "MIN", "PHI"],
        pts=[0, 0, 2.6, 8.6, 13.1, 20.0, 20.9, 23.9, 22.2, 18.7],
        minutes=[0, 0, 8, 26, 38, 38, 37, 37, 36, 33],
        usage=[0, 0, 10, 15, 17, 21, 22, 25, 23, 22],
        salary=[0, 0, 1.066, 1.107, 1.11288, 2.008748, 15.8, 17.55, 19.3, 20.4],
    ),
    "Andre Iguodala": dict(
        team=["PHI", "PHI", "PHI", "DEN", "GSW", "GSW", "GSW", "GSW", "GSW", "GSW"],
        pts=[17, 14, 12, 13, 9, 8, 7, 7.6, 6, 5.7],
        minutes=[38, 36, 35, 34, 32, 27, 27, 26, 25, 23],
        usage=[20, 18, 17, 16, 13, 12, 11, 12, 11, 11],
        salary=[12.2, 13.5, 14.7, 14.9, 12.0, 12.3, 11.7, 11.1, 14.8, 16.0],
    ),
    "Harrison Barnes": dict(
        team=[None, None, None, "GSW", "GSW", "GSW", "GSW", "DAL", "DAL", "DAL"],
        pts=[0, 0, 0, 9.2, 9.5, 10.1, 11.7, 19.2, 18.9, 17.6],
        minutes=[0, 0, 0, 25, 28, 28, 31, 35, 34, 32],
        usage=[0, 0, 0, 15, 15, 15, 16, 24, 23, 22],
        salary=[0, 0, 0, 2.9, 3.0, 3.2, 3.9, 22.1, 23.1, 24.1],
    ),
    "Jarrett Jack": dict(
        team=["IND", "TOR", "NOP", "GSW", "CLE", "CLE", "CLE", "NOP", None, None],
        pts=[8, 10, 13, 12.9, 9.5, 9, 8, 7, 0, 0],
        minutes=[24, 26, 30, 29, 28, 27, 25, 22, 0, 0],
        usage=[17, 18, 20, 20, 18, 17, 16, 15, 0, 0],
        salary=[3.0, 4.6, 5.0, 5.4, 6.3, 6.3, 6.3, 0.2, 0, 0],
    ),
    "Pau Gasol": dict(
        team=["LAL", "LAL", "LAL", "LAL", "LAL", "CHI", "CHI", "SAS", "SAS", "SAS"],
        pts=[18.3, 18.8, 17.4, 13.7, 17.4, 18.5, 16.5, 12.4, 10.1, 4.2],
        minutes=[37, 37, 37, 33, 31, 34, 31, 25, 23, 12],
        usage=[22, 23, 22, 20, 23, 24, 23, 19, 18, 14],
        salary=[16.45, 17.82, 18.7, 19.0, 19.28585, 7.1, 7.45, 15.5, 16.2, 16.8],
    ),
}


def _season_id(si: int, stype: str) -> str:
    return f"S{si:02d}{'R' if stype == 'regular season' else 'P'}"


def generate_nba(
    spark: SparkSession, *, sf: float = 0.1, seed: int = 7
) -> Database:
    """Generate the 11-relation NBA database at scale factor ``sf``."""
    rng = np.random.default_rng(seed)
    n_games = max(20, int(_GAMES_PER_SEASON_SF1 * sf))
    n_seasons = len(SEASONS)

    # --- season / team / player dimension tables -----------------------
    season_pdf = pd.DataFrame(
        [
            (_season_id(i, st), s, st)
            for i, s in enumerate(SEASONS)
            for st in ("regular season", "playoffs")
        ],
        columns=["season_id", "season_name", "season_type"],
    )
    team_pdf = pd.DataFrame(
        {"team_id": [f"T{i:02d}" for i in range(len(TEAMS))], "team": TEAMS}
    )
    tid = dict(zip(team_pdf["team"], team_pdf["team_id"]))

    stars = list(_STAR_PROFILES)
    fillers = [f"Player_{i:03d}" for i in range(len(TEAMS) * _PLAYERS_PER_TEAM)]
    players = stars + fillers
    player_pdf = pd.DataFrame(
        {
            "player_id": [f"P{i:03d}" for i in range(len(players))],
            "player_name": players,
        }
    )
    pid = dict(zip(player_pdf["player_name"], player_pdf["player_id"]))

    # Rosters: star players per their profile, fillers round-robin.
    roster: dict[tuple[str, int], list[str]] = {
        (t, si): [] for t in TEAMS for si in range(n_seasons)
    }
    for name, prof in _STAR_PROFILES.items():
        for si, t in enumerate(prof["team"]):
            if t is not None:
                roster[(t, si)].append(name)
    for i, name in enumerate(fillers):
        t = TEAMS[i % len(TEAMS)]
        for si in range(n_seasons):
            roster[(t, si)].append(name)

    # Filler profiles: stable per player with mild season drift.
    filler_pts = {n: float(rng.uniform(4, 18)) for n in fillers}
    filler_min = {n: float(rng.uniform(12, 34)) for n in fillers}
    filler_sal = {n: float(rng.uniform(0.8, 12.0)) for n in fillers}

    # --- games ---------------------------------------------------------
    game_rows = []
    gsw_target = {si: _GSW_WINS[si] / 82.0 for si in range(n_seasons)}
    n_teams = len(TEAMS)
    for si in range(n_seasons):
        year = 2009 + si
        # Round-based schedule: each round pairs a permutation of all
        # teams (everyone plays every round, so every team has games at
        # every SF), plus extra GSW games so the planted win trajectory
        # has enough support.
        homes_l, aways_l = [], []
        n_rounds = max(1, n_games // (n_teams // 2))
        for _ in range(n_rounds):
            perm = rng.permutation(n_teams)
            homes_l.extend(perm[: n_teams // 2])
            aways_l.extend(perm[n_teams // 2:])
        n_extra = max(2, int(round(0.15 * n_games)))
        opp = rng.choice(np.arange(1, n_teams), size=n_extra)
        for j in range(n_extra):
            if j % 2 == 0:
                homes_l.append(0)
                aways_l.append(int(opp[j]))
            else:
                homes_l.append(int(opp[j]))
                aways_l.append(0)
        homes = np.array(homes_l)
        aways = np.array(aways_l)
        n_season_games = len(homes)
        dates = pd.to_datetime(f"{year}-10-20") + pd.to_timedelta(
            rng.choice(np.arange(0, 170), size=n_season_games, replace=True),
            unit="D",
        )
        # Deterministic GSW win count per season: exactly round(target ×
        # #GSW-games) wins, so the planted trajectory survives small SFs.
        gsw_mask = (homes == 0) | (aways == 0)
        gsw_idx = np.where(gsw_mask)[0]
        n_wins = int(round(gsw_target[si] * len(gsw_idx)))
        win_set = set(rng.choice(gsw_idx, size=n_wins, replace=False))
        for k in range(n_season_games):
            h, a = TEAMS[homes[k]], TEAMS[aways[k]]
            date = dates[k].strftime("%Y-%m-%d")
            if h == "GSW" or a == "GSW":
                winner = "GSW" if k in win_set else (a if h == "GSW" else h)
            else:
                winner = h if rng.random() < 0.55 else a
            w_pts = int(rng.normal(104, 8))
            l_pts = w_pts - int(rng.integers(1, 18))
            hp, ap = (w_pts, l_pts) if winner == h else (l_pts, w_pts)
            game_rows.append(
                (
                    date, tid[h], tid[a], hp, ap, tid[winner],
                    _season_id(si, "regular season"),
                    int(rng.normal(100, 5)), int(rng.normal(100, 5)),
                )
            )
    game_pdf = pd.DataFrame(
        game_rows,
        columns=[
            "game_date", "home_id", "away_id", "home_points", "away_points",
            "winner_id", "season_id", "home_possessions", "away_possessions",
        ],
    ).drop_duplicates(subset=["game_date", "home_id"]).reset_index(drop=True)

    # --- play_for / player_salary --------------------------------------
    pf_rows, sal_rows = [], []
    season_start = {si: f"{2009 + si}-10-01" for si in range(n_seasons)}
    season_end = {si: f"{2010 + si}-06-30" for si in range(n_seasons)}
    # Contiguous team stints for stars; fillers one stint per team.
    for name, prof in _STAR_PROFILES.items():
        si = 0
        while si < n_seasons:
            t = prof["team"][si]
            if t is None:
                si += 1
                continue
            s0 = si
            while si + 1 < n_seasons and prof["team"][si + 1] == t:
                si += 1
            pf_rows.append((pid[name], tid[t], season_start[s0], season_end[si]))
            si += 1
        for si2 in range(n_seasons):
            if prof["team"][si2] is not None:
                sal_rows.append(
                    (
                        pid[name],
                        _season_id(si2, "regular season"),
                        int(prof["salary"][si2] * 1_000_000),
                    )
                )
    for i, name in enumerate(fillers):
        t = TEAMS[i % len(TEAMS)]
        pf_rows.append((pid[name], tid[t], season_start[0], season_end[9]))
        for si in range(n_seasons):
            sal_rows.append(
                (
                    pid[name],
                    _season_id(si, "regular season"),
                    int(filler_sal[name] * 1_000_000 * (1 + 0.05 * si)),
                )
            )
    play_for_pdf = (
        pd.DataFrame(
            pf_rows, columns=["player_id", "team_id", "date_start", "date_end"]
        )
        # A player can have two stints with the same team (LeBron/CLE);
        # keep the latest so (player_id, team_id) stays a usable key for
        # the join-graph PK-connectivity check (the paper joins play_for
        # on exactly these two attributes in its appendix graphs).
        .sort_values("date_end")
        .drop_duplicates(subset=["player_id", "team_id"], keep="last")
        .reset_index(drop=True)
    )
    salary_pdf = pd.DataFrame(
        sal_rows, columns=["player_id", "season_id", "salary"]
    )

    # --- per-game stats -------------------------------------------------
    sid_to_si = {_season_id(si, "regular season"): si for si in range(n_seasons)}
    team_of_tid = dict(zip(team_pdf["team_id"], team_pdf["team"]))
    pgs_rows, tgs_rows = [], []
    for g in game_pdf.itertuples(index=False):
        si = sid_to_si[g.season_id]
        date = g.game_date
        for team_name in (team_of_tid[g.home_id], team_of_tid[g.away_id]):
            # team_game_stats with the planted GSW assist surge
            if team_name == "GSW":
                ast_mean = [22.4, 22.5, 22.3, 22.5, 23.3, 27.4, 28.9, 30.4, 29.3, 29.4][si]
            else:
                ast_mean = 21.5 + rng.normal(0, 0.5)
            assists = max(10, rng.normal(ast_mean, 2.0))
            points = max(70, rng.normal(103, 9))
            tgs_rows.append(
                (
                    tid[team_name], date, g.home_id, round(points),
                    round(assists), round(assists * 2.35 + rng.normal(0, 3), 1),
                    round(rng.normal(100, 5)),
                    round(rng.uniform(0.42, 0.56), 3),
                    round(rng.uniform(0.28, 0.42), 3),
                    round(rng.normal(9 + (2 if team_name == "GSW" and si >= 5 else 0), 2.5)),
                    round(rng.uniform(0.25, 0.40), 3),
                    round(rng.normal(43, 5)),
                    round(rng.uniform(0.45, 0.65), 3),
                    round(rng.uniform(0.55, 0.80), 3),
                    round(rng.uniform(0.20, 0.30), 3),
                    round(rng.uniform(0.44, 0.58), 3),
                    round(rng.uniform(0.44, 0.52), 3),
                )
            )
            # player_game_stats for a subset of the roster
            ros = roster[(team_name, si)]
            k = min(_STARS_PER_GAME, len(ros))
            chosen = [n for n in ros if n in _STAR_PROFILES][: k // 2]
            others = [n for n in ros if n not in chosen]
            sel = rng.choice(len(others), size=k - len(chosen), replace=False)
            chosen += [others[j] for j in sel]
            for name in chosen:
                if name in _STAR_PROFILES:
                    prof = _STAR_PROFILES[name]
                    pts_m, min_m, usg_m = (
                        prof["pts"][si], prof["minutes"][si], prof["usage"][si]
                    )
                else:
                    pts_m, min_m, usg_m = (
                        filler_pts[name], filler_min[name], 14 + filler_pts[name] / 2
                    )
                pts = max(0, rng.normal(pts_m, max(1.5, pts_m * 0.18)))
                mins = float(np.clip(rng.normal(min_m, 4), 0, 48))
                pgs_rows.append(
                    (
                        pid[name], date, g.home_id, round(pts),
                        round(mins, 2), round(max(5, rng.normal(usg_m, 2.5)), 2),
                        round(np.clip(rng.normal(0.55, 0.09), 0.0, 1.0), 3),
                        round(np.clip(rng.normal(0.50, 0.09), 0.0, 1.0), 3),
                        round(max(0, rng.normal(8, 4)), 1),
                        round(np.clip(rng.normal(0.5, 0.2), 0, 1), 3),
                        round(np.clip(rng.normal(0.25, 0.1), 0, 1), 3),
                        round(np.clip(rng.normal(0.15, 0.08), 0, 1), 3),
                    )
                )
    pgs_pdf = pd.DataFrame(
        pgs_rows,
        columns=[
            "player_id", "game_date", "home_id", "points", "minutes", "usage",
            "tspct", "efgpct", "assistpoints", "assisted_two_spct",
            "fg_three_apct", "deflongmidrangereboundpct",
        ],
    ).drop_duplicates(subset=["player_id", "game_date", "home_id"])
    tgs_pdf = pd.DataFrame(
        tgs_rows,
        columns=[
            "team_id", "game_date", "home_id", "points", "assists",
            "assistpoints", "offposs", "fg_two_pct", "fg_three_pct",
            "fg_three_m", "fg_three_apct", "rebounds", "assisted_two_spct",
            "assisted_three_spct", "offatrimreboundpct",
            "nonputbacksassisted_two_spct", "shotqualityavg",
        ],
    ).drop_duplicates(subset=["team_id", "game_date", "home_id"])

    # --- lineups --------------------------------------------------------
    lu_rows, lup_rows, lgs_rows = [], [], []
    lineup_of_team: dict[str, list[str]] = {}
    n_lineups = 3
    for t in TEAMS:
        ids = []
        for j in range(n_lineups):
            lu_id = f"L_{t}_{j}"
            lu_rows.append((lu_id, tid[t]))
            ros = roster[(t, 5)]  # representative roster
            members = list(ros[:5]) if j == 0 else list(
                np.array(ros)[rng.choice(len(ros), size=min(5, len(ros)), replace=False)]
            )
            for m in members:
                lup_rows.append((lu_id, pid[m]))
            ids.append(lu_id)
        lineup_of_team[t] = ids
    # The GSW "death lineup" (lineup 0 contains Curry/Klay/Green roster
    # heads) plays big minutes only from 2014-15 onwards.
    for g in game_pdf.itertuples(index=False):
        si = sid_to_si[g.season_id]
        for team_id in (g.home_id, g.away_id):
            t = team_of_tid[team_id]
            for j, lu_id in enumerate(lineup_of_team[t]):
                if t == "GSW" and j == 0:
                    mp = rng.normal(22, 3) if si >= 5 else rng.normal(4, 2)
                else:
                    mp = rng.normal(10, 3)
                lgs_rows.append(
                    (
                        lu_id, g.game_date, g.home_id,
                        round(max(0.0, mp), 1),
                        round(max(0, rng.normal(40, 8))),
                        round(max(0, rng.normal(40, 8))),
                    )
                )
    lineup_pdf = pd.DataFrame(lu_rows, columns=["lineup_id", "team_id"])
    lup_pdf = pd.DataFrame(
        lup_rows, columns=["lineup_id", "player_id"]
    ).drop_duplicates()
    lgs_pdf = pd.DataFrame(
        lgs_rows,
        columns=["lineup_id", "game_date", "home_id", "mp", "tmposs", "oppo_tmposs"],
    ).drop_duplicates(subset=["lineup_id", "game_date", "home_id"])

    db = Database(spark)
    db.add("season", spark.createDataFrame(season_pdf), ("season_id",))
    db.add("team", spark.createDataFrame(team_pdf), ("team_id",))
    db.add("player", spark.createDataFrame(player_pdf), ("player_id",))
    db.add("game", spark.createDataFrame(game_pdf), ("game_date", "home_id"))
    db.add("play_for", spark.createDataFrame(play_for_pdf), ("player_id", "team_id"))
    db.add("player_salary", spark.createDataFrame(salary_pdf), ("player_id", "season_id"))
    db.add(
        "player_game_stats",
        spark.createDataFrame(pgs_pdf),
        ("player_id", "game_date", "home_id"),
    )
    db.add(
        "team_game_stats",
        spark.createDataFrame(tgs_pdf),
        ("team_id", "game_date", "home_id"),
    )
    db.add("lineup", spark.createDataFrame(lineup_pdf), ("lineup_id",))
    db.add("lineup_player", spark.createDataFrame(lup_pdf), ("lineup_id", "player_id"))
    db.add(
        "lineup_game_stats",
        spark.createDataFrame(lgs_pdf),
        ("lineup_id", "game_date", "home_id"),
    )
    return db


def nba_schema_graph() -> SchemaGraph:
    """Schema graph of Fig. 5 (FK joins; game–team carries the three
    home/away/winner conditions like l_Sedge(u1) in the paper's Fig. 3)."""
    sg = SchemaGraph(
        relations=(
            "season", "team", "player", "game", "play_for", "player_salary",
            "player_game_stats", "team_game_stats", "lineup",
            "lineup_player", "lineup_game_stats",
        )
    )
    sg.add_edge(
        "game", "team",
        fk_cond(("home_id", "team_id")),
        fk_cond(("away_id", "team_id")),
        fk_cond(("winner_id", "team_id")),
    )
    sg.add_edge("game", "season", fk_cond(("season_id", "season_id")))
    sg.add_edge(
        "game", "player_game_stats",
        fk_cond(("game_date", "game_date"), ("home_id", "home_id")),
    )
    sg.add_edge("player_game_stats", "player", fk_cond(("player_id", "player_id")))
    sg.add_edge(
        "game", "team_game_stats",
        fk_cond(("game_date", "game_date"), ("home_id", "home_id")),
    )
    sg.add_edge("team_game_stats", "team", fk_cond(("team_id", "team_id")))
    sg.add_edge("player", "player_salary", fk_cond(("player_id", "player_id")))
    sg.add_edge("player_salary", "season", fk_cond(("season_id", "season_id")))
    sg.add_edge("player", "play_for", fk_cond(("player_id", "player_id")))
    sg.add_edge("play_for", "team", fk_cond(("team_id", "team_id")))
    sg.add_edge(
        "game", "lineup_game_stats",
        fk_cond(("game_date", "game_date"), ("home_id", "home_id")),
    )
    sg.add_edge("lineup_game_stats", "lineup", fk_cond(("lineup_id", "lineup_id")))
    sg.add_edge("lineup", "lineup_player", fk_cond(("lineup_id", "lineup_id")))
    sg.add_edge("lineup_player", "player", fk_cond(("player_id", "player_id")))
    sg.add_edge("lineup", "team", fk_cond(("team_id", "team_id")))
    return sg
