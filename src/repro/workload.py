"""The paper's query workload and user questions (Tables 2/3/5, §5.7/§6).

Queries are :class:`repro.substrate.query.AggQuery` specs matching the SQL
printed in the paper (adapted to the synthetic schemas). User questions are
(t1, t2) pairs of answer-tuple group values, taken from the paper's case
studies; since our data is synthetic the *selected group values* are kept
but the aggregate values will differ (DESIGN.md substitution #1).
"""
from __future__ import annotations

from dataclasses import dataclass

from repro.substrate.query import AggQuery


@dataclass(frozen=True)
class UserQuestion:
    """A two-point question over a query's answer (t2=None → single-point)."""

    query: AggQuery
    t1: dict
    t2: dict | None
    description: str = ""


def _player_points_query(player_name: str) -> AggQuery:
    return AggQuery(
        tables=(
            ("player", "p"),
            ("player_game_stats", "pgs"),
            ("game", "g"),
            ("season", "s"),
        ),
        join_conds=(
            ("p.player_id", "pgs.player_id"),
            ("g.game_date", "pgs.game_date"),
            ("g.home_id", "pgs.home_id"),
            ("s.season_id", "g.season_id"),
        ),
        filters=(("p.player_name", player_name),),
        group_by=(("s.season_name", "season_name"),),
        agg="avg(pgs.points)",
        agg_alias="avg_pts",
    )


# ---- NBA queries (Table 3 / §5.7) -------------------------------------
Q_NBA1 = _player_points_query("Draymond Green")

Q_NBA2 = AggQuery(
    tables=(
        ("team_game_stats", "tgs"),
        ("game", "g"),
        ("team", "t"),
        ("season", "s"),
    ),
    join_conds=(
        ("s.season_id", "g.season_id"),
        ("tgs.game_date", "g.game_date"),
        ("tgs.home_id", "g.home_id"),
        ("tgs.team_id", "t.team_id"),
    ),
    filters=(("t.team", "GSW"),),
    group_by=(("s.season_name", "season_name"),),
    agg="avg(tgs.assists)",
    agg_alias="avg_ast",
)

Q_NBA3 = _player_points_query("LeBron James")

Q_NBA4 = AggQuery(
    tables=(("team", "t"), ("game", "g"), ("season", "s")),
    join_conds=(
        ("t.team_id", "g.winner_id"),
        ("g.season_id", "s.season_id"),
    ),
    filters=(("t.team", "GSW"),),
    group_by=(("s.season_name", "season_name"),),
    agg="count(*)",
    agg_alias="win",
)

Q_NBA5 = _player_points_query("Jimmy Butler")

# ---- MIMIC queries (Table 5 / §5.7) -----------------------------------
Q_MIMIC1 = AggQuery(
    tables=(("admissions", "a"), ("diagnoses", "d")),
    join_conds=(("a.hadm_id", "d.hadm_id"),),
    group_by=(("d.chapter", "chapter"),),
    agg="cast(sum(a.hospital_expire_flag) as double) / count(*)",
    agg_alias="death_rate",
)

Q_MIMIC2 = AggQuery(
    tables=(("admissions", "a"),),
    group_by=(("a.insurance", "insurance"),),
    agg="cast(sum(a.hospital_expire_flag) as double) / count(*)",
    agg_alias="death_rate",
)

Q_MIMIC3 = AggQuery(
    tables=(("icustays", "i"),),
    group_by=(("i.los_group", "los_group"),),
    agg="count(*)",
    agg_alias="cnt",
)

Q_MIMIC4 = Q_MIMIC2  # same query, different user question (§6.2)

Q_MIMIC5 = AggQuery(
    tables=(("patients_admit_info", "pai"), ("procedures", "p")),
    join_conds=(
        ("p.hadm_id", "pai.hadm_id"),
        ("p.subject_id", "pai.subject_id"),
    ),
    group_by=(("pai.ethnicity", "ethnicity"),),
    agg="count(*)",
    agg_alias="cnt",
)

# ---- user questions (Tables 4/6) --------------------------------------
UQ_NBA1 = UserQuestion(
    Q_NBA1,
    {"season_name": "2015-16"},
    {"season_name": "2016-17"},
    "Draymond Green avg points 2015-16 vs 2016-17",
)
UQ_NBA2 = UserQuestion(
    Q_NBA2,
    {"season_name": "2013-14"},
    {"season_name": "2014-15"},
    "GSW avg assists 2013-14 vs 2014-15",
)
UQ_NBA3 = UserQuestion(
    Q_NBA3,
    {"season_name": "2009-10"},
    {"season_name": "2010-11"},
    "LeBron James avg points 2009-10 vs 2010-11",
)
UQ_NBA4 = UserQuestion(
    Q_NBA4,
    {"season_name": "2012-13"},
    {"season_name": "2016-17"},
    "GSW wins 2012-13 vs 2016-17",
)
UQ_NBA5 = UserQuestion(
    Q_NBA5,
    {"season_name": "2013-14"},
    {"season_name": "2014-15"},
    "Jimmy Butler avg points 2013-14 vs 2014-15",
)
# The running example UQ_1 (used by Fig 7a/8/9 and the user study).
UQ_1 = UserQuestion(
    Q_NBA4,
    {"season_name": "2015-16"},
    {"season_name": "2012-13"},
    "Why did GSW win more games in 2015-16 than 2012-13?",
)

UQ_MIMIC1 = UserQuestion(
    Q_MIMIC1, {"chapter": "2"}, {"chapter": "13"},
    "death rate chapter 2 vs 13",
)
UQ_MIMIC2 = UserQuestion(
    Q_MIMIC2, {"insurance": "Medicare"}, {"insurance": "Medicaid"},
    "death rate Medicare vs Medicaid",
)
UQ_MIMIC3 = UserQuestion(
    Q_MIMIC3, {"los_group": "0-1"}, {"los_group": "x>8"},
    "ICU stays <1 day vs >8 days",
)
UQ_MIMIC4 = UserQuestion(
    Q_MIMIC4, {"insurance": "Medicare"}, {"insurance": "Private"},
    "death rate Medicare vs Private",
)
UQ_MIMIC5 = UserQuestion(
    Q_MIMIC5, {"ethnicity": "Hispanic"}, {"ethnicity": "Asian"},
    "procedures Hispanic vs Asian",
)

NBA_QUESTIONS = {
    "Q_nba1": UQ_NBA1,
    "Q_nba2": UQ_NBA2,
    "Q_nba3": UQ_NBA3,
    "Q_nba4": UQ_NBA4,
    "Q_nba5": UQ_NBA5,
}
MIMIC_QUESTIONS = {
    "Q_mimic1": UQ_MIMIC1,
    "Q_mimic2": UQ_MIMIC2,
    "Q_mimic3": UQ_MIMIC3,
    "Q_mimic4": UQ_MIMIC4,
    "Q_mimic5": UQ_MIMIC5,
}
