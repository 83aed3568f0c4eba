"""Synthetic MIMIC-III subset (schema of Fig. 6) with planted signals.

MIMIC-III requires credentialed access and is unavailable offline
(DESIGN.md substitution #1). This generator reproduces the seven relations
the paper's MIMIC experiments use, with the correlations its explanations
rely on:

  * death rate by insurance (Medicare .14, Self Pay .16, Government .05,
    Private .06, Medicaid .07 — Fig. 15a/16b);
  * Medicare admissions skew old (age ≥ 65), male-ish, and EMERGENCY;
  * diagnosis chapters differ in death rate (chapter 2 "neoplasms" ≈ .19 vs
    chapter 13 ≈ .09 — Fig. 16a);
  * long ICU stays (los_group 'x>8') co-occur with long hospital stays and
    chapter-16 procedures; short stays resolve quickly;
  * Hispanic patients skew Catholic; Asian patients skew shorter stays;
  * patients.expire_flag subsumes in-hospital death
    (hospital_expire_flag = 1 ⇒ expire_flag = 1).

``sf=1.0`` ≈ 20k admissions (~0.5M rows across tables); tests use
``sf≈0.05``.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.substrate.catalog import Database
from repro.core.schema_graph import SchemaGraph, fk_cond

_N_ADMISSIONS_SF1 = 20_000

INSURANCES = ["Medicare", "Private", "Medicaid", "Government", "Self Pay"]
_INS_P = [0.48, 0.38, 0.098, 0.03, 0.012]
_DEATH_RATE = {
    "Medicare": 0.14, "Private": 0.06, "Medicaid": 0.07,
    "Government": 0.05, "Self Pay": 0.16,
}
_EMERGENCY_P = {
    "Medicare": 0.85, "Private": 0.52, "Medicaid": 0.70,
    "Government": 0.60, "Self Pay": 0.90,
}
ETHNICITIES = ["White", "Black", "Hispanic", "Asian", "Other", "Unknown"]
_ETH_P = [0.62, 0.12, 0.08, 0.06, 0.06, 0.06]
CHAPTERS = [str(c) for c in range(1, 18)] + ["V", "E"]
# per-chapter death-rate targets (Fig. 16a shape: 1 & 2 high, 11 & 15 low)
_CH_DEATH = {
    "1": 0.19, "2": 0.19, "3": 0.12, "4": 0.14, "5": 0.08, "6": 0.13,
    "7": 0.12, "8": 0.18, "9": 0.14, "10": 0.15, "11": 0.01, "12": 0.14,
    "13": 0.09, "14": 0.05, "15": 0.02, "16": 0.16, "17": 0.13,
    "V": 0.09, "E": 0.10,
}
LOS_GROUPS = ["0-1", "1-2", "2-4", "4-8", "x>8"]


def _los_group(los: np.ndarray) -> np.ndarray:
    return np.select(
        [los < 1, los < 2, los < 4, los < 8],
        ["0-1", "1-2", "2-4", "4-8"],
        default="x>8",
    )


def generate_mimic(
    spark: SparkSession, *, sf: float = 0.1, seed: int = 11
) -> Database:
    """Generate the 7-relation MIMIC database at scale factor ``sf``."""
    rng = np.random.default_rng(seed)
    n_adm = max(200, int(_N_ADMISSIONS_SF1 * sf))
    n_pat = max(100, int(n_adm * 0.8))

    # --- patients -------------------------------------------------------
    subject_ids = np.array([f"SUB{i:06d}" for i in range(n_pat)])
    gender = rng.choice(["M", "F"], n_pat, p=[0.55, 0.45])
    birth_year = rng.integers(1915, 2000, n_pat)
    patients_pdf = pd.DataFrame(
        {
            "subject_id": subject_ids,
            "gender": gender,
            "dob": [f"{y}-01-01" for y in birth_year],
            # refined below so hospital deaths imply expire_flag = 1
            "expire_flag": np.zeros(n_pat, dtype=int),
        }
    )

    # --- admissions -----------------------------------------------------
    hadm_ids = np.array([f"HADM{i:06d}" for i in range(n_adm)])
    adm_subject_idx = rng.integers(0, n_pat, n_adm)
    insurance = rng.choice(INSURANCES, n_adm, p=_INS_P)
    # Age: Medicare mostly ≥ 65, others mostly younger.
    age = np.where(
        insurance == "Medicare",
        rng.normal(76, 8, n_adm),
        rng.normal(52, 14, n_adm),
    ).clip(18, 95).round(1)
    emergency_p = np.vectorize(_EMERGENCY_P.get)(insurance)
    is_emergency = rng.random(n_adm) < emergency_p
    admission_type = np.where(
        is_emergency,
        "EMERGENCY",
        rng.choice(["ELECTIVE", "URGENT", "NEWBORN"], n_adm, p=[0.7, 0.25, 0.05]),
    )
    # Death: base rate per insurance, boosted by emergency + age.
    base = np.vectorize(_DEATH_RATE.get)(insurance).astype(float)
    p_death = np.clip(
        base * (1.25 * is_emergency + 0.6) * (0.7 + 0.006 * age), 0, 0.9
    )
    died = (rng.random(n_adm) < p_death).astype(int)
    stay = np.where(
        died,
        rng.gamma(2.0, 5.0, n_adm),
        rng.gamma(1.8, 3.5, n_adm),
    ).clip(0.2, 80).round(1)
    admissions_pdf = pd.DataFrame(
        {
            "hadm_id": hadm_ids,
            "subject_id": subject_ids[adm_subject_idx],
            "admission_type": admission_type,
            "admission_location": np.where(
                is_emergency,
                "EMERGENCY ROOM ADMIT",
                rng.choice(
                    ["PHYS REFERRAL", "CLINIC REFERRAL", "TRANSFER"], n_adm
                ),
            ),
            "insurance": insurance,
            "marital_status": rng.choice(
                ["MARRIED", "SINGLE", "WIDOWED", "DIVORCED"],
                n_adm,
                p=[0.45, 0.3, 0.15, 0.1],
            ),
            "hospital_expire_flag": died,
            "hospital_stay_length": stay,
        }
    )
    # expire_flag subsumes hospital deaths plus some out-of-hospital deaths.
    dead_subjects = set(admissions_pdf.loc[died == 1, "subject_id"])
    extra_dead = rng.random(n_pat) < 0.06
    patients_pdf["expire_flag"] = [
        1 if (s in dead_subjects or e) else 0
        for s, e in zip(subject_ids, extra_dead)
    ]

    # --- patients_admit_info -------------------------------------------
    ethnicity = rng.choice(ETHNICITIES, n_adm, p=_ETH_P)
    religion = np.where(
        (ethnicity == "Hispanic") & (rng.random(n_adm) < 0.8),
        "Catholic",
        rng.choice(
            ["Protestant", "Catholic", "Jewish", "Not Specified", "Buddhist"],
            n_adm,
            p=[0.3, 0.25, 0.1, 0.3, 0.05],
        ),
    )
    # Asians skew to shorter stays (Q_mimic5's 1st explanation).
    stay_adj = np.where(ethnicity == "Asian", 0.55, 1.0)
    admissions_pdf["hospital_stay_length"] = (
        admissions_pdf["hospital_stay_length"] * stay_adj
    ).round(1)
    pai_pdf = pd.DataFrame(
        {
            "hadm_id": hadm_ids,
            "subject_id": admissions_pdf["subject_id"],
            "age": age,
            "language": rng.choice(["ENGL", "SPAN", "MAND", "OTHER"], n_adm,
                                   p=[0.75, 0.1, 0.05, 0.1]),
            "religion": religion,
            "ethnicity": ethnicity,
        }
    )

    # --- diagnoses ------------------------------------------------------
    # Chapter sampled conditioned on whether the admission died, which
    # plants the per-chapter death-rate differences of Fig. 16a.
    ch_death = np.array([_CH_DEATH[c] for c in CHAPTERS])
    p_ch_dead = ch_death / ch_death.sum()
    p_ch_alive = (1 - ch_death) / (1 - ch_death).sum()
    n_diag_per = rng.integers(1, 6, n_adm)
    d_hadm, d_subj, d_seq, d_ch = [], [], [], []
    for i in range(n_adm):
        k = n_diag_per[i]
        p = p_ch_dead if died[i] else p_ch_alive
        chs = rng.choice(CHAPTERS, size=k, p=p)
        d_hadm.extend([hadm_ids[i]] * k)
        d_subj.extend([admissions_pdf["subject_id"].iloc[i]] * k)
        d_seq.extend(range(1, k + 1))
        d_ch.extend(chs)
    diagnoses_pdf = pd.DataFrame(
        {
            "hadm_id": d_hadm,
            "subject_id": d_subj,
            "seq_num": d_seq,
            "icd9_code": [
                f"D{c}{rng.integers(100, 999)}" for c in d_ch
            ],
            "chapter": d_ch,
        }
    )

    # --- icustays -------------------------------------------------------
    has_icu = rng.random(n_adm) < 0.8
    icu_idx = np.where(has_icu)[0]
    # ICU los tracks hospital stay (long ICU ⇒ long hospital stay).
    h_stay = admissions_pdf["hospital_stay_length"].to_numpy()
    ilos = np.clip(
        h_stay[icu_idx] * rng.uniform(0.15, 0.6, len(icu_idx))
        + rng.exponential(0.5, len(icu_idx)),
        0.05,
        60,
    ).round(3)
    icustays_pdf = pd.DataFrame(
        {
            "hadm_id": hadm_ids[icu_idx],
            "subject_id": admissions_pdf["subject_id"].to_numpy()[icu_idx],
            "icustay_id": [f"ICU{i:06d}" for i in range(len(icu_idx))],
            "dbsource": np.where(
                rng.random(len(icu_idx)) < 0.55, "carevue", "metavision"
            ),
            "first_careunit": rng.choice(
                ["MICU", "SICU", "CCU", "TSICU", "CSRU"], len(icu_idx)
            ),
            "los": ilos,
            "los_group": _los_group(ilos),
        }
    )

    # --- procedures -----------------------------------------------------
    n_proc_per = rng.integers(0, 4, n_adm)
    long_icu_hadm = set(
        icustays_pdf.loc[icustays_pdf["los_group"] == "x>8", "hadm_id"]
    )
    p_hadm, p_subj, p_seq, p_ch = [], [], [], []
    proc_chapters = [str(c) for c in range(1, 17)]
    for i in range(n_adm):
        k = n_proc_per[i]
        if k == 0:
            continue
        if hadm_ids[i] in long_icu_hadm:
            # chapter 16 (misc diagnostic/therapeutic) dominates long stays
            chs = rng.choice(
                proc_chapters,
                size=k,
                p=[0.02] * 15 + [0.70],
            )
        else:
            chs = rng.choice(proc_chapters, size=k)
        p_hadm.extend([hadm_ids[i]] * k)
        p_subj.extend([admissions_pdf["subject_id"].iloc[i]] * k)
        p_seq.extend(range(1, k + 1))
        p_ch.extend(chs)
    procedures_pdf = pd.DataFrame(
        {
            "hadm_id": p_hadm,
            "subject_id": p_subj,
            "seq_num": p_seq,
            "icd9_code": [f"P{c}{rng.integers(10, 99)}" for c in p_ch],
            "chapter": p_ch,
        }
    )

    db = Database(spark)
    db.add("patients", spark.createDataFrame(patients_pdf), ("subject_id",))
    db.add("admissions", spark.createDataFrame(admissions_pdf), ("hadm_id",))
    # Declared PKs are the join-relevant keys: seq_num/icustay_id never
    # appear in schema-graph conditions, and the paper's own appendix join
    # graphs (e.g. Q_mimic1) join procedures on (hadm_id, subject_id) only —
    # including seq_num in the declared PK would make every such graph fail
    # the PK-connectivity test the paper clearly passes.
    db.add(
        "patients_admit_info",
        spark.createDataFrame(pai_pdf),
        ("hadm_id", "subject_id"),
    )
    db.add(
        "diagnoses", spark.createDataFrame(diagnoses_pdf), ("hadm_id", "subject_id")
    )
    db.add(
        "icustays", spark.createDataFrame(icustays_pdf), ("hadm_id", "subject_id")
    )
    db.add(
        "procedures",
        spark.createDataFrame(procedures_pdf),
        ("hadm_id", "subject_id"),
    )
    return db


def mimic_schema_graph() -> SchemaGraph:
    """Schema graph of Fig. 6 (FK-derived equi-joins)."""
    sg = SchemaGraph(
        relations=(
            "patients", "admissions", "patients_admit_info", "diagnoses",
            "icustays", "procedures",
        )
    )
    sg.add_edge("admissions", "patients", fk_cond(("subject_id", "subject_id")))
    for child in ("patients_admit_info", "diagnoses", "icustays", "procedures"):
        sg.add_edge("admissions", child, fk_cond(("hadm_id", "hadm_id")))
        sg.add_edge("patients", child, fk_cond(("subject_id", "subject_id")))
    return sg
