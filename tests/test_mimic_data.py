"""Synthetic MIMIC dataset: schema integrity + planted signals."""
import pytest

TABLES = [
    "patients", "admissions", "patients_admit_info", "diagnoses",
    "icustays", "procedures",
]


@pytest.mark.parametrize("name", TABLES)
def test_tables_present_and_nonempty(mimic_db, name):
    assert mimic_db.n_rows(name) > 0


@pytest.mark.parametrize("name", ["patients", "admissions"])
def test_primary_keys_unique(mimic_db, name):
    pk = list(mimic_db.pk(name))
    assert (
        mimic_db.df(name).select(*pk).distinct().count()
        == mimic_db.n_rows(name)
    )


def test_admissions_reference_patients(mimic_pandas):
    subs = set(mimic_pandas["patients"]["subject_id"])
    assert set(mimic_pandas["admissions"]["subject_id"]).issubset(subs)


def test_child_tables_reference_admissions(mimic_pandas):
    hadm = set(mimic_pandas["admissions"]["hadm_id"])
    for t in ("patients_admit_info", "diagnoses", "icustays", "procedures"):
        assert set(mimic_pandas[t]["hadm_id"]).issubset(hadm), t


def test_insurance_death_rates_shape(mimic_pandas):
    adm = mimic_pandas["admissions"]
    rates = adm.groupby("insurance")["hospital_expire_flag"].mean()
    # Fig 15a shape: Medicare & Self Pay high; Private/Medicaid/Gov low
    assert rates["Medicare"] > rates["Private"] * 1.5
    assert rates["Medicare"] > rates["Medicaid"]
    assert rates["Self Pay"] > rates["Private"]


def test_medicare_patients_are_older(mimic_pandas):
    adm = mimic_pandas["admissions"].merge(
        mimic_pandas["patients_admit_info"][["hadm_id", "age"]], on="hadm_id"
    )
    med = adm[adm.insurance == "Medicare"]["age"].mean()
    priv = adm[adm.insurance == "Private"]["age"].mean()
    assert med > priv + 10
    assert med > 65


def test_medicare_emergency_skew(mimic_pandas):
    adm = mimic_pandas["admissions"]
    em = adm.groupby("insurance")["admission_type"].apply(
        lambda s: (s == "EMERGENCY").mean()
    )
    assert em["Medicare"] > em["Private"]


def test_chapter_death_rates_shape(mimic_pandas):
    adm = mimic_pandas["admissions"][["hadm_id", "hospital_expire_flag"]]
    d = mimic_pandas["diagnoses"].merge(adm, on="hadm_id")
    rates = d.groupby("chapter")["hospital_expire_flag"].mean()
    # Fig 16a shape: chapter 2 (neoplasms) ≫ chapter 13, chapter 11 lowest-ish
    assert rates["2"] > rates["13"]
    assert rates["11"] < rates["2"]


def test_expire_flag_subsumes_hospital_death(mimic_pandas):
    adm = mimic_pandas["admissions"]
    pat = mimic_pandas["patients"].set_index("subject_id")["expire_flag"]
    died_in_hosp = adm[adm.hospital_expire_flag == 1]["subject_id"]
    assert (pat.loc[died_in_hosp] == 1).all()


def test_los_groups_consistent(mimic_pandas):
    icu = mimic_pandas["icustays"]
    assert (icu.loc[icu.los < 1, "los_group"] == "0-1").all()
    assert (icu.loc[icu.los >= 8, "los_group"] == "x>8").all()


def test_long_icu_long_hospital_stay(mimic_pandas):
    icu = mimic_pandas["icustays"].merge(
        mimic_pandas["admissions"][["hadm_id", "hospital_stay_length"]],
        on="hadm_id",
    )
    long_ = icu[icu.los_group == "x>8"]["hospital_stay_length"].mean()
    short = icu[icu.los_group == "0-1"]["hospital_stay_length"].mean()
    assert long_ > short * 1.5


def test_chapter16_procedures_for_long_icu(mimic_pandas):
    icu = mimic_pandas["icustays"]
    proc = mimic_pandas["procedures"]
    long_hadm = set(icu.loc[icu.los_group == "x>8", "hadm_id"])
    in_long = proc[proc.hadm_id.isin(long_hadm)]
    out_long = proc[~proc.hadm_id.isin(long_hadm)]
    if len(in_long) and len(out_long):
        assert (in_long.chapter == "16").mean() > (out_long.chapter == "16").mean()


def test_hispanic_catholic_correlation(mimic_pandas):
    pai = mimic_pandas["patients_admit_info"]
    hisp = (pai.loc[pai.ethnicity == "Hispanic", "religion"] == "Catholic").mean()
    rest = (pai.loc[pai.ethnicity != "Hispanic", "religion"] == "Catholic").mean()
    assert hisp > rest + 0.2


def test_asian_shorter_stays(mimic_pandas):
    adm = mimic_pandas["admissions"].merge(
        mimic_pandas["patients_admit_info"][["hadm_id", "ethnicity"]],
        on="hadm_id",
    )
    asian = adm[adm.ethnicity == "Asian"]["hospital_stay_length"].mean()
    rest = adm[adm.ethnicity != "Asian"]["hospital_stay_length"].mean()
    assert asian < rest


def test_sf_scales_admissions(spark):
    from repro.data.mimic import generate_mimic

    small = generate_mimic(spark, sf=0.04)
    big = generate_mimic(spark, sf=0.12)
    assert big.n_rows("admissions") > small.n_rows("admissions") * 2
