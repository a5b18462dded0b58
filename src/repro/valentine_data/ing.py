"""Synthetic ING-like pairs (substitute for the proprietary §V-B data).

The real data cannot be published; the paper does, however, describe
exactly which characteristics drove each method's behaviour, and those
are what we encode (DESIGN.md §5):

* **ING#1** — SCRUM backlog pair (33×935 vs 16×972, ground truth 14
  matches): matching columns have identical or very similar names, but
  many columns hold *hashes* and free-text descriptions that reuse the
  same vocabulary across columns, creating false-positive pressure for
  name- and value-based matchers; matched columns share value pools, so
  their distributions align (why the Distribution-based method won).
* **ING#2** — application-inventory pair (59×1000 vs 25×1000): the
  small table's column names carry a ``_biz`` suffix, the wide table has
  several variant columns per concept (one-to-many ground truth), and
  matching columns have near-identical instances.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.fabrication.scenarios import DatasetPair
from repro.table import Table
from repro.valentine_data import vocab


def _date_strings(g: np.random.Generator, n: int, start_year: int = 2017,
                  years: int = 4) -> np.ndarray:
    y = g.integers(start_year, start_year + years, n)
    m = g.integers(1, 13, n)
    d = g.integers(1, 29, n)
    return np.array([f"{a:04d}-{b:02d}-{c:02d}" for a, b, c in zip(y, m, d)])


# ---------------------------------------------------------------- ING#1

#: ground truth of ING#1: 14 (wide-table column, small-table column) pairs.
ING1_GROUND_TRUTH: tuple[tuple[str, str], ...] = (
    # 11 identical names + 3 renamed ones ("identical or very similar"):
    # a schema matcher that only nails the identical names lands at
    # 11/14 = 0.786, the paper's COMA score on this dataset.
    ("sprint_id", "sprint_id"), ("team_id", "squad"),
    ("owner_team", "owner_team"), ("epic_name", "initiative_name"),
    ("task_description", "work_item_text"), ("story_points", "story_points"),
    ("status", "status"), ("priority", "priority"),
    ("start_date", "start_date"), ("end_date", "end_date"),
    ("assignee", "assignee"), ("estimate_hours", "estimate_hours"),
    ("velocity", "velocity"), ("quarter", "quarter"),
)


def _scrum_pools(seed: int) -> dict[str, np.ndarray]:
    """Shared small value pools so both tables' distributions align."""
    g = np.random.default_rng(seed)
    return {
        "sprints": vocab.hex_id(g, 60, 8),
        "teams": vocab.hex_id(g, 40, 8),
        "team_names": np.array([f"team {w}" for w in
                                ["alpha", "bravo", "comet", "delta", "eagle",
                                 "falcon", "gamma", "horizon", "ibis",
                                 "jupiter", "kilo", "lima"]]),
        "people": np.array([f"{f} {l}" for f, l in
                            zip(vocab.FIRST_NAMES[:30], vocab.LAST_NAMES[:30])]),
        "epics": np.array([f"epic {o}" for o in vocab.SCRUM_OBJECTS]),
    }


def _scrum_columns(g: np.random.Generator, n: int,
                   pools: dict[str, np.ndarray]) -> dict[str, np.ndarray]:
    """One draw of the 14 shared SCRUM concepts for one table side."""
    return {
        "sprint_id": g.choice(pools["sprints"], n),
        "team_id": g.choice(pools["teams"], n),
        "owner_team": g.choice(pools["team_names"], n),
        "epic_name": g.choice(pools["epics"], n),
        "task_description": vocab.phrases(g, n, vocab.SCRUM_WORDS,
                                          vocab.SCRUM_OBJECTS),
        "story_points": g.choice([1, 2, 3, 5, 8, 13, 21], n),
        "status": g.choice(vocab.SCRUM_STATUSES, n),
        "priority": g.choice(["low", "medium", "high", "critical"], n),
        # distinct year windows per date concept: sprint start/end live in
        # different ranges than ticket created/closed dates, as real
        # backlog data does — this is what lets the Distribution-based
        # method separate them (paper: it wins on ING#1)
        "start_date": _date_strings(g, n, 2019, 1),
        "end_date": _date_strings(g, n, 2020, 1),
        "assignee": g.choice(pools["people"], n),
        "estimate_hours": g.integers(1, 80, n),
        "velocity": g.integers(10, 60, n),
        "quarter": g.choice(["2019-q4", "2020-q1", "2020-q2", "2020-q3"], n),
    }


def ing1(spark: SparkSession, *, n_rows: tuple[int, int] = (935, 972),
         seed: int = 0) -> DatasetPair:
    """The SCRUM-backlog pair: 33-column and 16-column tables."""
    pools = _scrum_pools(seed)
    ga = np.random.default_rng(seed + 1)
    gb = np.random.default_rng(seed + 2)
    na, nb = n_rows

    a = _scrum_columns(ga, na, pools)
    # 19 extra wide-table columns; hash-valued and free-text columns reuse
    # the shared pools/vocabulary -> the paper's false-positive pressure.
    a.update({
        "sprint_name": np.char.add("sprint ",
                                   ga.integers(1, 60, na).astype(str)),
        "task_id": vocab.hex_id(ga, na, 8),
        "created_date": _date_strings(ga, na, 2017, 1),
        "closed_date": _date_strings(ga, na, 2021, 1),
        "reporter": ga.choice(pools["people"], na),
        "project_code": vocab.hex_id(ga, na, 8),
        "board_id": ga.choice(vocab.hex_id(np.random.default_rng(seed + 9),
                                           20, 8), na),
        "backlog_rank": ga.integers(1, 500, na),
        "actual_hours": ga.integers(1, 100, na),
        "capacity": ga.integers(20, 80, na),
        "completed_points": ga.integers(0, 60, na),
        "carry_over": ga.integers(0, 15, na),
        "blocked_days": ga.integers(0, 10, na),
        "num_comments": ga.integers(0, 30, na),
        "num_attachments": ga.integers(0, 8, na),
        "label_1": ga.choice(vocab.SCRUM_WORDS, na),
        "label_2": ga.choice(vocab.SCRUM_WORDS, na),
        "release_version": np.char.add("v", ga.integers(1, 30, na).astype(str)),
        "retro_notes": vocab.phrases(gb, na, vocab.SCRUM_WORDS,
                                     vocab.SCRUM_OBJECTS),
    })
    a_pdf = pd.DataFrame(a)
    assert len(a_pdf.columns) == 33, len(a_pdf.columns)

    b_src = _scrum_columns(gb, nb, pools)
    rename = dict((s, t) for s, t in ING1_GROUND_TRUTH)
    b = {rename[k]: v for k, v in b_src.items()}
    b["review_notes"] = vocab.phrases(gb, nb, vocab.SCRUM_WORDS,
                                      vocab.SCRUM_OBJECTS)
    b["tribe_name"] = gb.choice(["tribe payments", "tribe lending",
                                 "tribe daily banking", "tribe risk"], nb)
    b_pdf = pd.DataFrame(b)
    assert len(b_pdf.columns) == 16, len(b_pdf.columns)

    return DatasetPair(
        name="ing#1", scenario="unionable",
        source=Table("ing1_wide", spark.createDataFrame(a_pdf)),
        target=Table("ing1_small", spark.createDataFrame(b_pdf)),
        ground_truth=frozenset(ING1_GROUND_TRUTH),
        meta={"curated": True, "source_dataset": "ing"},
    )


# ---------------------------------------------------------------- ING#2

#: concept -> the wide-table variant columns it matches (one-to-many GT).
#: The wide table uses low-level CMDB-style names ("ci_" = configuration
#: item, "_cd"/"_nr"/"_dt" suffixes); the small table uses business
#: names with a "_biz" suffix — the paper's "suffixes that could
#: complicate schema-based-matching".
ING2_CONCEPTS: dict[str, tuple[str, ...]] = {
    "application_name": ("ci_name", "ci_alias", "ci_display_nm"),
    "application_id": ("ci_id", "ci_cd", "asset_nr"),
    "owner_team": ("ownr_grp", "supp_grp", "devops_grp"),
    "manager": ("mgr_nm", "lead_nm", "po_nm"),
    "department": ("dept_cd", "div_nm"),
    "hardware": ("hw_host", "srv_nm"),
    "ip_address": ("ip_addr", "ipv4"),
    "os": ("os_ver", "op_sys"),
    "datacenter": ("dc_cd", "dc_loc"),
    "environment": ("env_cd", "env_nm"),
    "criticality": ("crit_cd", "risk_cls"),
    "status": ("lifecycle_cd", "state_cd"),
    "vendor": ("vendor_cd", "supplier_nm"),
    "cost_center": ("cc_cd", "cc_nr"),
    "used_by": ("used_by_ci", "consumer_ci"),
    "uses": ("uses_ci", "depends_ci"),
    "install_date": ("inst_dt", "deploy_dt"),
    "decommission_date": ("decom_dt", "eol_dt"),
    "version": ("ver_nr", "rel_nr"),
    "description": ("descr_txt", "cmnt_txt"),
}

_A_ONLY = ("rack_id", "serial_no", "cpu_cores", "memory_gb", "disk_tb",
           "license_key", "backup_policy", "patch_level", "monitoring_url",
           "sla_tier", "incident_count", "change_count", "last_audit_date",
           "network_zone", "business_unit_code")

_B_ONLY = ("review_status_biz", "approved_by_biz", "budget_code_biz",
           "notes_biz", "priority_biz")


def _ing2_pools(seed: int) -> dict[str, np.ndarray]:
    g = np.random.default_rng(seed)
    apps = np.unique(
        vocab.phrases(g, 120, ["core", "global", "smart", "rapid", "blue"],
                      ["ledger", "gateway", "portal", "engine", "hub",
                       "desk", "vault"]))
    return {
        "application_name": apps,
        "application_id": vocab.hex_id(g, 120, 10),
        "owner_team": np.array([f"team {w}" for w in
                                ["alpha", "bravo", "comet", "delta", "eagle",
                                 "falcon", "gamma", "horizon"]]),
        "manager": np.array([f"{f} {l}" for f, l in
                             zip(vocab.FIRST_NAMES[:20], vocab.LAST_NAMES[:20])]),
        "department": np.array(vocab.DEPARTMENTS),
        "hardware": np.array([f"srv-{x}" for x in
                              vocab.hex_id(np.random.default_rng(seed + 3),
                                           60, 6)]),
        "ip_address": np.array([f"10.{a}.{b}.{c}" for a, b, c in
                                zip(g.integers(0, 32, 80),
                                    g.integers(0, 255, 80),
                                    g.integers(1, 255, 80))]),
        "os": np.array(vocab.OS_VERSIONS),
        "datacenter": np.array(["dc-ams-01", "dc-ams-02", "dc-fra-01",
                                "dc-dub-01"]),
        "environment": np.array(["production", "acceptance", "test",
                                 "development"]),
        "criticality": np.array(["critical", "high", "medium", "low"]),
        "status": np.array(["live", "phase out", "planned", "retired"]),
        "vendor": np.array(vocab.COMPANIES),
        "cost_center": np.array([f"cc-{x:05d}" for x in
                                 g.integers(0, 99999, 30)]),
        "used_by": apps[: max(1, len(apps) * 2 // 3)],
        "uses": apps[len(apps) // 3:],
        "install_date": _date_strings(g, 200, 2005, 14),
        "decommission_date": _date_strings(g, 200, 2021, 4),
        "version": np.array([f"v{a}.{b}" for a, b in
                             zip(g.integers(1, 9, 40), g.integers(0, 20, 40))]),
        "description": vocab.phrases(g, 150, vocab.SCRUM_WORDS,
                                     vocab.SCRUM_OBJECTS),
    }


def ing2(spark: SparkSession, *, n_rows: int = 1000,
         seed: int = 0) -> DatasetPair:
    """The application-inventory pair: 59-column and 25-column tables."""
    pools = _ing2_pools(seed)
    ga = np.random.default_rng(seed + 1)
    gb = np.random.default_rng(seed + 2)
    n = n_rows

    a: dict[str, np.ndarray] = {}
    for concept, variants in ING2_CONCEPTS.items():
        for v in variants:
            a[v] = ga.choice(pools[concept], n)
    ge = np.random.default_rng(seed + 4)
    a.update({
        "rack_id": np.char.add("rack-", ge.integers(1, 99, n).astype(str)),
        "serial_no": vocab.hex_id(ge, n, 10),
        "cpu_cores": ge.choice([2, 4, 8, 16, 32], n),
        "memory_gb": ge.choice([8, 16, 32, 64, 128], n),
        "disk_tb": ge.choice([1, 2, 4, 8], n),
        "license_key": vocab.hex_id(ge, n, 16),
        "backup_policy": ge.choice(["daily", "weekly", "none"], n),
        "patch_level": np.char.add("p", ge.integers(1, 40, n).astype(str)),
        "monitoring_url": np.array([f"mon.ing.net/{x}" for x in
                                    vocab.hex_id(ge, n, 6)]),
        "sla_tier": ge.choice(["gold", "silver", "bronze"], n),
        "incident_count": ge.integers(0, 40, n),
        "change_count": ge.integers(0, 80, n),
        "last_audit_date": _date_strings(ge, n, 2018, 3),
        "network_zone": ge.choice(["dmz", "internal", "restricted"], n),
        "business_unit_code": np.char.add("bu-",
                                          ge.integers(1, 30, n).astype(str)),
    })
    a_pdf = pd.DataFrame(a)
    assert len(a_pdf.columns) == 59, len(a_pdf.columns)

    b: dict[str, np.ndarray] = {
        f"{concept}_biz": gb.choice(pools[concept], n)
        for concept in ING2_CONCEPTS
    }
    b["review_status_biz"] = gb.choice(["approved", "pending", "rejected"], n)
    b["approved_by_biz"] = gb.choice(pools["manager"], n)
    b["budget_code_biz"] = np.char.add("bgt-",
                                       gb.integers(1, 500, n).astype(str))
    b["notes_biz"] = vocab.phrases(gb, n, vocab.SCRUM_WORDS,
                                   vocab.SCRUM_OBJECTS)
    b["priority_biz"] = gb.choice(["p1", "p2", "p3", "p4"], n)
    b_pdf = pd.DataFrame(b)
    assert len(b_pdf.columns) == 25, len(b_pdf.columns)

    gt = frozenset(
        (variant, f"{concept}_biz")
        for concept, variants in ING2_CONCEPTS.items() for variant in variants
    )
    return DatasetPair(
        name="ing#2", scenario="joinable",
        source=Table("ing2_wide", spark.createDataFrame(a_pdf)),
        target=Table("ing2_small", spark.createDataFrame(b_pdf)),
        ground_truth=gt,
        meta={"curated": True, "source_dataset": "ing"},
    )
