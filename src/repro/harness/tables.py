"""Harnesses reproducing every table of the paper's evaluation (§7).

Each ``table*`` function runs the experiment at a chosen scale and
returns a :class:`TableResult` whose rows mirror the paper's table
layout; ``format_table`` renders it for stdout / bench logs. Paper-vs-
measured commentary lives in EXPERIMENTS.md.

Budgets: the paper used a 10-minute timeout and a 16 GB JVM; scaled to
our graphs we default to ``TIME_LIMIT_S`` per query and ``ROW_CAP``
intermediate rows (see repro.harness.runner for the TO/OM mapping).
Enumeration is capped at ``MATCH_LIMIT`` matches (paper: 10^7).
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field

from pyspark.sql import SparkSession

from repro.baselines.engines import build_catalog, child_only_on_closure, eh, gf, neo4j
from repro.baselines.jm import jm
from repro.baselines.tm import tm
from repro.core.gm import gm
from repro.core.matchsets import MatchContext
from repro.graphs.datasets import (
    PAPER_STATS,
    dataset_names,
    load_dataset,
    load_email_variant,
)
from repro.graphs.model import Graph
from repro.harness.runner import RunResult, run_guarded
from repro.queries.templates import instantiate, random_pattern
from repro.reach.bfl import build_bfl
from repro.reach.closure import transitive_closure

TIME_LIMIT_S = 8.0
ROW_CAP = 2_000_000
MATCH_LIMIT = 20_000
CATALOG_CAP = 470_000  # GF catalog footprint cap (entries); see engines.py


@dataclass
class TableResult:
    name: str
    headers: list[str]
    rows: list[list] = field(default_factory=list)
    seconds: float = 0.0
    notes: str = ""


def format_table(t: TableResult) -> str:
    widths = [
        max(len(str(h)), *(len(str(r[i])) for r in t.rows)) if t.rows else len(str(h))
        for i, h in enumerate(t.headers)
    ]
    lines = [f"== {t.name} ({t.seconds:.1f}s harness) =="]
    if t.notes:
        lines.append(t.notes)
    lines.append(" | ".join(str(h).ljust(w) for h, w in zip(t.headers, widths)))
    lines.append("-+-".join("-" * w for w in widths))
    for r in t.rows:
        lines.append(" | ".join(str(c).ljust(w) for c, w in zip(r, widths)))
    return "\n".join(lines)


# -- shared per-process context cache ---------------------------------------
_CTX: dict = {}


def bench_ctx(spark: SparkSession, name: str, scale: str = "bench"):
    key = (name, scale)
    if key not in _CTX:
        g = load_dataset(spark, name, scale=scale)
        _CTX[key] = (g, MatchContext(graph=g))
    return _CTX[key]


def _fmt_run(r: RunResult) -> str:
    return f"{r.seconds:.2f}" if r.ok else r.status


def _run_gm(ctx, p, **kw) -> RunResult:
    """GM with capped enumeration (paper: first 10^7 matches; here MATCH_LIMIT).

    ``partial_cap`` is the set-oriented analogue of bounded backtracking
    enumeration — without it, a lazy multi-way join over a near-complete
    closure would compute the full (astronomical) answer before the
    limit applies.
    """
    t0 = time.perf_counter()
    res = gm(ctx, p, limit=MATCH_LIMIT, partial_cap=2 * MATCH_LIMIT, **kw)
    n = res.count()
    return RunResult("ok", time.perf_counter() - t0, value=n)


def _run_jm(ctx, p, time_limit=TIME_LIMIT_S) -> RunResult:
    return run_guarded(
        lambda g: jm(ctx, p, limit=MATCH_LIMIT, guard=g).count(),
        time_limit_s=time_limit,
        row_cap=ROW_CAP,
    )


def _run_tm(ctx, p, time_limit=TIME_LIMIT_S) -> RunResult:
    return run_guarded(
        lambda g: tm(ctx, p, limit=MATCH_LIMIT, guard=g).count(),
        time_limit_s=time_limit,
        row_cap=ROW_CAP,
    )


def _run_neo4j(ctx, p, time_limit=TIME_LIMIT_S) -> RunResult:
    return run_guarded(
        lambda g: neo4j(ctx, p, limit=MATCH_LIMIT, guard=g).count(),
        time_limit_s=time_limit,
        row_cap=ROW_CAP,
    )


# ---------------------------------------------------------------------------
# Table 2 — dataset statistics
# ---------------------------------------------------------------------------
def table2(spark: SparkSession, *, scale: str = "bench") -> TableResult:
    """Paper Table 2: |V|, |E|, |L|, d_avg per dataset (paper vs ours)."""
    t0 = time.perf_counter()
    t = TableResult(
        "Table 2: datasets (scaled synthetic substitutes)",
        ["Dataset", "V", "E", "L", "d_avg", "paper V", "paper E", "paper L", "paper d"],
        notes="Synthetic profiles ~100-1000x smaller; L and degree shape preserved.",
    )
    for name in dataset_names():
        g = load_dataset(spark, name, scale=scale)
        s = g.stats()
        pv, pe, pl, pd_ = PAPER_STATS[name]
        t.rows.append([name, s["V"], s["E"], s["L"], s["d_avg"], pv, pe, pl, pd_])
        g.unpersist()
    t.seconds = time.perf_counter() - t0
    return t


# ---------------------------------------------------------------------------
# Table 3 — JM / TM / GM on large D-queries (hu, hp, yt)
# ---------------------------------------------------------------------------
def table3(
    spark: SparkSession,
    *,
    scale: str = "bench",
    datasets=("hu", "hp", "yt"),
    sizes=(4, 6, 8, 10, 12, 14),
    time_limit: float = TIME_LIMIT_S,
) -> TableResult:
    """Paper Table 3: #TO, #OM, #solved and avg time of solved queries."""
    t0 = time.perf_counter()
    t = TableResult(
        "Table 3: large D-queries (JM/TM/GM)",
        ["Dataset", "Alg", "TimeOut", "OutOfMem", "Solved", "AvgSolved(s)"],
        notes=f"{len(sizes)} random D-queries of {min(sizes)}..{max(sizes)} nodes; "
        f"limits: {time_limit}s, {ROW_CAP} intermediate rows.",
    )
    for ds in datasets:
        g, ctx = bench_ctx(spark, ds, scale)
        queries = [
            random_pattern(n_nodes=n, qtype="D", n_labels=g.stats()["L"], seed=i)
            for i, n in enumerate(sizes)
        ]
        for alg_name, runner in (("JM", _run_jm), ("TM", _run_tm), ("GM", None)):
            results = []
            for p in queries:
                if runner is None:
                    r = run_guarded(
                        lambda gd, p=p: _run_gm(ctx, p).seconds,
                        time_limit_s=60.0,  # GM gets the paper's "always solves" budget
                    )
                    r = RunResult(r.status, r.value if r.ok else r.seconds)
                else:
                    r = runner(ctx, p, time_limit)
                results.append(r)
            solved = [r for r in results if r.ok]
            t.rows.append(
                [
                    ds,
                    alg_name,
                    sum(r.status == "TO" for r in results),
                    sum(r.status == "OM" for r in results),
                    len(solved),
                    round(sum(r.seconds for r in solved) / len(solved), 2) if solved else "-",
                ]
            )
    t.seconds = time.perf_counter() - t0
    return t


# ---------------------------------------------------------------------------
# Table 4 — search orders GM-RI / GM-JO / GM-BJ (em, ep)
# ---------------------------------------------------------------------------
def table4(
    spark: SparkSession,
    *,
    scale: str = "bench",
    datasets=("em", "ep"),
    tids=(2, 3, 4, 15, 18),
) -> TableResult:
    """Paper Table 4: H-query time per search-ordering strategy."""
    t0 = time.perf_counter()
    t = TableResult(
        "Table 4: search ordering (GM-RI / GM-JO / GM-BJ)",
        ["Query", "Dataset", "GM-RI", "GM-JO", "GM-BJ"],
    )
    for tid in tids:
        for ds in datasets:
            g, ctx = bench_ctx(spark, ds, scale)
            p = instantiate(tid, qtype="H", n_labels=g.stats()["L"], seed=1)
            row = [f"HQ{tid}", ds]
            for method in ("ri", "jo", "bj"):
                r = _run_gm(ctx, p, order_method=method)
                row.append(f"{r.seconds:.2f}")
            t.rows.append(row)
    t.seconds = time.perf_counter() - t0
    return t


# ---------------------------------------------------------------------------
# Table 5 — EH / Neo4j / GM on C-queries (em, ep)
# ---------------------------------------------------------------------------
def table5(
    spark: SparkSession,
    *,
    scale: str = "bench",
    datasets=("em", "ep"),
    tids=(0, 6, 11, 12, 13, 16),
) -> TableResult:
    """Paper Table 5: EH-probe / EH / Neo4j / GM runtimes on C-queries."""
    t0 = time.perf_counter()
    t = TableResult(
        "Table 5: C-queries vs engines (EH / Neo4j / GM)",
        ["Dataset", "Query", "EH-probe", "EH", "Neo4j", "GM"],
        notes="EH = probe + per-query precomputation; statuses TO/OM as in the paper.",
    )
    for ds in datasets:
        g, ctx = bench_ctx(spark, ds, scale)
        for tid in tids:
            p = instantiate(tid, qtype="C", n_labels=g.stats()["L"], seed=1)

            def run_eh(gd):
                df, pre = eh(ctx, p, limit=MATCH_LIMIT, guard=gd)
                t_probe0 = time.perf_counter()
                df.count()
                return pre, time.perf_counter() - t_probe0

            r_eh = run_guarded(run_eh, time_limit_s=TIME_LIMIT_S, row_cap=ROW_CAP)
            if r_eh.ok:
                pre, probe = r_eh.value
                eh_probe_s, eh_s = f"{probe:.2f}", f"{pre + probe:.2f}"
            else:
                eh_probe_s = eh_s = r_eh.status
            r_neo = _run_neo4j(ctx, p)
            r_gm = _run_gm(ctx, p)
            t.rows.append(
                [ds, f"CQ{tid}", eh_probe_s, eh_s, _fmt_run(r_neo), f"{r_gm.seconds:.2f}"]
            )
    t.seconds = time.perf_counter() - t0
    return t


# ---------------------------------------------------------------------------
# Fig. 16(a) (tabular) — GF catalog build time per dataset
# ---------------------------------------------------------------------------
def table16a(spark: SparkSession, *, scale: str = "bench") -> TableResult:
    """Paper Fig. 16(a): GF catalog building time / OM per dataset."""
    t0 = time.perf_counter()
    t = TableResult(
        "Fig 16(a): GF catalog build per dataset",
        ["Dataset", "Catalog", "ModeledEntries"],
        notes=f"OM when modeled footprint (L^2*V + L*E) > {CATALOG_CAP} entries.",
    )
    for name in dataset_names():
        if name == "db":  # paper's table covers the other eight
            continue
        g, ctx = bench_ctx(spark, name, scale)
        r = run_guarded(lambda gd: build_catalog(ctx, guard=gd), row_cap=CATALOG_CAP)
        entries = r.value.entries_modeled if r.ok else r.error.split(" rows")[0].split()[-1]
        t.rows.append([name, _fmt_run(r), entries])
    t.seconds = time.perf_counter() - t0
    return t


# ---------------------------------------------------------------------------
# Fig. 18(a) (tabular) — BFL vs TC vs catalog build on Email variants
# ---------------------------------------------------------------------------
def table18a(
    spark: SparkSession,
    *,
    configs=((5, 300), (10, 300), (15, 300), (20, 300), (20, 600), (20, 900)),
) -> TableResult:
    """Paper Fig. 18(a): build time of BFL, transitive closure, catalog."""
    t0 = time.perf_counter()
    t = TableResult(
        "Fig 18(a): BFL / TC / catalog build time on Email variants",
        ["#labels", "#nodes", "BFL(s)", "TC(s)", "TC rows", "CAT"],
    )
    for n_labels, n_nodes in configs:
        g = load_email_variant(spark, n_nodes=n_nodes, n_labels=n_labels)
        tb = time.perf_counter()
        build_bfl(g.nodes, g.edges)
        bfl_s = time.perf_counter() - tb
        tb = time.perf_counter()
        tc = transitive_closure(g.edges)
        tc_rows = tc.count()
        tc_s = time.perf_counter() - tb
        ctx = MatchContext(graph=g, reach=tc)
        r = run_guarded(lambda gd: build_catalog(ctx, guard=gd), row_cap=CATALOG_CAP)
        t.rows.append(
            [n_labels, n_nodes, f"{bfl_s:.2f}", f"{tc_s:.2f}", tc_rows, _fmt_run(r)]
        )
        _CTX[("em-var", n_labels, n_nodes)] = (g, ctx)  # reuse in table18b
    t.seconds = time.perf_counter() - t0
    return t


# ---------------------------------------------------------------------------
# Fig. 18(b) (tabular) — Neo4j / GF / GM on D-queries vs #labels
# ---------------------------------------------------------------------------
def table18b(
    spark: SparkSession,
    *,
    n_nodes: int = 300,
    label_counts=(5, 10, 15, 20),
    tids=(4, 15, 16),
) -> TableResult:
    """Paper Fig. 18(b): D-query time on Email-1k as labels vary.

    GF evaluates D-queries on the materialized transitive closure
    (the paper's workaround); its TC build time is excluded here, as in
    the paper's reporting.
    """
    t0 = time.perf_counter()
    t = TableResult(
        "Fig 18(b): D-queries vs #labels on Email fragment",
        ["Query", "Alg"] + [f"#lbs={k}" for k in label_counts],
    )
    bundles = {}
    for k in label_counts:
        key = ("em-var", k, n_nodes)
        if key not in _CTX:
            g = load_email_variant(spark, n_nodes=n_nodes, n_labels=k)
            _CTX[key] = (g, MatchContext(graph=g))
        g, ctx = _CTX[key]
        tc_graph = Graph(nodes=g.nodes, edges=ctx.reach, name=f"{g.name}-tc").cache()
        bundles[k] = (g, ctx, MatchContext(graph=tc_graph, reach=ctx.reach))
    for tid in tids:
        rows = {alg: [f"DQ{tid}", alg] for alg in ("Neo4j", "GF", "GM")}
        for k in label_counts:
            g, ctx, tc_ctx = bundles[k]
            p = instantiate(tid, qtype="D", n_labels=k, seed=1)
            rows["Neo4j"].append(_fmt_run(_run_neo4j(ctx, p)))
            r_gf = run_guarded(
                lambda gd: gf(tc_ctx, child_only_on_closure(p), limit=MATCH_LIMIT, guard=gd).count(),
                time_limit_s=TIME_LIMIT_S,
                row_cap=ROW_CAP,
            )
            rows["GF"].append(_fmt_run(r_gf))
            rows["GM"].append(f"{_run_gm(ctx, p).seconds:.2f}")
        for alg in ("Neo4j", "GF", "GM"):
            t.rows.append(rows[alg])
    t.seconds = time.perf_counter() - t0
    return t


# ---------------------------------------------------------------------------
# Table 6 — Neo4j vs GM on H-queries (Email fragment)
# ---------------------------------------------------------------------------
def table6(
    spark: SparkSession,
    *,
    scale: str = "bench",
    tids=(0, 6, 11, 12, 13, 16),
) -> TableResult:
    """Paper Table 6: H-queries on an em fragment, Neo4j vs GM."""
    t0 = time.perf_counter()
    t = TableResult(
        "Table 6: H-queries Neo4j vs GM (em fragment)",
        ["Query", "Neo4j", "GM"],
    )
    g, ctx = bench_ctx(spark, "em", scale)
    for tid in tids:
        p = instantiate(tid, qtype="H", n_labels=g.stats()["L"], seed=1)
        r_neo = _run_neo4j(ctx, p)
        r_gm = _run_gm(ctx, p)
        t.rows.append([f"HQ{tid}", _fmt_run(r_neo), f"{r_gm.seconds:.2f}"])
    t.seconds = time.perf_counter() - t0
    return t


ALL_TABLES = {
    "table2": table2,
    "table3": table3,
    "table4": table4,
    "table5": table5,
    "table16a": table16a,
    "table18a": table18a,
    "table18b": table18b,
    "table6": table6,
}
