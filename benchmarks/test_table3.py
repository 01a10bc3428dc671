"""Benchmark: Table 3 (main algorithm comparison) — one benchmark per
dataset-side, in the paper's column order (ItU ... TrV).

Each benchmark runs pvBcnt, BUP, ParB (Spark where the paper has a ParB
entry, budgeted; exact ρ/Λ from the simulator everywhere) and full
RECEIPT on one side, cross-checking all tip numbers against BUP before
recording anything. Columns are appended to ``results/table3.jsonl``
per test; markdown is rebuilt at teardown.
"""
import pytest

from repro.experiments import datasets, report, table3

from .conftest import BENCH_SCALE, N_PARTITIONS, PARB_BUDGET_ITV_S, PARB_BUDGET_S

_ORDER = [datasets.label(n, s) for n, s in datasets.SIDES]


def _render():
    cols = report.load_jsonl("table3")
    cols.sort(key=lambda c: _ORDER.index(c["label"]))
    for c in cols:  # JSON round-trips inf as the string "inf"
        if c["t_parb"] == "inf":
            c["t_parb"] = float("inf")
    report.save("table3", {"scale": BENCH_SCALE, "columns": cols}, table3.render(cols))


@pytest.fixture(scope="module", autouse=True)
def _write_results():
    yield
    _render()


@pytest.mark.parametrize(
    "name,side", datasets.SIDES, ids=[datasets.label(n, s) for n, s in datasets.SIDES]
)
def test_table3(benchmark, spark, name, side):
    col = benchmark.pedantic(
        table3.run_side,
        args=(spark, name, side),
        kwargs=dict(
            scale=BENCH_SCALE,
            n_partitions=N_PARTITIONS,
            parb_budget_s=(
                PARB_BUDGET_ITV_S
                if datasets.label(name, side) == "ItV"
                else PARB_BUDGET_S
            ),
        ),
        rounds=1,
        iterations=1,
    )
    # headline shape: orders-of-magnitude fewer synchronization rounds
    assert col["rho_receipt"] < col["rho_parb"]
    report.append_jsonl("table3", col)
