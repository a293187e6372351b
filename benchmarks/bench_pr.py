"""Benchmark + reproduction of Fig. 4 (top-k precision/recall tables).

Runs all three systems over testbedS, testbedM, and Spider-lite at bench
scale and prints P@k/R@k per system — the paper's Fig. 4(a–c) as tables.
Shape assertions encode the paper's claims: WarpGate consistently above
both baselines on the NextiaJD testbeds; on Spider, WarpGate compares
favorably to D3L and beats Aurum by a large margin, with D3L's recall
climbing at larger k.
"""
from __future__ import annotations

import pytest

from benchmarks.conftest import BENCH_MAX_QUERIES
from repro.eval import tables as T
from repro.eval.harness import run_queries
from repro.eval.metrics import pr_curve

KS = [1, 3, 5, 10]


def _pr_run(fixture):
    spec, _, systems = fixture
    curves = {}
    for name, sys_ in systems.items():
        rr = run_queries(
            sys_, name, spec.queries, k=10, max_queries=BENCH_MAX_QUERIES
        )
        queries = spec.queries[:BENCH_MAX_QUERIES]
        curves[name] = pr_curve(rr.rankings, queries, KS)
    return curves


def _assert_nextia_shape(curves):
    for i, k in enumerate(KS):
        wg, d3l, aurum = (
            curves["WarpGate"][i],
            curves["D3L"][i],
            curves["Aurum"][i],
        )
        assert wg.recall >= d3l.recall - 0.06, f"k={k}"
        assert wg.recall > aurum.recall, f"k={k}"
        assert wg.precision >= aurum.precision, f"k={k}"


@pytest.mark.parametrize("which", ["S", "M"])
def test_fig4_nextiajd(benchmark, bench_ctx, indexed_s, indexed_m, which, capsys):
    fixture = indexed_s if which == "S" else indexed_m
    curves = benchmark.pedantic(_pr_run, args=(fixture,), rounds=1, iterations=1)
    with capsys.disabled():
        print()
        print(T.format_markdown(T.pr_table(curves), f"Fig 4 — testbed{which}"))
    _assert_nextia_shape(curves)


def test_fig4_spider(benchmark, bench_ctx, capsys):
    spec, wh = bench_ctx.corpus("spider")
    systems = bench_ctx.systems()
    for s in systems.values():
        s.build_index(wh)
    curves = benchmark.pedantic(
        _pr_run, args=((spec, wh, systems),), rounds=1, iterations=1
    )
    with capsys.disabled():
        print()
        print(T.format_markdown(T.pr_table(curves), "Fig 4 — Spider"))
    # §4.3.2 shape.
    assert curves["WarpGate"][3].recall > curves["Aurum"][3].recall + 0.25
    assert curves["WarpGate"][3].recall >= curves["D3L"][3].recall - 0.06
    assert curves["D3L"][3].recall > curves["D3L"][0].recall + 0.15
