"""Figure 5 — Synthesized Relationship Dictionary (exact reproduction).

Benchmarks the dictionary construction on the reconstructed Fig 2
instance and asserts the paper's printed scores bit-for-bit.
"""
import pandas as pd
import pytest

from benchmarks.conftest import write_table
from repro.core.fd import unary_fds
from repro.core.synth_method import (
    pair_dictionary,
    pair_overlap_matrix,
    pair_sizes,
    pair_values,
)
from tests.test_synth_method import FIG2, FIG5_EXPECTED, _cells_from_tables


def _build_dict(spark):
    cells = _cells_from_tables(spark, FIG2)
    fds = unary_fds(cells)
    pv = pair_values(cells, fds)
    pov = pair_overlap_matrix(pv, pair_sizes(pv))
    return pair_dictionary(pv, pov).toPandas()


def test_fig5_dictionary(spark, benchmark):
    d = benchmark.pedantic(_build_dict, args=(spark,), rounds=1, iterations=1)
    got: dict = {}
    for r in d.itertuples():
        if (r.rcol1, r.rcol2) == (0, 1):
            got.setdefault((r.v1, r.v2), {})[r.rtable] = r.score

    lines = [
        "# Figure 5 — Synthesized Relationship Dictionary",
        "",
        "| Relationship (value pair) | RS : type score (ours) | paper |",
        "|---|---|---|",
    ]
    label = {"T1": "RS(A,B)", "T2": "RS(D,E)", "T3": "RS(F,G)"}
    for vp, expected in FIG5_EXPECTED.items():
        ours = ", ".join(
            f"{label[t]}: {got[vp].get(t, 0.0):.2f}" for t in sorted(expected)
        )
        paper = ", ".join(f"{label[t]}: {s:.2f}" for t, s in sorted(expected.items()))
        lines.append(f"| {vp} | {ours} | {paper} |")
        for t, s in expected.items():
            assert got[vp][t] == pytest.approx(s, abs=1e-9)
    write_table("fig5_dictionary", lines)
