"""§4.4 extreme case — where TBC⁺⁺ overtakes TBC⁺ (Figure 8 scenario).

On the two-hub graph every wedge has a distinct t_s and δ covers the
whole span, so TBC⁺'s HP Query degenerates to α ≈ |W(u)| while the
TBC⁺⁺ trees stay logarithmic. The measured gap should widen with the
number of middles. Rows → ``results/extreme.csv``.
"""
from __future__ import annotations

import pytest

from benchmarks._util import once, record
from repro.core.schema import days
from repro.core.wedge_set import count_group_plus, count_group_pp
from repro.synth_data import extreme_hub_pdf

KERNELS = {"tbc+": count_group_plus, "tbc++": count_group_pp}
DELTA = days(11)  # covers the 10-day span: nothing is ever pruned


def _group(n_middles):
    pdf = extreme_hub_pdf(n_middles=n_middles, span_days=10.0, seed=0)
    tt = pdf.pivot_table(index="v", columns="u", values="t").to_numpy()
    return [
        (2 * i + 1, int(min(a, b)), int(max(a, b)), bool(a < b))
        for i, (a, b) in enumerate(tt)
    ]


@pytest.mark.parametrize("n_middles", [1000, 2000, 4000])
@pytest.mark.parametrize("algo", list(KERNELS))
def test_extreme_hub(benchmark, algo, n_middles):
    ws = _group(n_middles)
    counts = once(benchmark, lambda: KERNELS[algo](ws, DELTA, 0))
    out = {
        "algo": algo, "n_middles": n_middles, "total": int(counts.sum()),
        "seconds": round(benchmark.stats.stats.mean, 3),
    }
    benchmark.extra_info.update(out)
    record("extreme", out)
    assert counts.sum() == n_middles * (n_middles - 1) // 2
