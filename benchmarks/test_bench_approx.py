"""Approximation study (Appendix A, Figures 21/22 claims).

ApproxTBC⁺⁺ across sampling probabilities p (error falls, time grows
with p) and sGrappTBC⁺⁺ across window sizes N_t^W, on the WN and TW
analogs as in the appendix. Rows → ``results/approx.csv``.
"""
from __future__ import annotations

import numpy as np
import pytest

from benchmarks._util import once, record
from repro.approx.sampling import approx_tbc_local, mape
from repro.approx.sgrapp import fit_thetas, sgrapp_tbc
from repro.core.optimized import count_local
from repro.core.schema import days
from repro.datasets import DATASETS

DELTA = days(40)
_EXACT: dict[str, np.ndarray] = {}


def _exact(name):
    if name not in _EXACT:
        _EXACT[name] = count_local(
            DATASETS[name].generate_pdf(DATASETS[name].bench_scale), DELTA
        )
    return _EXACT[name]


@pytest.mark.parametrize("p", [0.2, 0.4, 0.6, 0.8])
@pytest.mark.parametrize("name", ["WN", "TW"])
def test_approx_p_sweep(benchmark, name, p):
    pdf = DATASETS[name].generate_pdf(DATASETS[name].bench_scale)
    exact = _exact(name)

    def run():
        ests = [approx_tbc_local(pdf, DELTA, p=p, seed=s) for s in range(5)]
        return float(np.mean([mape(e, exact) for e in ests]))

    err = once(benchmark, run)
    out = {
        "dataset": name, "algo": "approx-tbc++", "param": p,
        "mape": round(err, 4),
        "seconds": round(benchmark.stats.stats.mean, 3),
    }
    benchmark.extra_info.update(out)
    record("approx", out)


@pytest.mark.parametrize("n_t_w", [50, 200, 800])
@pytest.mark.parametrize("name", ["WN", "TW"])
def test_sgrapp_window_sweep(benchmark, name, n_t_w):
    cfg = DATASETS[name]
    pdf = cfg.generate_pdf(cfg.bench_scale)
    exact = _exact(name)
    # the paper's empirically preset per-type thetas, calibrated per
    # dataset and window size (App. A: "typically within [1.0, 1.5]" on
    # their data; our miniature analogs calibrate lower). Calibration
    # runs on a *reference* draw of the same dataset process (different
    # seed), as presetting on the evaluation data itself would be
    # circular.
    import dataclasses

    ref = dataclasses.replace(cfg, seed=cfg.seed + 1).generate_pdf(cfg.bench_scale)
    thetas = tuple(fit_thetas(ref, DELTA, n_t_w))

    est = once(benchmark, lambda: sgrapp_tbc(pdf, DELTA, n_t_w, thetas))
    out = {
        "dataset": name, "algo": "sgrapp-tbc++", "param": n_t_w,
        "mape": round(mape(est, exact), 4),
        "seconds": round(benchmark.stats.stats.mean, 3),
    }
    benchmark.extra_info.update(out)
    record("approx", out)
