"""Table 5 — Performance comparison of SRS/RCS/WCS/TWCS on static KGs.

Annotation hours (mean ± sd over Monte-Carlo trials) and accuracy
estimates for the four sampling designs on MOVIE, NELL and YAGO, at the
default evaluation task (MoE <= 5% at 95% confidence). TWCS runs at the
optimal second-stage size m from Eq 12, like the paper's default.

YAGO estimates are reported as the empirical 95% interval (the paper's
footnote: accuracy is capped at 100%, so mean ± sd misrepresents the
distribution there).
"""
from __future__ import annotations

import numpy as np

from repro.core.cluster_stats import Population
from repro.core.variance import optimal_m
from repro.kg.generator import movie_like, nell_like, yago_like
from repro.sim import mc
from repro.tables.common import n_trials, render

PAPER = {
    ("MOVIE", "SRS"): ("3.53*", "90%"),
    ("MOVIE", "RCS"): (">5*", "95%"),
    ("MOVIE", "WCS"): (">5*", "93%"),
    ("MOVIE", "TWCS"): ("1.4*", "88%"),
    ("NELL", "SRS"): ("2.3±0.45", "91.5%±2.1%"),
    ("NELL", "RCS"): ("8.25±2.55", "90.5%±2.4%"),
    ("NELL", "WCS"): ("1.92±0.62", "91.6%±2.3%"),
    ("NELL", "TWCS"): ("1.85±0.6", "91.6%±2.2%"),
    ("YAGO", "SRS"): ("0.45±0.17", "99.6% (96.7%-100%)"),
    ("YAGO", "RCS"): ("10±0.56", "98.9% (95.3%-100%)"),
    ("YAGO", "WCS"): ("0.49±0.04", "99.2% (96.7%-100%)"),
    ("YAGO", "TWCS"): ("0.44±0.07", "99.2% (96.7%-100%)"),
}

_DESIGNS = ["SRS", "RCS", "WCS", "TWCS"]


def compute(
    *,
    movie_sf: float = 1.0,
    trials: int | None = None,
    rcs_trials: int | None = None,
    seed: int = 1,
) -> list[dict]:
    """MC summaries per (KG, design); ``rcs_trials`` caps the slow RCS
    cells (RCS needs thousands of draws per trial on MOVIE)."""
    t = trials if trials is not None else n_trials(1000)
    t_rcs = rcs_trials if rcs_trials is not None else max(1, t // 10)
    kgs = [
        ("MOVIE", Population.from_synthetic(movie_like(sf=movie_sf))),
        ("NELL", Population.from_synthetic(nell_like())),
        ("YAGO", Population.from_synthetic(yago_like())),
    ]
    rows = []
    for kg_name, pop in kgs:
        m_opt = optimal_m(pop.sizes, pop.cluster_accuracies, alpha=0.05, eps=0.05)
        for design in _DESIGNS:
            kw: dict = {}
            nt = t
            if design == "TWCS":
                kw = {"m": m_opt}
            if design == "RCS":
                nt = t_rcs
            s = mc.run_trials(pop, design.lower(), n_trials=nt, seed=seed, **kw)
            p_time, p_est = PAPER[(kg_name, design)]
            if kg_name == "YAGO":
                est = (
                    f"{100 * s.mu_mean:.1f}% "
                    f"({100 * s.mu_p025:.1f}%-{100 * s.mu_p975:.1f}%)"
                )
            else:
                est = f"{100 * s.mu_mean:.1f}%±{100 * s.mu_sd:.1f}%"
            rows.append(
                {
                    "KG": kg_name,
                    "method": design + (f" (m={m_opt})" if design == "TWCS" else ""),
                    "time h (paper)": p_time,
                    "time h (ours)": f"{s.hours_mean:.2f}±{s.hours_sd:.2f}",
                    "estimation (paper)": p_est,
                    "estimation (ours)": est,
                    "trials": s.n_trials,
                }
            )
    return rows


def table_text(rows: list[dict]) -> str:
    return render(
        "Table 5: Performance comparison of solutions on static KGs "
        "(* = paper's actual manual cost; ours are simulated via Eq 4)",
        rows,
        list(rows[0].keys()),
    )
