"""Row producers for each table the reproduction regenerates.

Each function returns plain dict rows and a pretty-printer so the jobs in
``jobs/`` can print exactly the rows recorded in EXPERIMENTS.md next to the
paper's numbers.
"""
from __future__ import annotations

from typing import Dict, List, Optional, Sequence

import numpy as np

from repro.core import linearized
from repro.core.exactsim import exactsim
from repro.experiments import harness
from repro.graphs import generators as gen

C = 0.6

#: Paper Table 2, for side-by-side printing.
PAPER_TABLE2 = {
    "GQ-lite": ("ca-GrQc (GQ)", "undirected", 5_242, 28_968),
    "HT-lite": ("CA-HepTh (HT)", "undirected", 9_877, 51_946),
    "WV-lite": ("Wikivote (WV)", "directed", 7_115, 103_689),
    "HP-lite": ("CA-HepPh (HP)", "undirected", 12_008, 236_978),
    "DB-lite": ("DBLP-Author (DB)", "undirected", 5_425_963, 17_298_032),
    "IC-lite": ("IndoChina (IC)", "directed", 7_414_768, 191_606_827),
    "IT-lite": ("It-2004 (IT)", "directed", 41_290_682, 1_135_718_909),
    "TW-lite": ("Twitter (TW)", "directed", 41_652_230, 1_468_364_884),
}

#: Paper Table 3 (GB).
PAPER_TABLE3 = {
    "DB-lite": {"basic": 2.49, "exactsim": 0.47, "graph": 0.48},
    "IC-lite": {"basic": 3.40, "exactsim": 0.58, "graph": 1.88},
    "IT-lite": {"basic": 18.95, "exactsim": 3.26, "graph": 10.94},
    "TW-lite": {"basic": 19.12, "exactsim": 3.54, "graph": 13.30},
}


def table2_rows() -> List[Dict]:
    """Table 2 analog: our synthetic datasets next to the paper's originals."""
    rows = []
    for name in gen.SMALL_DATASETS + gen.LARGE_DATASETS:
        g = gen.load(name)
        paper_name, ptype, pn, pm = PAPER_TABLE2[name]
        rows.append(
            {
                "dataset": name,
                "type": "directed" if g.directed else "undirected",
                "n": g.n,
                "m": g.m,
                "paper_dataset": paper_name,
                "paper_type": ptype,
                "paper_n": pn,
                "paper_m": pm,
            }
        )
    return rows


def table3_rows(
    *,
    eps_mem: float = 1e-5,
    datasets: Optional[Sequence[str]] = None,
    source: Optional[int] = None,
) -> List[Dict]:
    """Table 3 analog: ℓ-hop-vector memory, basic vs optimized vs graph size.

    ``eps_mem = 1e-5`` is the scaled analog of the paper's ε = 1e-7: the
    Lemma-2 threshold relative to the typical entry magnitude ``1/n`` then
    matches the paper's regime (``threshold·n ≈ 0.01``, as at ε=1e-7 with
    n ≈ 5e6) — see EXPERIMENTS.md.  Memory is measured exactly, from the
    stored-entry counts of the forward phase.
    """
    rows = []
    for name in datasets or gen.LARGE_DATASETS:
        g = gen.load(name)
        src = harness.pick_sources(g, 1)[0] if source is None else source
        eps_int = eps_mem / 2.0
        L = linearized.iterations_for(eps_int, C)
        thr = linearized.sparse_threshold(eps_int, C)
        fwd_dense = linearized.forward(g.csr, int(src), c=C, L=L)
        fwd_sparse = linearized.forward(g.csr, int(src), c=C, L=L, threshold=thr)
        paper = PAPER_TABLE3[name]
        rows.append(
            {
                "dataset": name,
                "basic_mb": fwd_dense.dense_bytes() / 1e6,
                "exactsim_mb": fwd_sparse.sparse_bytes() / 1e6,
                "graph_mb": g.csr.csr_bytes() / 1e6,
                "reduction": fwd_dense.dense_bytes()
                / max(fwd_sparse.sparse_bytes(), 1),
                "paper_basic_gb": paper["basic"],
                "paper_exactsim_gb": paper["exactsim"],
                "paper_graph_gb": paper["graph"],
                "paper_reduction": paper["basic"] / paper["exactsim"],
            }
        )
    return rows


def ablation_rows(
    *,
    dataset: str = "GQ-lite",
    eps_grid: Sequence[float] = (1e-2, 1e-3, 1e-4),
    max_pairs: int = 2_000_000,
    n_sources: int = 2,
    seed: int = 11,
    truth: Optional[Dict[int, np.ndarray]] = None,
    walk_engine: str = "local",
) -> List[Dict]:
    """Figure 9 analog: basic vs optimized ExactSim, same ε and pair cap.

    Reports measured MaxError and wall time per variant; the paper's claim is
    a 10-100× speedup at matched error, which shows up here as the optimized
    variant reaching a several-× smaller error in comparable or less time.
    """
    g = gen.load(dataset)
    if truth is not None:
        # Use the caller's evaluated sources — they define the truth vectors.
        sources = np.array(sorted(truth.keys())[:n_sources])
    else:
        sources = harness.pick_sources(g, n_sources, seed=seed)
        truth = harness.ground_truth_small(g, sources)
    rows = []
    for eps in eps_grid:
        for variant in ("basic", "opt"):
            errs, times, sims = [], [], []
            for s in sources:
                r = exactsim(
                    g, int(s), eps=eps, variant=variant, seed=seed,
                    walk_engine=walk_engine, max_pairs=max_pairs,
                )
                errs.append(float(np.max(np.abs(r.scores - truth[int(s)]))))
                times.append(r.seconds_total)
                sims.append(r.pairs_simulated)
            rows.append(
                {
                    "dataset": dataset,
                    "variant": variant,
                    "eps": eps,
                    "max_error": float(np.mean(errs)),
                    "seconds": float(np.mean(times)),
                    "pairs_simulated": float(np.mean(sims)),
                }
            )
    return rows


def print_rows(rows: List[Dict]) -> None:
    """Aligned key=value printer shared by the jobs."""
    for r in rows:
        parts = []
        for k, v in r.items():
            if isinstance(v, float):
                parts.append(f"{k}={v:.4g}")
            else:
                parts.append(f"{k}={v}")
        print("  ".join(parts))
