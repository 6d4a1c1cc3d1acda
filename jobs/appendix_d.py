"""Appendix D (Figure 5) in table form: ER and BA synthetic sweeps.

The paper sweeps n ∈ {100K..10M} and ρ ∈ {5..40} and plots running times
(HBBMC++ vs the four baselines) as figures; figures are out of scope for
this reproduction, so this job prints the same quantities as rows at
laptop scale. The paper-observed shapes to compare against (Appendix D):
HBBMC++ fastest everywhere, ER's δ grows with n while BA's stays flat, and
BA graphs are slower than ER at equal n/ρ (larger cliques).

Usage: python jobs/appendix_d.py [--points small|full] [--markdown]
"""
import argparse
import sys
import time

from _common import emit

from repro.core.hbbmc import run_named
from repro.core.ordering import degeneracy_order, truss_order
from repro.graphs.generators import ba_edges, er_edges, to_local

ALGS = ["HBBMC++", "RDegen", "RRcd"]


def sweep(points: str) -> list[dict]:
    if points == "small":
        ns, rhos = [1000, 2000], [5]
    else:
        ns, rhos = [1000, 2000, 5000], [3, 5, 10]
    rows = []
    for model in ("er", "ba"):
        for n in ns:
            for rho in rhos:
                if model == "er":
                    g = to_local(er_edges(n, n * rho, seed=0), n)
                else:
                    g = to_local(ba_edges(n, rho, seed=0), n)
                row = dict(model=model.upper(), n=n, rho=rho,
                           delta=degeneracy_order(g).delta, tau=truss_order(g).tau)
                counts = set()
                for alg in ALGS:
                    t0 = time.perf_counter()
                    r = run_named(g, alg)
                    row[f"{alg.lower().replace('+', 'p')}_s"] = round(
                        time.perf_counter() - t0, 3
                    )
                    counts.add(r.n_cliques)
                assert len(counts) == 1
                row["cliques"] = counts.pop()
                rows.append(row)
    return rows


def main(argv=None) -> None:
    p = argparse.ArgumentParser()
    p.add_argument("--points", choices=["small", "full"], default="full")
    p.add_argument("--markdown", action="store_true")
    args = p.parse_args(argv)
    emit(sweep(args.points), args)
    sys.stdout.flush()


if __name__ == "__main__":
    main()
