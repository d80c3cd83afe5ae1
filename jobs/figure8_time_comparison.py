"""Figure 8 (as a table) — total SPG-generation time: EVE vs JOIN vs
PathEnum, per (dataset, k). The paper's headline result: EVE wins
everywhere, by growing margins on dense graphs and larger k (baselines
hit INF). Also records EVE's per-phase split (Fig. 10(c))."""
from _common import base_parser, emit

DEFAULT_DATASETS = ["ps", "ye", "wn", "bk", "tw", "bs", "wt"]
DEFAULT_K = [4, 6]


def main() -> None:
    args = base_parser(__doc__).parse_args()
    from repro.bench_harness import (
        fmt_markdown_table,
        make_session,
        make_workload,
        run_eve,
        run_spg_via_enumeration,
    )

    spark = make_session("figure8")
    datasets = args.datasets or DEFAULT_DATASETS
    ks = args.k or DEFAULT_K
    rows = []
    for name in datasets:
        for k in ks:
            try:
                w = make_workload(
                    spark, name, k,
                    scale=args.scale, n_queries=args.queries, seed=args.seed,
                )
            except RuntimeError:
                continue
            eve_res, t_eve = run_eve(spark, w, time_phases=True)
            truth = {i: r.spg for i, r in enumerate(eve_res)}
            cells = [name, k, round(t_eve, 1)]
            for algo in ("join", "pathenum"):
                spg, t = run_spg_via_enumeration(
                    spark, w, algo, max_rows=args.max_rows
                )
                if spg is None:
                    cells.append(None)  # INF
                else:
                    assert spg == truth, f"{algo} SPG mismatch on {name} k={k}"
                    cells.append(round(t, 1))
            ph = eve_res[0].timings
            cells.append(
                "/".join(f"{ph.get(p, 0):.1f}"
                         for p in ("distances", "propagation", "labeling",
                                   "verification"))
            )
            rows.append(cells)
            print(f"[figure8] {cells}", flush=True)
            w.edges.unpersist()
    table = fmt_markdown_table(
        ["dataset", "k", "EVE (s)", "JOIN (s)", "PathEnum (s)",
         "EVE phases d/p/l/v (s)"],
        rows,
    )
    emit(
        f"### Figure 8 as a table — total SPG-generation time "
        f"(scale={args.scale}, Q={args.queries} per cell)\n\n{table}",
        args.out,
    )
    spark.stop()


if __name__ == "__main__":
    main()
