"""Table 2 — dataset inventory: our synthetic stand-ins vs the paper's
real networks (|V|, |E|, d_avg, type)."""
from _common import base_parser, emit


def main() -> None:
    args = base_parser(__doc__).parse_args()
    from repro.bench_harness import fmt_markdown_table
    from repro.graphs.datasets import SPECS, dataset_edges_pdf

    rows = []
    for spec in SPECS:
        pdf = dataset_edges_pdf(spec.name, args.scale)
        n_v = len(set(pdf["src"]) | set(pdf["dst"]))
        rows.append(
            [
                spec.name, spec.paper_dataset, spec.gtype, spec.kind,
                spec.paper_v, spec.paper_e, spec.paper_davg,
                n_v, len(pdf), round(len(pdf) / n_v, 1),
            ]
        )
    table = fmt_markdown_table(
        ["name", "paper dataset", "type", "generator",
         "paper |V|", "paper |E|", "paper d_avg",
         "ours |V|", "ours |E|", "ours d_avg"],
        rows,
    )
    emit(f"### Table 2 stand-ins (scale={args.scale})\n\n{table}", args.out)


if __name__ == "__main__":
    main()
