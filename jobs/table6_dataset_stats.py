"""Reproduce paper Table 6: dataset details (#rows, #clusters, sizes).

Run: ``spark-submit jobs/table6_dataset_stats.py --sf 1.0`` (sf=1 ≈ the
paper's dataset sizes; benches use smaller sf). No Spark work needed —
the generators are driver-side — but the job keeps the spark-submit
contract of one entrypoint per table.
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))

from common import base_parser, print_table

from repro.entity_data import dataset_stats, generate_dataset, sample_labeled_pairs

PAPER = {
    "authorlist": (33_971, 1_265, "26.85/1/159", 0.265),
    "address": (17_497, 3_038, "5.759/1/1196", 0.18),
    "journaltitle": (55_617, 31_023, "1.79/1/203", 0.74),
}


def main() -> None:
    args = base_parser(__doc__).parse_args()
    rows = []
    for ds in args.datasets:
        rec, _ = generate_dataset(ds, sf=args.sf, seed=args.seed)
        st = dataset_stats(rec)
        pairs = sample_labeled_pairs(rec, 100_000, seed=args.seed + 1)
        p_rows, p_clusters, p_sizes, p_dup = PAPER[ds]
        rows.append(
            [
                ds,
                st["rows"],
                f"(paper {p_rows})",
                st["clusters"],
                f"(paper {p_clusters})",
                f"{st['avg_size']:.2f}/{st['min_size']}/{st['max_size']}",
                f"(paper {p_sizes})",
                f"{pairs['is_dup'].mean():.3f}",
                f"(paper {p_dup})",
            ]
        )
    print_table(
        f"Table 6 — dataset details at sf={args.sf}",
        ["dataset", "#rows", "", "#clusters", "", "avg/min/max size", "",
         "dup-pair rate", ""],
        rows,
    )


if __name__ == "__main__":
    main()
