"""Reproduce paper Table 7: aggregation time per selection method.

RandDir / LongDir / RevDir / BestDir all feed the same BothAgg
aggregation; the paper reports similar times across methods (the
selection mostly changes *which* transformations get grouped, not how
long grouping takes). Run: ``spark-submit jobs/table7_selection_time.py``.
"""
import sys
from dataclasses import replace
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))

from common import THETA, base_parser, get_spark, print_table

from repro.core.pipeline import PipelineConfig, aggregate_rules, prepare_rules
from repro.entity_data import generate_dataset, to_spark

PAPER = {  # seconds (Table 7)
    "authorlist": {"RandDir": 118.0, "LongDir": 124.4, "RevDir": 116.2,
                   "BestDir": 115.4},
    "address": {"RandDir": 0.62, "LongDir": 0.66, "RevDir": 2.743,
                "BestDir": 0.661},
    "journaltitle": {"RandDir": 120.6, "LongDir": 132.3, "RevDir": 151.4,
                     "BestDir": 142.3},
}


def main() -> None:
    args = base_parser(__doc__).parse_args()
    spark = get_spark("table7")
    rows = []
    for ds in args.datasets:
        rec, _ = generate_dataset(ds, sf=args.sf, seed=args.seed)
        cfg = PipelineConfig(theta=THETA[ds])
        _, rules = prepare_rules(spark, to_spark(spark, rec), cfg)
        for method in ("RandDir", "LongDir", "RevDir", "BestDir"):
            grouped, t = aggregate_rules(
                spark, rules, replace(cfg, selection=method)
            )
            rows.append(
                [ds, method, grouped["group_key"].nunique(), f"{t:.2f}",
                 f"(paper {PAPER[ds][method]})"]
            )
    print_table(
        f"Table 7 — aggregation time (s) by selection method at sf={args.sf}",
        ["dataset", "selection", "#groups", "time_s", "paper_C++"],
        rows,
    )
    spark.stop()


if __name__ == "__main__":
    main()
