"""Reproduce paper Table 5: MC golden-record precision before/after.

Protocol (§7.5): sample ground-truth clusters (100/100/200 in the
paper), run majority consensus on the raw clusters (before), then run
the full pipeline with a confirmation budget and re-run MC on the
transformed clusters (after). Run:
``spark-submit jobs/table5_mc_precision.py --sf 0.1 --budget 100``.
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))

from common import THETA, base_parser, get_spark, print_table

from repro.core.pipeline import PipelineConfig, evaluate_mc, run_pipeline
from repro.entity_data import generate_dataset, mc_truth_sample

PAPER = {  # (before, after) — Table 5
    "authorlist": (0.51, 0.65),
    "address": (0.32, 0.47),
    "journaltitle": (0.335, 0.840),
}
N_TRUTH = {"authorlist": 100, "address": 100, "journaltitle": 200}


def main() -> None:
    p = base_parser(__doc__)
    p.add_argument("--budget", type=int, default=100)
    args = p.parse_args()
    spark = get_spark("table5")
    rows = []
    for ds in args.datasets:
        rec, truth = generate_dataset(ds, sf=args.sf, seed=args.seed)
        cfg = PipelineConfig(theta=THETA[ds], budget_groups=args.budget)
        res = run_pipeline(spark, rec, cfg)
        ts = mc_truth_sample(rec, truth, N_TRUTH[ds], seed=args.seed + 1)
        before = evaluate_mc(spark, rec, ts, None)
        after = evaluate_mc(spark, rec, ts, res)
        pb, pa = PAPER[ds]
        rows.append(
            [ds, f"{before:.3f}", f"(paper {pb})", f"{after:.3f}",
             f"(paper {pa})", f"+{after - before:.3f}",
             f"(paper +{pa - pb:.3f})"]
        )
    print_table(
        f"Table 5 — MC precision before/after at sf={args.sf}, "
        f"budget={args.budget}",
        ["dataset", "before", "", "after", "", "improvement", ""],
        rows,
    )
    spark.stop()


if __name__ == "__main__":
    main()
