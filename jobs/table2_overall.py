"""Table II — overall effectiveness of all five methods, with/without DA.

Runs CML, DE-LN, Opt-LN, Qetch* and the trained FCM over the full
benchmark through the distributed search harness and prints prec@k /
ndcg@k per (split, method) next to the paper's numbers.
"""
from __future__ import annotations

from _common import setup, trained_fcm

from repro.bench.harness import FCMMethod, da_split_metrics, default_methods, run_method
from repro.bench.tables import METHOD_ORDER, PAPER_TABLE2, fmt_row


def run(spark, bench) -> dict:
    model, _ = trained_fcm(bench)
    methods = default_methods(bench, fcm=model)
    out: dict[tuple[str, str], dict[str, float]] = {}
    for method in methods:
        mr = run_method(spark, bench, method)
        split = da_split_metrics(mr, bench)
        for part, metrics in split.items():
            out.setdefault((part, "prec"), {})[method.name] = metrics["prec"]
            out.setdefault((part, "ndcg"), {})[method.name] = metrics["ndcg"]
        print(f"[table2] {method.name}: {split}", flush=True)
    return out


def main(argv=None):
    spark, bench, _ = setup(argv)
    got = run(spark, bench)
    print(f"\nTable II — effectiveness (k={bench.cfg.k})")
    print(f"{'':22s} " + "  ".join(f"{m:>6s}" for m in METHOD_ORDER))
    for key in PAPER_TABLE2:
        part, metric = key
        print(fmt_row(f"{part} {metric} (ours)", got.get(key, {})))
        print(fmt_row(f"{part} {metric} (paper)", PAPER_TABLE2[key]))
    return got


if __name__ == "__main__":
    main()
