"""Table VI — ablation: FCM vs FCM-DA (the three DA layers removed)."""
from __future__ import annotations

from _common import setup, trained_fcm

from repro.bench.harness import FCMMethod, da_split_metrics, run_method
from repro.bench.tables import PAPER_TABLE6


def run(spark, bench) -> dict:
    out = {}
    for variant, name in (("full", "FCM"), ("no_da", "FCM-DA")):
        model, _ = trained_fcm(bench, variant=variant)
        mr = run_method(spark, bench, FCMMethod(model, name=name))
        for part, metrics in da_split_metrics(mr, bench).items():
            out[(name, part)] = metrics
        print(f"[table6] {name}: {out[(name, 'Overall')]}", flush=True)
    return out


def main(argv=None):
    spark, bench, _ = setup(argv)
    got = run(spark, bench)
    print(f"\nTable VI — impact of the DA layers (k={bench.cfg.k})")
    for name in ("FCM", "FCM-DA"):
        for part in ("Overall", "With DA", "Without DA"):
            m = got[(name, part)]
            pp, pn = PAPER_TABLE6[(name, part)]
            print(
                f"{name:8s} {part:12s} prec={m['prec']:.3f} (paper {pp:.3f})"
                f"  ndcg={m['ndcg']:.3f} (paper {pn:.3f})"
            )
    return got


if __name__ == "__main__":
    main()
