"""Central configuration for the FCM reproduction.

Two dataclasses flow through the whole codebase:

* :class:`FCMConfig` — model hyper-parameters (segment sizes ``P1``/``P2``,
  embedding size ``K``, HMRL depth ``beta``, MoE operator family), mirroring
  Sec. VII-B "Model Configuration" of the paper.
* :class:`BenchmarkConfig` — benchmark-construction knobs mirroring
  Sec. VII-A (number of repository tables, queries, noisy duplicates per
  query, ``k`` for prec@k / ndcg@k).

Everything is seeded; no call site uses ambient randomness.
"""
from __future__ import annotations

from dataclasses import dataclass, field, replace


#: Aggregation operators supported for DA-based queries (Sec. II) plus the
#: identity "operator" used for non-DA charts (Sec. V-B's fifth layer).
AGG_OPS = ("avg", "sum", "max", "min")
ALL_OPS = ("id",) + AGG_OPS


@dataclass(frozen=True)
class FCMConfig:
    """Hyper-parameters of the Fine-grained Cross-modal relevance Model.

    Defaults follow the paper: line-segment width ``P1=60`` px, column
    segment length ``P2=64`` points (Sec. VII-B). ``K`` is the embedding
    size of the numpy encoders (the paper uses 768-d transformers; our
    featurizer is far smaller). ``beta`` controls the number of HMRL
    sub-segments (``2**beta`` leaves per segment, Sec. V-A).
    """

    p1: int = 60          # line segment width in pixels
    p2: int = 64          # column segment length in data points
    k: int = 24           # embedding size
    beta: int = 3         # HMRL depth: 2**beta sub-segments per segment
    n_profile: int = 12   # pooled shape-profile points per segment
    attn_tau: float = 8.0 # softmax temperature of the cross-modal attention
    seed: int = 7         # seed for projection / attention parameter draws
    #: tumbling-window sizes enumerated by the DA-enabled dataset encoder;
    #: powers of two up to ~the paper's max window (100).
    da_windows: tuple[int, ...] = (2, 4, 8, 16, 32, 64)
    da_enabled: bool = True

    def without_da(self) -> "FCMConfig":
        """Variant used by the FCM-DA ablation (Sec. VII-D.2)."""
        return replace(self, da_enabled=False)


@dataclass(frozen=True)
class ChartConfig:
    """Rendering geometry of the chartsim substrate (Plotly substitute)."""

    height: int = 240      # plot-area pixel rows
    width: int = 480       # plot-area pixel columns
    margin_left: int = 12  # axis gutter (tick marks live here)
    n_ticks: int = 5       # y-axis ticks
    base_intensity: int = 60   # grey level of the first line
    intensity_step: int = 28   # grey delta between consecutive lines


@dataclass(frozen=True)
class BenchmarkConfig:
    """Benchmark-construction parameters (Sec. VII-A, scaled down).

    Paper scale: 10,161 repository tables, 200 queries, 50 noisy duplicates
    per query table, k=50. The defaults here are the "bench" scale used by
    jobs/ and benchmarks/; tests pass a much smaller config.
    """

    n_base_tables: int = 120        # distractor tables in the repository
    n_query_tables: int = 12        # test tables used to build queries
    charts_per_table: int = 2       # one plain + one DA chart per table
    n_dupes: int = 50               # noisy duplicates per query table
    k: int = 50                     # cutoff for prec@k / ndcg@k
    noise_lo: float = 0.9           # sigma ~ U(noise_lo, noise_hi), Sec. VII-A
    noise_hi: float = 1.1
    n_train_tables: int = 60        # T_train (for the logistic head)
    n_val_tables: int = 20          # T_val
    min_rows: int = 120
    max_rows: int = 640
    seed: int = 13
    fcm: FCMConfig = field(default_factory=FCMConfig)
    chart: ChartConfig = field(default_factory=ChartConfig)


def tiny_benchmark_config(seed: int = 13) -> BenchmarkConfig:
    """A unit-test-sized benchmark (builds in a few seconds)."""
    return BenchmarkConfig(
        n_base_tables=16,
        n_query_tables=4,
        charts_per_table=2,
        n_dupes=6,
        k=6,
        n_train_tables=10,
        n_val_tables=4,
        min_rows=96,
        max_rows=256,
        seed=seed,
    )
