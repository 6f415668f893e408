"""Statistical configurations for the DECO- and FUSTE-like corpora.

Targets come from the paper (Table 2, Table 3, Sec. 5.1):

DECO (854 enterprise sheets):
  233 single- / 621 multi-region files; 750 templates (679 singletons,
  71 multi-file summing 175 files); ~4.43 regions/file; 2 outlier files
  with an unusually large number of sparse regions (max 321); 3 462
  non-outlier regions (Fig. 7).

FUSTE (886 crawled sheets):
  495 single- / 391 multi-region files; 136 templates (105 singletons,
  31 multi-file summing 781 files, the largest covering 381 files);
  ~2.09 regions/file; 1 outlier file.

Region-count buckets follow Table 3 (files with 1 / 2-5 / >=6 regions).
The paper's own marginals disagree by +-1 between Tables 2 and 3 (DECO:
233 vs 232 single-region); we match Table 2 exactly and land within 1 of
Table 3 (noted in EXPERIMENTS.md).
"""
from __future__ import annotations

from dataclasses import dataclass, field

__all__ = ["CorpusConfig", "deco_config", "fuste_config"]


@dataclass(frozen=True)
class CorpusConfig:
    """Declarative description of one corpus' structural statistics."""

    name: str
    seed: int
    #: number of singleton templates (1 file each), outlier files included
    n_singletons: int
    #: file count of every multi-file template
    multi_sizes: tuple[int, ...]
    #: region-count bucket quotas over non-outlier files:
    #: {1: files with one region, 25: files with 2-5, 6: files with >=6}
    bucket_quotas: dict[int, int] = field(default_factory=dict)
    #: multi-template file counts force-assigned to a bucket (checked first)
    forced_buckets: tuple[tuple[int, int], ...] = ()  # (size, bucket)
    #: gold region counts of outlier files (each also one singleton template)
    outlier_region_counts: tuple[int, ...] = ()
    #: inclusive range for the ">=6" bucket's per-template region count
    many_region_range: tuple[int, int] = (6, 15)
    #: intra-template jitter multiplier: scales per-file structural noise
    #: (extra missing cells, column-count changes). FUSTE's crawled web
    #: files vary more within a template than DECO's enterprise reports,
    #: which is what drives FUSTE's lower completeness in Table 3.
    jitter: float = 1.0

    @property
    def n_files(self) -> int:
        return self.n_singletons + sum(self.multi_sizes)

    @property
    def n_templates(self) -> int:
        return self.n_singletons + len(self.multi_sizes)

    def __post_init__(self) -> None:
        non_outlier = self.n_files - len(self.outlier_region_counts)
        if self.bucket_quotas and sum(self.bucket_quotas.values()) != non_outlier:
            raise ValueError(
                f"{self.name}: bucket quotas {self.bucket_quotas} do not sum "
                f"to the {non_outlier} non-outlier files"
            )


# 71 multi-file DECO templates covering 175 files (Table 2: 854-679).
_DECO_MULTI = tuple([2] * 50 + [3] * 14 + [4] * 4 + [5] * 2 + [7])
assert len(_DECO_MULTI) == 71 and sum(_DECO_MULTI) == 175

# 31 multi-file FUSTE templates covering 781 files (Table 2: 886-105),
# dominated by one 381-file template (Sec. 5.1).
_FUSTE_MULTI = (
    381, 60, 45, 40, 35, 30, 25, 20, 18, 15,
    12, 10, 10, 8, 8, 6, 6, 6, 5, 5, 5,
    4, 4, 4, 4, 3, 3, 3, 2, 2, 2,
)
assert len(_FUSTE_MULTI) == 31 and sum(_FUSTE_MULTI) == 781


def deco_config() -> CorpusConfig:
    """DECO-like corpus: low template recurrence, many regions per file."""
    return CorpusConfig(
        name="deco",
        seed=7,
        n_singletons=679,
        multi_sizes=_DECO_MULTI,
        # 852 non-outlier files: 233 single-region (Table 2), 470 with 2-5
        # regions (Table 3), 149 with >=6.
        bucket_quotas={1: 233, 25: 470, 6: 149},
        # Guarantee multi-file templates in every bucket (Table 3 scores are
        # non-trivial in all three partitions).
        forced_buckets=((5, 6), (4, 6), (3, 6), (2, 1), (2, 1)),
        outlier_region_counts=(321, 100),
        many_region_range=(6, 15),
    )


def fuste_config() -> CorpusConfig:
    """FUSTE-like corpus: high recurrence, few regions per file."""
    return CorpusConfig(
        name="fuste",
        seed=11,
        n_singletons=105,
        multi_sizes=_FUSTE_MULTI,
        # 885 non-outlier files: 495 single-region, 372 with 2-5, 18 with >=6
        # (Table 3 row counts, which match Table 2's 495/391 split).
        bucket_quotas={1: 495, 25: 372, 6: 18},
        # The 381-file template is single-region; give the >=6 bucket two
        # multi-file templates so its completeness is measurable.
        forced_buckets=((381, 1), (3, 6), (2, 6)),
        outlier_region_counts=(97,),
        many_region_range=(6, 10),
        jitter=2.0,
    )
