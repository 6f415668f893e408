"""Synthetic multiregion-spreadsheet corpora (DECO/FUSTE substitutes).

The paper evaluates on two real, manually annotated corpora we cannot
access offline. :mod:`repro.corpus.generator` synthesizes corpora that
reproduce the published structural statistics (Table 2 / Table 3
marginals) with realistic intra-template jitter; :mod:`repro.corpus.configs`
holds the DECO and FUSTE configurations. See DESIGN.md, "Substitutions".
"""
from repro.corpus.configs import deco_config, fuste_config  # noqa: F401
from repro.corpus.generator import GeneratedFile, RegionGold, generate_corpus  # noqa: F401
