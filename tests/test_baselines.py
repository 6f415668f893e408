"""Tests for the baseline region-detection strategies."""
from __future__ import annotations

import numpy as np
import pytest

from repro.baselines import connected_components as cc
from repro.baselines import genetic, tablesense
from repro.core.elements import Box
from repro.core.grid import csv_to_type_grid
from repro.corpus import deco_config, generate_corpus
from repro.eval.detection import file_scores

TWO_TABLES = (
    "Year,Total\n2001,5\n2002,6\n2003,7\n"
    ",,\n,,\n"
    "Name,Qty\nalpha beta,1\ngamma delta,2\nepsilon zeta,3\n"
)


class TestConnectedComponents:
    def test_separated_tables_two_regions(self):
        tg = csv_to_type_grid(TWO_TABLES)
        boxes = cc.detect(tg)
        assert len(boxes) == 2
        assert boxes[0] == Box(0, 0, 1, 3)
        assert boxes[1] == Box(0, 6, 1, 9)

    def test_gap_splits_table(self):
        """CC's known weakness: missing-value empty rows split a table."""
        tg = csv_to_type_grid("Year,Total\n2001,5\n,\n2003,7\n")
        assert len(cc.detect(tg)) == 2

    def test_empty_grid(self):
        assert cc.detect(np.zeros((4, 4), dtype=np.int8)) == []

    def test_boxes_sorted(self):
        tg = csv_to_type_grid(TWO_TABLES)
        boxes = cc.detect(tg)
        assert boxes == sorted(boxes, key=lambda b: (b.y0, b.x0, b.y1, b.x1))


class TestGenetic:
    def test_detects_two_stacked_tables(self):
        tg = csv_to_type_grid(TWO_TABLES)
        boxes = genetic.detect(tg, None, seed=3, error_rate=0.0)
        # With clean classification, both tables surface as regions.
        scores = file_scores(tg != 0, boxes, [Box(0, 0, 1, 3), Box(0, 6, 1, 9)])
        assert all(iou >= 0.5 for iou, _ in scores)

    def test_noise_degrades_boundaries(self):
        """The paper's cascade: classification errors worsen boundaries."""
        files = [f for f in generate_corpus(deco_config(), sf=0.03) if not f.is_outlier]
        clean_scores, noisy_scores = [], []
        for f in files:
            tg = csv_to_type_grid(f.content)
            gold = [g.box for g in f.gold]
            clean = genetic.detect(tg, None, seed=1, error_rate=0.0)
            noisy = genetic.detect(tg, None, seed=1, error_rate=0.35)
            clean_scores.extend(i for i, _ in file_scores(tg != 0, clean, gold))
            noisy_scores.extend(i for i, _ in file_scores(tg != 0, noisy, gold))
        assert np.mean(noisy_scores) < np.mean(clean_scores)

    def test_xls_beats_csv(self):
        """Style features close classification gaps (Fig. 6's XLS/CSV gap)."""
        files = [f for f in generate_corpus(deco_config(), sf=0.04) if not f.is_outlier]
        xls, csv_ = [], []
        for f in files:
            tg = csv_to_type_grid(f.content)
            gold = [g.box for g in f.gold]
            bx = genetic.detect(tg, f.style_boxes, seed=1)
            bc = genetic.detect(tg, None, seed=1)
            xls.extend(i for i, _ in file_scores(tg != 0, bx, gold))
            csv_.extend(i for i, _ in file_scores(tg != 0, bc, gold))
        assert np.mean(xls) > np.mean(csv_)

    def test_deterministic_given_seed(self):
        tg = csv_to_type_grid(TWO_TABLES)
        a = genetic.detect(tg, None, seed=7)
        b = genetic.detect(tg, None, seed=7)
        assert a == b

    def test_empty_input(self):
        assert genetic.detect(np.zeros((3, 3), dtype=np.int8), None) == []

    def test_classify_roles_shape(self):
        tg = csv_to_type_grid(TWO_TABLES)
        rng = np.random.default_rng(0)
        roles = genetic.classify_cells(tg, None, rng=rng, error_rate=0.0)
        assert roles.shape == tg.shape
        assert (roles[tg == 0] == 0).all()

    def test_header_rows_classified(self):
        tg = csv_to_type_grid("Year,Total\n1,2\n3,4\n5,6\n")
        rng = np.random.default_rng(0)
        roles = genetic.classify_cells(tg, None, rng=rng, error_rate=0.0)
        assert (roles[0, :2] == 2).all()  # header row
        assert (roles[1:, :2] == 1).all()  # data rows


class TestTableSense:
    def test_dilate_grows_mask(self):
        m = np.zeros((5, 5), dtype=bool)
        m[2, 2] = True
        d = tablesense.dilate(m, 1)
        assert d.sum() == 5  # plus 4-neighborhood

    def test_proposals_merge_close_blocks(self):
        """Dilation bridges a 1-row gap into a single proposal."""
        tg = csv_to_type_grid("1,2\n,\n3,4\n")
        props = tablesense.proposals(tg != 0)
        assert len(props) == 1 and props[0] == Box(0, 0, 1, 2)

    def test_dense_table_survives(self):
        tg = csv_to_type_grid("\n".join("1,2,3,4,5" for _ in range(10)))
        boxes = tablesense.detect(tg, seed=0, noise=0.0)
        assert len(boxes) == 1

    def test_sparse_region_missed(self):
        """The Mask-R-CNN failure mode: small sparse areas are ignored."""
        tg = csv_to_type_grid("x\n")
        assert tablesense.detect(tg, seed=0, noise=0.0) == []

    def test_stochastic_across_seeds(self):
        files = [f for f in generate_corpus(deco_config(), sf=0.03) if not f.is_outlier]
        diffs = 0
        for f in files:
            tg = csv_to_type_grid(f.content)
            if tablesense.detect(tg, seed=0) != tablesense.detect(tg, seed=1):
                diffs += 1
        assert diffs > 0

    def test_miss_rate_band(self):
        """DECO-like corpora lose roughly half their regions (paper: 48.8%)."""
        files = [f for f in generate_corpus(deco_config(), sf=0.05) if not f.is_outlier]
        missed, total = 0, 0
        for f in files:
            tg = csv_to_type_grid(f.content)
            boxes = tablesense.detect(tg, seed=1)
            for iou, _ in file_scores(tg != 0, boxes, [g.box for g in f.gold]):
                missed += iou == 0.0
                total += 1
        assert 0.3 <= missed / total <= 0.65

    def test_empty_input(self):
        assert tablesense.detect(np.zeros((3, 3), dtype=np.int8)) == []


class TestGeneticFitness:
    def test_header_band_majority_rule(self):
        from repro.baselines.genetic import _header_band, classify_cells
        import numpy as np
        from repro.core.grid import csv_to_type_grid

        tg = csv_to_type_grid("Year,Total,Avg\n1,2,3\n4,5,6\n")
        roles = classify_cells(tg, None, rng=np.random.default_rng(0), error_rate=0.0)
        band = _header_band(roles)
        assert band[0] and not band[1] and not band[2]

    def test_isolated_flip_does_not_create_band(self):
        from repro.baselines.genetic import _header_band, _DATA, _HEADER
        import numpy as np

        roles = np.full((1, 5), _DATA, dtype=np.int8)
        roles[0, 2] = _HEADER  # single flipped cell in a 5-wide data row
        assert not _header_band(roles)[0]

    def test_splitting_table_does_not_pay(self):
        """The fitness must not reward shredding one table into fragments
        (that pathology made genetic inference the slowest strategy)."""
        from repro.baselines.genetic import _fitness, classify_cells
        import numpy as np
        from repro.core.grid import csv_to_type_grid

        tg = csv_to_type_grid(
            "Year,Total\n1,2\n3,4\n,\n5,6\n7,8\n,\n9,10\n11,12\n"
        )
        roles = classify_cells(tg, None, rng=np.random.default_rng(0), error_rate=0.0)
        whole = _fitness(roles, [0])
        shredded = _fitness(roles, [0, 4, 7])
        assert whole > shredded

    def test_cutting_at_second_table_pays(self):
        from repro.baselines.genetic import _fitness, classify_cells
        import numpy as np
        from repro.core.grid import csv_to_type_grid

        tg = csv_to_type_grid(
            "Year,Total\n1,2\n3,4\n,\nName,Qty\n5,1\n6,2\n"
        )
        roles = classify_cells(tg, None, rng=np.random.default_rng(0), error_rate=0.0)
        merged = _fitness(roles, [0])
        split = _fitness(roles, [0, 4])
        assert split > merged

    def test_region_count_not_exploding(self):
        """Detected region count stays within ~1.5x of gold on DECO-like
        files (the paper's genetic inference times imply gold-scale
        region counts)."""
        import numpy as np
        from repro.corpus import deco_config, generate_corpus
        from repro.core.grid import csv_to_type_grid
        from repro.baselines import genetic

        files = [f for f in generate_corpus(deco_config(), sf=0.03) if not f.is_outlier]
        n_boxes = n_gold = 0
        for f in files:
            tg = csv_to_type_grid(f.content)
            n_boxes += len(genetic.detect(tg, None, seed=1))
            n_gold += f.n_regions
        assert n_boxes <= 1.5 * n_gold
