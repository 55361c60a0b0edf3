"""VREM schema registry (Table 1): arities, in/out positions, shape rules."""
import pytest

from repro.core.vrem import (COL_AGG_PREDS, FULL_AGG_PREDS, PREDS,
                             ROW_AGG_PREDS, SCALAR_OUT_PREDS)


@pytest.mark.parametrize("pred", sorted(PREDS))
def test_positions_within_arity(pred):
    p = PREDS[pred]
    for i in p.in_pos + p.out_pos:
        assert 0 <= i < p.arity
    assert not (set(p.in_pos) & set(p.out_pos))


@pytest.mark.parametrize("pred,ins,out", [
    ("multi_M", [(4, 3), (3, 5)], (4, 5)),
    ("add_M", [(4, 3), (4, 3)], (4, 3)),
    ("multi_E", [(4, 3), (4, 3)], (4, 3)),
    ("multi_MS", [(1, 1), (4, 3)], (4, 3)),
    ("tr", [(4, 3)], (3, 4)),
    ("inv_M", [(3, 3)], (3, 3)),
    ("rowSums", [(4, 3)], (4, 1)),
    ("colSums", [(4, 3)], (1, 3)),
    ("diag", [(3, 3)], (3, 1)),
    ("cbind", [(4, 3), (4, 2)], (4, 5)),
    ("sum_D", [(2, 3), (4, 1)], (6, 4)),
    ("product_D", [(2, 3), (4, 5)], (8, 15)),
    ("det", [(3, 3)], (1, 1)),
    ("sum", [(4, 3)], (1, 1)),
])
def test_shape_inference(pred, ins, out):
    got = PREDS[pred].shape_fn(ins)
    assert got[0] == out


def test_shape_inference_unknown_inputs():
    assert PREDS["multi_M"].shape_fn([None, (3, 5)]) is None


def test_qr_two_outputs():
    p = PREDS["QR"]
    assert p.out_pos == (1, 2)
    assert p.shape_fn([(3, 3)]) == [(3, 3), (3, 3)]


def test_lup_three_outputs():
    assert PREDS["LUP"].out_pos == (1, 2, 3)


def test_name_keyed_on_the_name():
    """I_name: same name => same class, so the name is the functional key."""
    p = PREDS["name"]
    assert p.in_pos == (1,) and p.out_pos == (0,)


def test_agg_pred_families_disjoint():
    assert not (ROW_AGG_PREDS & COL_AGG_PREDS)
    assert FULL_AGG_PREDS <= SCALAR_OUT_PREDS
    for s in ROW_AGG_PREDS | COL_AGG_PREDS | FULL_AGG_PREDS:
        assert s in PREDS
