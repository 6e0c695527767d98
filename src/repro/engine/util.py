"""Small shared engine helpers."""
from __future__ import annotations

from typing import Optional

import numpy as np
import pandas as pd


def pdf_nbytes(pdf: Optional[pd.DataFrame]) -> int:
    """Approximate wire/storage size of a batch, in bytes.

    Numeric/datetime columns are counted at dtype width; object (string)
    columns at a flat 24 bytes/value — cheap and stable, which matters
    because the cost model calls this for every task output. ``None``
    (the empty-output sentinel) is 0 bytes.
    """
    if pdf is None or len(pdf) == 0:
        return 0
    return row_nbytes(pdf) * len(pdf)


def row_nbytes(pdf: pd.DataFrame) -> int:
    """Bytes per row (see :func:`pdf_nbytes`); lets callers size many
    slices of one output with a single dtype walk."""
    total = 0
    for dtype in pdf.dtypes.to_numpy():
        if dtype == object:
            total += 24
        else:
            total += int(np.dtype(dtype).itemsize)
    return total


def concat_batches(batches: list[Optional[pd.DataFrame]]) -> Optional[pd.DataFrame]:
    """Concatenate batches, treating ``None`` as empty. ``None`` if all empty."""
    frames = [b for b in batches if b is not None and len(b)]
    if not frames:
        return None
    if len(frames) == 1:
        return frames[0]
    return pd.concat(frames, ignore_index=True)
