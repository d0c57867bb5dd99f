"""Shared test utilities: frame comparison with timestamp-dtype
normalization, and the paper's Listing 2 SQL text."""
from __future__ import annotations

import pandas as pd

#: NEXMark Query 7 exactly as the paper's Listing 2 writes it (the item
#: column is named ``item`` to match the example data; the paper uses
#: ``itemid`` against the NEXMark schema).
LISTING_2_SQL = """
SELECT
  MaxBid.wstart, MaxBid.wend,
  Bid.bidtime, Bid.price, Bid.item
FROM
  Bid,
  (SELECT
     MAX(TumbleBid.price) maxPrice,
     TumbleBid.wstart wstart,
     TumbleBid.wend wend
   FROM
     Tumble(
       data    => TABLE(Bid),
       timecol => DESCRIPTOR(bidtime),
       dur     => INTERVAL '10' MINUTE) TumbleBid
   GROUP BY
     TumbleBid.wend) MaxBid
WHERE
  Bid.price = MaxBid.maxPrice AND
  Bid.bidtime >= MaxBid.wend
    - INTERVAL '10' MINUTE AND
  Bid.bidtime < MaxBid.wend
""".strip()


def norm_pdf(pdf: pd.DataFrame) -> pd.DataFrame:
    """Normalize dtypes that differ across Spark/pandas/DuckDB round-trips
    (datetime64[us] vs [ns], int32 vs int64) without changing values."""
    pdf = pdf.copy()
    for c in pdf.columns:
        dt = str(pdf[c].dtype)
        if dt.startswith("datetime64"):
            pdf[c] = pdf[c].astype("datetime64[ns]")
        elif dt.startswith("int"):
            pdf[c] = pdf[c].astype("int64")
    return pdf.reset_index(drop=True)


def assert_pdf_equal(
    got: pd.DataFrame, expected: pd.DataFrame, *, ordered: bool = True
) -> None:
    """Assert two frames are equal; ``ordered=False`` compares as sorted
    multisets of rows (for table views where row order is meaningless)."""
    got, expected = norm_pdf(got), norm_pdf(expected)
    assert list(got.columns) == list(expected.columns), (
        f"columns differ: {list(got.columns)} vs {list(expected.columns)}"
    )
    if not ordered:
        got = got.sort_values(list(got.columns)).reset_index(drop=True)
        expected = expected.sort_values(list(expected.columns)).reset_index(drop=True)
    pd.testing.assert_frame_equal(got, expected, check_dtype=False)
