"""TPC-DS-lite: schema-faithful synthetic tables for QX/QY/QZ (Section 6.1).

Only the columns those queries touch are generated, with real referential
integrity: ``ss_customer_sk → customer``, ``ss_item_sk → item``,
``c_current_hdemo_sk → household_demographics``, 20 income bands, 10 item
categories (the TPC-DS values that drive the many-many self-pairs in QY/QZ).
``household_demographics`` is a fixed-size dimension table (7,200 rows at
full size, like TPC-DS) and is the preloaded table of the paper's setup.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

N_SS_PER_SF = 2_880_000
N_CUST_PER_SF = 100_000
N_ITEM_PER_SF = 18_000
N_HD = 7_200
N_INCOME_BANDS = 20
N_CATEGORIES = 10


def tpcds_lite(sf: float, *, seed: int = 0, hd_rows: int | None = None) -> dict[str, pd.DataFrame]:
    """Tables at scale factor ``sf`` (sf=1 ≈ TPC-DS SF1 row counts for the
    streamed tables; household_demographics stays dimension-sized)."""
    g = np.random.default_rng(seed)
    n_ss = max(50, int(N_SS_PER_SF * sf))
    n_cust = max(20, int(N_CUST_PER_SF * sf))
    n_item = max(10, int(N_ITEM_PER_SF * sf))
    n_hd = hd_rows if hd_rows is not None else max(40, min(N_HD, int(N_HD * sf * 20)))
    hd = pd.DataFrame(
        {
            "hd_demo_sk": np.arange(1, n_hd + 1),
            "hd_income_band_sk": g.integers(1, N_INCOME_BANDS + 1, n_hd),
        }
    )
    customer = pd.DataFrame(
        {
            "c_customer_sk": np.arange(1, n_cust + 1),
            "c_current_hdemo_sk": g.integers(1, n_hd + 1, n_cust),
        }
    )
    item = pd.DataFrame(
        {
            "i_item_sk": np.arange(1, n_item + 1),
            "i_category_id": g.integers(1, N_CATEGORIES + 1, n_item),
        }
    )
    store_sales = pd.DataFrame(
        {
            "ss_id": np.arange(1, n_ss + 1),
            "ss_customer_sk": g.integers(1, n_cust + 1, n_ss),
            "ss_item_sk": g.integers(1, n_item + 1, n_ss),
        }
    )
    return {
        "store_sales": store_sales,
        "customer": customer,
        "household_demographics": hd,
        "item": item,
    }
