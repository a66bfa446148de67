"""LDBC-SNB-lite: synthetic tables for BI Q10 (Section 6.1).

Only the join columns are generated, with referential integrity across
message → person → city → country, has_tag → {message, tag},
tag → tag_class, knows → person². Static tables (tag, tag_class, city,
country) are the preloaded set of the paper's setup.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

N_PERSON_PER_SF = 10_000
N_MESSAGE_PER_SF = 300_000
N_TAG_PER_SF = 16_000
N_TAGCLASS = 71
TAGS_PER_MESSAGE = 2
KNOWS_PER_PERSON = 10


def ldbc_lite(sf: float, *, seed: int = 0) -> dict[str, pd.DataFrame]:
    g = np.random.default_rng(seed)
    n_person = max(10, int(N_PERSON_PER_SF * sf))
    n_msg = max(20, int(N_MESSAGE_PER_SF * sf))
    n_tag = max(5, int(N_TAG_PER_SF * sf))
    n_tagclass = max(3, min(N_TAGCLASS, n_tag))
    n_city = max(5, n_person // 10)
    n_country = max(3, n_city // 5)
    country = pd.DataFrame({"id": np.arange(1, n_country + 1)})
    city = pd.DataFrame(
        {
            "id": np.arange(1, n_city + 1),
            "part_of_place_id": g.integers(1, n_country + 1, n_city),
        }
    )
    person = pd.DataFrame(
        {
            "id": np.arange(1, n_person + 1),
            "location_city_id": g.integers(1, n_city + 1, n_person),
        }
    )
    tag_class = pd.DataFrame({"id": np.arange(1, n_tagclass + 1)})
    tag = pd.DataFrame(
        {
            "id": np.arange(1, n_tag + 1),
            "type_tag_class_id": g.integers(1, n_tagclass + 1, n_tag),
        }
    )
    message = pd.DataFrame(
        {
            "id": np.arange(1, n_msg + 1),
            "creator_person_id": g.integers(1, n_person + 1, n_msg),
        }
    )
    ht = pd.DataFrame(
        {
            "message_id": np.repeat(np.arange(1, n_msg + 1), TAGS_PER_MESSAGE),
            "tag_id": g.integers(1, n_tag + 1, n_msg * TAGS_PER_MESSAGE),
        }
    ).drop_duplicates(ignore_index=True)
    n_knows = n_person * KNOWS_PER_PERSON
    knows = pd.DataFrame(
        {
            "person1_id": g.integers(1, n_person + 1, n_knows),
            "person2_id": g.integers(1, n_person + 1, n_knows),
        }
    )
    knows = knows[knows.person1_id != knows.person2_id].drop_duplicates(ignore_index=True)
    return {
        "message": message,
        "person": person,
        "city": city,
        "country": country,
        "tag": tag,
        "tag_class": tag_class,
        "has_tag": ht,
        "knows": knows,
    }
