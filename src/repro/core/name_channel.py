"""NFF — name feature fusion (Section 2.3): M_n = M_se + γ·M_st.

γ defaults to the paper's 0.05 ("semantic feature is much more
important than string-based feature"). M_se is min-max normalised
before fusion (it is a negative Manhattan distance); M_st is already a
[0, 1] edit similarity.
"""
from pyspark.sql import DataFrame, SparkSession

from repro.core.fusion import fuse, minmax_normalize
from repro.core.sens import sens
from repro.core.stns import stns
from repro.kgdata.benchmark import KGPair


def name_channel(
    spark: SparkSession,
    kg: KGPair,
    *,
    gamma: float = 0.05,
    theta: float = 0.5,
    k_top: int = 50,
    dim: int = 64,
    n_segments: int = 4,
    seed: int = 0,
) -> tuple:
    """Compute M_n and its components.

    Returns (M_n, components) where components is a dict with the raw
    ``m_se``, ``m_st`` matrices and the SENS memory info.
    """
    m_se, se_info = sens(
        spark,
        kg.names_s,
        kg.names_t,
        kg.lexicons,
        kg.langs,
        dim=dim,
        k_top=k_top,
        n_segments=n_segments,
        seed=seed,
    )
    m_st = stns(spark, kg.names_s, kg.names_t, theta=theta, seed=seed)
    m_n = fuse((minmax_normalize(m_se), 1.0), (m_st, gamma))
    return m_n, {"m_se": m_se, "m_st": m_st, "sens_info": se_info}
