"""The paper's core: TMFG/PMFG construction, DBHT clustering, baselines."""
