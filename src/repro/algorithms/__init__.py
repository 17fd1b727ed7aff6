"""The paper's algorithms: BG/RA/OD (baselines), Exact, AG, GR."""
