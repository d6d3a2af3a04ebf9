"""Core algorithms: CQ model, join trees, Yannakakis / Yannakakis+ planners,
GHD decomposition, plan IR, and the Spark executor."""
