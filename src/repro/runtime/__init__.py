"""Runtime optimization: OPT's AQE plugin (θp per collapsed plan, θs per QS)."""
