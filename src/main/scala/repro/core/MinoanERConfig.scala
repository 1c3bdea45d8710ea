package repro.core

/** MinoanER configuration (paper §6, “Parameter Configuration”).
  *
  * @param k     number of most distinctive attributes per KB whose literal
  *              values serve as entity names
  * @param bigK  number of candidate matches kept per entity, separately for
  *              value (β) and neighbor (γ) evidence
  * @param n     number of most important relations per entity (topNneighbors)
  * @param theta trade-off of value- vs neighbor-based candidate ranks in R3
  *
  * The paper's suggested global configuration is (2, 15, 3, 0.6).
  */
final case class MinoanERConfig(
    k: Int = 2,
    bigK: Int = 15,
    n: Int = 3,
    theta: Double = 0.6) {
  require(k >= 1 && bigK >= 1 && n >= 1, "k, K, N must be positive")
  require(theta > 0.0 && theta < 1.0, "theta must lie in (0, 1)")
}
