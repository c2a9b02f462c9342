package repro.indoor

import scala.collection.mutable.ArrayBuffer
import scala.util.Random

/** Parametric synthetic floorplans.
  *
  * Each floor is a double-loaded-corridor layout: three horizontal corridors
  * (decomposed into `nSeg` regular hallway cells each, following the paper's
  * hallway decomposition), four room bands (outer bands touch one corridor,
  * inner bands touch two), optional room-to-room doors in the outer bands,
  * and stairways (20 m, own partition with one door per floor) between
  * adjacent floors.
  *
  * Presets reproduce the paper's graph sizes exactly:
  *  - [[office]]: 141 partitions / 216 doors per floor, 4 stairways per
  *    adjacent floor pair, 14 Q-partitions per floor, 1368 m × 1368 m.
  *  - [[mall]]: 7 floors, 977 partitions / 1613 doors in total, 10
  *    stairways, no Q-partitions (as assumed for the real mall).
  */
object SynthFloorplan {

  /** Layout of one floor.
    *
    * @param nSeg    hallway cells per corridor (3 corridors)
    * @param nRooms  rooms per band, bands bottom→top: outer, inner, inner, outer
    * @param extra   room-to-room doors in the two outer bands (chain pairing:
    *                door between rooms j and j+1 for j < extra)
    */
  final case class FloorSpec(nSeg: Int, nRooms: IndexedSeq[Int], extra: (Int, Int)) {
    require(nRooms.size == 4)
    def partitionCount: Int = 3 * nSeg + nRooms.sum
    def doorCount: Int =
      3 * (nSeg - 1) + nRooms(0) + 2 * nRooms(1) + 2 * nRooms(2) + nRooms(3) + extra._1 + extra._2
  }

  val StairLength = 20.0
  val StairArea   = 40.0 // 20 m x 2 m

  /** Paper's synthetic office: duplicate the floor `floors` times. */
  def office(floors: Int, seed: Long = 42L, width: Double = 1368.0, height: Double = 1368.0): IndoorSpace = {
    val spec = FloorSpec(nSeg = 9, nRooms = Vector(28, 29, 29, 28), extra = (10, 10))
    require(spec.partitionCount == 141 && spec.doorCount == 216, s"office spec drifted: $spec")
    generate(Vector.fill(floors)(spec), stairsPerPair = Vector.fill(math.max(0, floors - 1))(4),
      qPerFloor = 14, seed = seed, width = width, height = height)
  }

  /** Mall-scale space matching the paper's real dataset: 7 floors,
    * 977 partitions, 1613 doors, 10 stairways, no Q-partitions.
    */
  def mall(seed: Long = 7L): IndoorSpace = {
    val a = FloorSpec(nSeg = 9, nRooms = Vector(28, 28, 28, 27), extra = (18, 18)) // 138 part / 227 doors
    val b = FloorSpec(nSeg = 9, nRooms = Vector(28, 28, 28, 28), extra = (20, 19)) // 139 part / 231 doors
    val specs = Vector(a, a, a, a, a, a, b)
    require(specs.map(_.partitionCount).sum + 10 == 977, "mall partition count drifted")
    require(specs.map(_.doorCount).sum + 20 == 1613, "mall door count drifted")
    generate(specs, stairsPerPair = Vector(2, 2, 2, 2, 1, 1), qPerFloor = 0, seed = seed,
      width = 2700.0, height = 2000.0)
  }

  /** Build an [[IndoorSpace]] from per-floor specs. Deterministic in `seed`. */
  def generate(
      floorSpecs: IndexedSeq[FloorSpec],
      stairsPerPair: IndexedSeq[Int],
      qPerFloor: Int,
      seed: Long,
      width: Double,
      height: Double,
  ): IndoorSpace = {
    require(stairsPerPair.size == math.max(0, floorSpecs.size - 1))
    val rng        = new Random(seed)
    val partitions = ArrayBuffer.empty[Partition]
    val doorsBuf   = ArrayBuffer.empty[Door]
    val linksBuf   = ArrayBuffer.empty[DoorLink]
    val overrides  = Map.newBuilder[(Int, Int), Double]

    def addPartition(rect: Rect, floor: Int, stair: Boolean = false, area: Option[Double] = None): Int = {
      val id = partitions.size
      partitions += Partition(id, rect, floor, CrowdType.R, stair, area)
      id
    }
    def addDoor(x: Double, y: Double, floor: Int): Int = {
      val id = doorsBuf.size
      doorsBuf += Door(id, Point(x, y, floor))
      id
    }
    def connect(door: Int, a: Int, b: Int): Unit = { // bidirectional
      linksBuf += DoorLink(door, a, b)
      linksBuf += DoorLink(door, b, a)
    }

    val corrH = 24.0
    val bandH = (height - 3 * corrH) / 4
    // vertical layout bottom→top: band0, corr0, band1, corr1, band2, corr2, band3
    val bandY = Vector(0.0, bandH + corrH, 2 * (bandH + corrH), 3 * (bandH + corrH))
    val corrY = Vector(bandH, 2 * bandH + corrH, 3 * bandH + 2 * corrH)

    // per floor: ids of corridor cells [corr][seg], and room ids [band][j]
    val corrIds = Array.ofDim[Array[Array[Int]]](floorSpecs.size)
    val roomIds = Array.ofDim[Array[Array[Int]]](floorSpecs.size)

    for ((spec, f) <- floorSpecs.zipWithIndex) {
      val segW = width / spec.nSeg
      corrIds(f) = Array.tabulate(3, spec.nSeg) { (c, s) =>
        addPartition(Rect(s * segW, corrY(c), (s + 1) * segW, corrY(c) + corrH), f)
      }
      roomIds(f) = Array.tabulate(4) { b =>
        val n  = spec.nRooms(b)
        val rw = width / n
        Array.tabulate(n)(j => addPartition(Rect(j * rw, bandY(b), (j + 1) * rw, bandY(b) + bandH), f))
      }
      // corridor-internal doors
      for (c <- 0 until 3; s <- 0 until spec.nSeg - 1) {
        val d = addDoor((s + 1) * segW, corrY(c) + corrH / 2, f)
        connect(d, corrIds(f)(c)(s), corrIds(f)(c)(s + 1))
      }
      // room-corridor doors; band b touches corridors: band0→corr0 (above it),
      // band1→corr0 (below) and corr1 (above), band2→corr1, corr2, band3→corr2 (below)
      def corridorCellAt(c: Int, x: Double): Int =
        corrIds(f)(c)(math.min(spec.nSeg - 1, (x / segW).toInt))
      for (b <- 0 until 4; j <- 0 until spec.nRooms(b)) {
        val room = roomIds(f)(b)(j)
        val cx   = partitions(room).rect.centerX
        b match {
          case 0 =>
            val d = addDoor(cx, corrY(0), f); connect(d, room, corridorCellAt(0, cx))
          case 1 =>
            val d1 = addDoor(cx, corrY(0) + corrH, f); connect(d1, room, corridorCellAt(0, cx))
            val d2 = addDoor(cx, corrY(1), f); connect(d2, room, corridorCellAt(1, cx))
          case 2 =>
            val d1 = addDoor(cx, corrY(1) + corrH, f); connect(d1, room, corridorCellAt(1, cx))
            val d2 = addDoor(cx, corrY(2), f); connect(d2, room, corridorCellAt(2, cx))
          case 3 =>
            val d = addDoor(cx, corrY(2) + corrH, f); connect(d, room, corridorCellAt(2, cx))
        }
      }
      // extra room-room doors in the outer bands (chain pairing)
      for ((b, e) <- Seq((0, spec.extra._1), (3, spec.extra._2)); j <- 0 until e) {
        val left  = roomIds(f)(b)(j)
        val right = roomIds(f)(b)(j + 1)
        val d     = addDoor(partitions(left).rect.xMax, bandY(b) + bandH / 2, f)
        connect(d, left, right)
      }
    }

    // stairways between adjacent floors, attached to corridor cells near the
    // floor corners (corr0/corr2, first/last segments), cycling positions.
    for (pair <- 0 until stairsPerPair.size; k <- 0 until stairsPerPair(pair)) {
      val specLo = floorSpecs(pair)
      val segW   = width / specLo.nSeg
      val anchors = Vector(
        (0, 0, segW * 0.25),
        (2, specLo.nSeg - 1, width - segW * 0.25),
        (2, 0, segW * 0.25),
        (0, specLo.nSeg - 1, width - segW * 0.25),
      )
      val (c, s, x) = anchors(k % anchors.size)
      val y         = corrY(c) + corrH / 2
      val stair     = addPartition(Rect(x - 1, y - 1, x + 1, y + 1), pair, stair = true, area = Some(StairArea))
      val dLow      = addDoor(x, y, pair)
      val dHigh     = addDoor(x, y, pair + 1)
      connect(dLow, corrIds(pair)(c)(s), stair)
      connect(dHigh, stair, corrIds(pair + 1)(c)(s))
      overrides += ((dLow, dHigh) -> StairLength)
      overrides += ((dHigh, dLow) -> StairLength)
      // entering and leaving a stairway through the same door happens only in
      // degenerate searches; give it the stair length too, not 0.
      overrides += ((dLow, dLow) -> StairLength)
      overrides += ((dHigh, dHigh) -> StairLength)
    }

    // Q-partition selection: per floor, qPerFloor rooms among those with
    // exactly two doors.
    val doorCountOf = {
      val cnt = Array.fill(partitions.size)(0)
      linksBuf.map(l => (l.door, l.from)).distinct.foreach { case (_, p) => cnt(p) += 1 }
      cnt
    }
    val qSet = (for (f <- floorSpecs.indices) yield {
      val candidates = roomIds(f).flatten.filter(p => doorCountOf(p) == 2).toVector
      rng.shuffle(candidates).take(qPerFloor)
    }).flatten.toSet
    val finalParts = partitions.zipWithIndex.map { case (p, i) =>
      if (qSet.contains(i)) p.copy(tau = CrowdType.Q) else p
    }

    val space = new IndoorSpace(finalParts.toIndexedSeq, doorsBuf.toIndexedSeq, linksBuf.toIndexedSeq, overrides.result())
    space.validate()
    space
  }
}
